"""Table 5 — the VQF query workload.

The paper's queries are real PubChem compounds (CIDs, |E| in [30, 62]) —
external data. Substitution: sampled connected subgraphs of the synthetic
databases (see jobs/vqf_common.py); this table reports their identifiers
(seed-derived) and sizes next to the paper's.
"""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402
from vqf_common import build_setup  # noqa: E402

PAPER = (
    "Paper (CID, |E|): PubChem Q1 169132(34) Q2 20497364(30) Q3 493570(47) "
    "Q4 135398658(52) Q5 3324(42); AIDS Q1 135398740(32) Q2 565070(34) "
    "Q3 102034018(35) Q4 14852846(30) Q5 154402349(62)."
)


def run(spark, *, n_graphs: int = 300) -> list[dict]:
    rows = []
    for ds in ("pubchem_lite", "aids_lite"):
        setup = build_setup(spark, ds, n_graphs=n_graphs)
        for i, q in enumerate(setup.queries, 1):
            rows.append(
                {
                    "dataset": ds,
                    "query": f"Q{i}",
                    "id": f"sampled(seed={i - 1})",
                    "|E|": q.n_edges,
                    "|V|": q.n_vertices,
                }
            )
        setup.edges.unpersist()
    return rows


def main() -> None:
    spark = get_spark("table5")
    emit("table5_queries", render_table(run(spark), "Table 5 — Queries (sampled substitutes)") + "\n" + PAPER + "\n")
    spark.stop()


if __name__ == "__main__":
    main()
