"""Table 7 — patterns with biological importance per pattern set.

Substitution: "exists in the PubChem repository" becomes "isomorphic to a
motif in the generator's motif library" (DESIGN.md §3.7). The paper's claim:
TED and CATAPULT surface more repository structures than FS (8 vs 8 vs 5)."""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402
from vqf_common import build_setup  # noqa: E402

from repro.isomorphism.dfscode import encode  # noqa: E402
from repro.vqf.repository import bio_importance_count  # noqa: E402

PAPER = "Paper counts (PubChem): FS 5, CATAPULT 8, TED 8."


def run(spark, *, n_graphs: int = 300) -> list[dict]:
    setup = build_setup(spark, "pubchem_lite", n_graphs=n_graphs)
    rows = []
    for name, codes in setup.pattern_sets.items():
        n, hits = bio_importance_count(codes)
        rows.append(
            {
                "pattern_set": name,
                "n_patterns": len(codes),
                "with_bio_importance": n,
                "hits": "; ".join(encode(h) for h in hits) or "-",
            }
        )
    setup.edges.unpersist()
    return rows


def main() -> None:
    spark = get_spark("table7")
    emit("table7_bio", render_table(run(spark), "Table 7 — Patterns with Biological Importance (motif-library stand-in)") + "\n" + PAPER + "\n")
    spark.stop()


if __name__ == "__main__":
    main()
