"""Exp 7 / Figure 17 — reduction ratio RR vs fraction of infrequent
queries rho.

RR = (Steps_FS - Steps_TED) / Steps_FS averaged over a query set with
fraction rho of infrequent queries. Shape claims: RR < 0 at rho = 0 (all
queries frequent — FS wins), RR increases with rho and crosses 0 around
rho ~= 0.2."""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402
from vqf_common import E_MAX, E_MIN, K_PATTERNS, SUP_MIN_FS  # noqa: E402

from repro.core.ted import ted  # noqa: E402
from repro.graphdb.generator import molecule_db  # noqa: E402
from repro.graphdb.spark_io import to_edges_df  # noqa: E402
from repro.vqf.fs import top_k_frequent  # noqa: E402
from repro.vqf.queries import query_set  # noqa: E402
from repro.vqf.steps import formulation_steps, reduction_ratio  # noqa: E402

RHOS = (0.0, 0.1, 0.2, 0.3, 0.4, 0.5, 0.6)
N_QUERIES = 20  # paper uses 100; reduced with the dataset scale


def run(spark, *, n_graphs: int = 300, rhos=RHOS) -> list[dict]:
    db = molecule_db("aids_lite", n_graphs, seed=0)
    edges = to_edges_df(spark, db).cache()
    edges.count()
    fs = [
        c
        for c, _ in top_k_frequent(
            spark, edges, k=K_PATTERNS, e_max=E_MAX, e_min=E_MIN, sup_min=SUP_MIN_FS
        )
    ]
    ted_codes = ted(spark, edges, k=K_PATTERNS, e_max=E_MAX, e_min=E_MIN).patterns
    rows = []
    for rho in rhos:
        qs = query_set(db, fs, n_queries=N_QUERIES, rho=rho, seed=int(rho * 10))
        rrs = []
        for q in qs:
            s_fs, _ = formulation_steps(fs, q)
            s_ted, _ = formulation_steps(ted_codes, q)
            rrs.append(reduction_ratio(s_fs, s_ted))
        rows.append({"rho": rho, "avg_RR": round(sum(rrs) / len(rrs), 3), "n_queries": len(qs)})
    edges.unpersist()
    return rows


def main() -> None:
    spark = get_spark("exp7_rr")
    emit("exp7_rr", render_table(run(spark), "Exp 7 (Fig 17) — Reduction Ratio vs rho"))
    spark.stop()


if __name__ == "__main__":
    main()
