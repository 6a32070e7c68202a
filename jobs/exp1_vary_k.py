"""Exp 1 / Figure 9 — effect of the number of patterns k.

Coverage rate and processing time vs k for TED and the four baselines on
AIDS-lite (paper: AIDS5K; repro scale ~200 graphs). Shape claims: coverage
and time grow with k; TED tracks ALL_g's coverage at lower time; greedy
variants cost more time than swap variants."""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402

from repro.core.baselines import all_g, all_t, fsg_g, fsg_t  # noqa: E402
from repro.core.ted import ted  # noqa: E402
from repro.graphdb.generator import molecule_db  # noqa: E402
from repro.graphdb.spark_io import to_edges_df  # noqa: E402

E_MAX = 4
KS = (1, 3, 5, 7, 9)
TIME_LIMIT = 1200.0


def run(spark, *, n_graphs: int = 200, e_max: int = E_MAX, ks=KS) -> list[dict]:
    db = molecule_db("aids_lite", n_graphs, seed=0)
    edges = to_edges_df(spark, db).cache()
    edges.count()
    rows = []
    for k in ks:
        runs = [
            ted(spark, edges, k=k, e_max=e_max, time_limit_s=TIME_LIMIT),
            all_g(spark, edges, k=k, e_max=e_max, time_limit_s=TIME_LIMIT),
            all_t(spark, edges, k=k, e_max=e_max, time_limit_s=TIME_LIMIT),
            fsg_g(spark, edges, k=k, e_max=e_max, sup_min=0.1, time_limit_s=TIME_LIMIT),
            fsg_t(spark, edges, k=k, e_max=e_max, sup_min=0.1, time_limit_s=TIME_LIMIT),
        ]
        for r in runs:
            rows.append({"k": k, **r.row()})
    edges.unpersist()
    return rows


def main() -> None:
    spark = get_spark("exp1_vary_k")
    emit("exp1_vary_k", render_table(run(spark), "Exp 1 (Fig 9) — Effect of Number of Patterns k"))
    spark.stop()


if __name__ == "__main__":
    main()
