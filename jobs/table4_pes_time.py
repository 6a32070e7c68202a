"""Table 4 — Maintenance time of PES-Index across dataset variants."""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402
from pes_tables import run_pes_experiments  # noqa: E402

PAPER = (
    "Paper (real datasets, Java): AIDS10K 0.5 s (6.86%), AIDS40K 1.88 s (1.00%), "
    "eMol5K 0.25 s (4.12%), eMol10K 0.37 s (3.63%), PubChem10K 1.1 s (0.78%), "
    "PubChem23K 2.85 s (1.39%)."
)


def main() -> None:
    spark = get_spark("table4")
    rows = run_pes_experiments(spark)
    table = [
        {
            k: r[k]
            for k in ("dataset", "n_graphs", "index_time_s", "index_time_pct_of_total", "total_time_s")
        }
        for r in rows
    ]
    emit(
        "table4_pes_time",
        render_table(table, "Table 4 — Maintenance Time of PES-Index") + "\n" + PAPER + "\n",
    )
    spark.stop()


if __name__ == "__main__":
    main()
