"""Table 3 — Size of PES-Index across dataset variants."""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import emit, get_spark, render_table  # noqa: E402
from pes_tables import run_pes_experiments  # noqa: E402

PAPER = (
    "Paper (real datasets, Java): AIDS10K 234 KB (5.39%), AIDS40K 1008 KB (5.31%), "
    "eMol5K 89 KB (5.40%), eMol10K 157 KB (5.39%), PubChem10K 428 KB (5.80%), "
    "PubChem23K 1157 KB (7.58%)."
)


def main() -> None:
    spark = get_spark("table3")
    rows = run_pes_experiments(spark)
    table = [
        {k: r[k] for k in ("dataset", "n_graphs", "index_kb", "index_pct_of_dataset")}
        for r in rows
    ]
    emit(
        "table3_pes_size",
        render_table(table, "Table 3 — Size of PES-Index") + "\n" + PAPER + "\n",
    )
    spark.stop()


if __name__ == "__main__":
    main()
