"""Benchmark for Table 2 — dataset statistics aggregation."""
from repro.graphdb.spark_io import db_stats


def test_bench_table2_db_stats(benchmark, bench_edges):
    """One scan/aggregate over the edge table (Table 2 per dataset)."""

    def run():
        return db_stats(bench_edges).collect()[0]

    row = benchmark.pedantic(run, rounds=3, iterations=1)
    assert row["n_graphs"] == 100
