"""Benchmark for Table 7 — repository (biological-importance) lookups."""
from repro.core.ted import ted
from repro.vqf.repository import bio_importance_count


def test_bench_table7_bio_importance(benchmark, bench_edges):
    spark = bench_edges.sparkSession
    codes = ted(spark, bench_edges, k=8, e_max=3).patterns

    def run():
        return bio_importance_count(codes)

    n, _ = benchmark.pedantic(run, rounds=5, iterations=1)
    benchmark.extra_info["ted_bio_hits"] = n
    assert 0 <= n <= len(codes)
