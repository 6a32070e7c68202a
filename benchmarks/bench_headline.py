"""Headline comparison benchmarks (Figures 9/11/14 shape): TED vs ALL_g vs
FSG_g processing time on the same bench database — the paper's core
performance claim is that TED is fastest at comparable coverage."""
import pytest

from repro.core.baselines import all_g, fsg_g
from repro.core.ted import ted

K, E_MAX = 5, 3


@pytest.fixture(scope="module")
def coverage_log():
    return {}


def test_bench_ted(benchmark, bench_edges, coverage_log):
    spark = bench_edges.sparkSession
    r = benchmark.pedantic(
        lambda: ted(spark, bench_edges, k=K, e_max=E_MAX), rounds=1, iterations=1
    )
    coverage_log["TED"] = r.coverage
    benchmark.extra_info["coverage_rate"] = round(r.coverage_rate, 4)


def test_bench_all_g(benchmark, bench_edges, coverage_log):
    spark = bench_edges.sparkSession
    r = benchmark.pedantic(
        lambda: all_g(spark, bench_edges, k=K, e_max=E_MAX), rounds=1, iterations=1
    )
    coverage_log["ALL_g"] = r.coverage
    benchmark.extra_info["coverage_rate"] = round(r.coverage_rate, 4)


def test_bench_fsg_g(benchmark, bench_edges, coverage_log):
    spark = bench_edges.sparkSession
    r = benchmark.pedantic(
        lambda: fsg_g(spark, bench_edges, k=K, e_max=E_MAX, sup_min=0.1),
        rounds=1,
        iterations=1,
    )
    coverage_log["FSG_g"] = r.coverage
    benchmark.extra_info["coverage_rate"] = round(r.coverage_rate, 4)


def test_ted_coverage_comparable_to_all_g(coverage_log):
    """Runs after the benches: the paper's Result 1 shape check."""
    if {"TED", "ALL_g"} <= set(coverage_log):
        assert coverage_log["TED"] >= 0.85 * coverage_log["ALL_g"]
