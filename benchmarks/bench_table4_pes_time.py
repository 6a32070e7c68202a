"""Benchmark for Table 4 — PES-Index maintenance cost in isolation.

Streams a realistic pattern/cover-set workload (recorded from a real
enumeration of the bench DB) through PatternMaintain, so the measured time
is exactly the index INSERT/DELETE/UPDATE/SELECT cost that Table 4 reports
as a fraction of total processing time."""
import pytest

from repro.core.baselines import enumerate_cover_sets
from repro.core.maintain import PatternMaintainer


@pytest.fixture(scope="module")
def recorded_stream(spark, bench_edges):
    sets, timed_out = enumerate_cover_sets(spark, bench_edges, e_max=3)
    assert not timed_out
    return list(sets.items())


def test_bench_table4_index_maintenance(benchmark, recorded_stream):
    def run():
        m = PatternMaintainer(k=5, alpha=1.0)
        for code, cover in recorded_stream:
            m.offer(code, cover)
        return m

    m = benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["n_patterns_streamed"] = len(recorded_stream)
    benchmark.extra_info["index_time_s"] = round(m.index.maintenance_time_s, 4)
    assert m.coverage > 0
