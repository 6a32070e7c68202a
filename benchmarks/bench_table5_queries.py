"""Benchmark for Table 5 — query-workload sampling."""
from repro.vqf.queries import sample_query


def test_bench_table5_query_sampling(benchmark, bench_db):
    def run():
        return [
            sample_query(bench_db, e_min=12, e_max=24, seed=i) for i in range(5)
        ]

    qs = benchmark.pedantic(run, rounds=3, iterations=1)
    assert all(12 <= q.n_edges <= 24 for q in qs)
