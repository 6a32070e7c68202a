"""Benchmark for Table 3 — full TED run measuring PES-Index size relative
to the dataset (the run itself is what Tables 3/4 instrument)."""
from repro.core.ted import ted
from repro.graphdb.spark_io import to_edges_pandas


def test_bench_table3_ted_with_index(benchmark, emol_db, emol_edges):
    spark = emol_edges.sparkSession

    def run():
        return ted(spark, emol_edges, k=5, e_max=4)

    r = benchmark.pedantic(run, rounds=1, iterations=1)
    dataset_bytes = int(to_edges_pandas(emol_db).memory_usage(index=False, deep=True).sum())
    benchmark.extra_info["index_kb"] = round(r.index_size_bytes / 1024, 1)
    benchmark.extra_info["index_pct_of_dataset"] = round(
        100 * r.index_size_bytes / dataset_bytes, 2
    )
    assert r.index_size_bytes > 0
