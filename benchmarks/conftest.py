"""Benchmark fixtures: session-scoped bench databases (larger than test DBs,
still laptop-tractable) shared across all table benchmarks."""
import pytest

from repro.graphdb.generator import molecule_db
from repro.graphdb.spark_io import to_edges_df


@pytest.fixture(scope="session")
def bench_db():
    """Benchmark workload: 100 AIDS-lite molecules (paper uses AIDS5K;
    scale reduced for the Python-on-Spark substrate, see DESIGN.md)."""
    return molecule_db("aids_lite", 100, seed=0)


@pytest.fixture(scope="session")
def bench_edges(spark, bench_db):
    df = to_edges_df(spark, bench_db).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def emol_db():
    return molecule_db("emol_lite", 150, seed=0)


@pytest.fixture(scope="session")
def emol_edges(spark, emol_db):
    df = to_edges_df(spark, emol_db).cache()
    df.count()
    yield df
    df.unpersist()
