"""Join-based matcher tests: the same SQL runs through Catalyst and DuckDB
(oracle), and the result must agree with the Python embedding matcher."""
import duckdb
import pytest

from repro.graphdb.model import edge_key, make_graph
from repro.graphdb.spark_io import to_edges_pandas
from repro.isomorphism.df_matcher import (
    cover_df,
    cover_sql,
    coverage_count_sql,
    embeddings_df,
    embeddings_sql,
)
from repro.isomorphism.dfscode import min_code_of_graph
from repro.isomorphism.matcher import match_stats
from repro.oracle import assert_equivalent

PATTERNS = {
    "edge_cc": make_graph(-1, ["C", "C"], [(0, 1)]),
    "edge_cn": make_graph(-1, ["C", "N"], [(0, 1)]),
    "path_ccc": make_graph(-1, ["C", "C", "C"], [(0, 1), (1, 2)]),
    "path_cco": make_graph(-1, ["C", "C", "O"], [(0, 1), (1, 2)]),
    "star_ccn": make_graph(-1, ["C", "C", "N"], [(0, 1), (0, 2)]),
    "triangle": make_graph(-1, ["C", "C", "C"], [(0, 1), (1, 2), (0, 2)]),
}


@pytest.mark.parametrize("pname", sorted(PATTERNS))
class TestSparkVsDuckDBOracle:
    def test_cover_set_equivalent(self, spark, tiny_mol_db, tiny_edges, pname):
        code = min_code_of_graph(PATTERNS[pname])
        df = cover_df(spark, tiny_edges, code)
        assert_equivalent(df, cover_sql(code), edges=to_edges_pandas(tiny_mol_db))

    def test_embedding_count_equivalent(self, spark, tiny_mol_db, tiny_edges, pname):
        code = min_code_of_graph(PATTERNS[pname])
        df = embeddings_df(spark, tiny_edges, code)
        n_spark = df.count()
        con = duckdb.connect()
        try:
            con.register("edges", to_edges_pandas(tiny_mol_db))
            n_duck = con.execute(
                f"SELECT count(*) FROM ({embeddings_sql(code)})"
            ).fetchone()[0]
        finally:
            con.close()
        assert n_spark == n_duck


@pytest.mark.parametrize("pname", sorted(PATTERNS))
class TestSqlVsPythonMatcher:
    def test_cover_sets_agree(self, spark, tiny_mol_db, tiny_edges, pname):
        code = min_code_of_graph(PATTERNS[pname])
        sql_cover = {
            edge_key(int(r["graph_id"]), int(r["eid"]))
            for r in cover_df(spark, tiny_edges, code).collect()
        }
        py_cover = set()
        for g in tiny_mol_db:
            ms = match_stats(code, g, want_extensions=False)
            py_cover |= {edge_key(g.gid, e) for e in ms.covered_eids}
        assert sql_cover == py_cover

    def test_embedding_counts_agree(self, spark, tiny_mol_db, tiny_edges, pname):
        code = min_code_of_graph(PATTERNS[pname])
        per_graph_sql = {
            int(r["graph_id"]): int(r["n"])
            for r in embeddings_df(spark, tiny_edges, code)
            .groupBy("graph_id")
            .count()
            .withColumnRenamed("count", "n")
            .collect()
        }
        for g in tiny_mol_db:
            n_py = match_stats(code, g, want_extensions=False).n_embeddings
            assert per_graph_sql.get(g.gid, 0) == n_py


def test_coverage_count_sql_matches_python(spark, tiny_mol_db, tiny_edges):
    code = min_code_of_graph(PATTERNS["path_ccc"])
    tiny_edges.createOrReplaceTempView("edges")
    n_sql = spark.sql(coverage_count_sql(code)).collect()[0]["coverage"]
    n_py = sum(
        len(match_stats(code, g, want_extensions=False).covered_eids)
        for g in tiny_mol_db
    )
    assert n_sql == n_py
