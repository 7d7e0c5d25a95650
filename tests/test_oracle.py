"""Tests for the DuckDB oracle machinery itself: it must *fail* on
wrong results, not only pass on right ones, and the reference SQL must
agree with the naive engine."""
import duckdb
import pytest

from repro.baseline.naive import parse_naive
from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query1, query2
from repro.graphs.ontology import query_graph
from repro.oracle import assert_equivalent
from repro.oracle_queries import QUERY1_SQL, QUERY2_SQL


def duckdb_rel(sql: str, edges_pdf):
    con = duckdb.connect()
    try:
        con.register("e", edges_pdf)
        return {(int(i), int(j)) for i, j in con.execute(sql).fetchall()}
    finally:
        con.close()


class TestReferenceSQL:
    @pytest.mark.parametrize("name", ["skos", "generations", "foaf"])
    def test_query1_sql_matches_naive(self, name):
        g = query_graph(name)
        want = parse_naive(g, to_cnf(query1()))["S"]
        got = duckdb_rel(QUERY1_SQL, g.to_pandas())
        assert got == set(want)

    @pytest.mark.parametrize("name", ["skos", "travel"])
    def test_query2_sql_matches_naive(self, name):
        g = query_graph(name)
        want = parse_naive(g, to_cnf(query2()))["S"]
        got = duckdb_rel(QUERY2_SQL, g.to_pandas())
        assert got == set(want)

    def test_query2_includes_bare_subclass_edges(self):
        # S -> subClassOf alone: every sco edge is a result pair
        g = query_graph("pizza")
        got = duckdb_rel(QUERY2_SQL, g.to_pandas())
        sco = {(s, d) for s, l, d in g.edges if l == "subClassOf"}
        assert sco <= got


class TestOracleDetectsErrors:
    def test_wrong_rows_fail(self, spark):
        df = spark.createDataFrame([(1, 2)], "i long, j long")
        with pytest.raises(AssertionError):
            assert_equivalent(
                df,
                "SELECT 1 AS i, 3 AS j",
            )

    def test_missing_rows_fail(self, spark):
        df = spark.createDataFrame([(1, 2)], "i long, j long")
        with pytest.raises(AssertionError):
            assert_equivalent(
                df,
                "SELECT 1 AS i, 2 AS j UNION ALL SELECT 3, 4",
            )

    def test_column_mismatch_fails(self, spark):
        df = spark.createDataFrame([(1, 2)], "x long, y long")
        with pytest.raises(AssertionError, match="column"):
            assert_equivalent(df, "SELECT 1 AS i, 2 AS j")

    def test_matching_rows_pass(self, spark):
        df = spark.createDataFrame([(1, 2), (3, 4)], "i long, j long")
        assert_equivalent(
            df, "SELECT 3 AS i, 4 AS j UNION ALL SELECT 1, 2"
        )
