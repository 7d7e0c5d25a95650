"""Spark join-engine tests: schema, loop strategies, lineage hygiene,
and DuckDB-oracle checks of full query results on ontology graphs.

The oracle tests are the strongest correctness evidence in the suite:
the paper's two queries are linear CFGs, so DuckDB recursive CTEs
(no repro code shared) compute R_S independently, and
``assert_equivalent`` diffs sorted rows.
"""
import pytest
from pyspark.sql import functions as F

from repro.baseline.naive import parse_naive
from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.cfg.queries import query1, query2
from repro.core.semiring import GrammarEncoding
from repro.core.spark_engine import (
    closure_df,
    closure_facts,
    initial_facts_df,
    parse_spark,
)
from repro.graphs.edges import Graph
from repro.graphs.ontology import query_graph
from repro.oracle import assert_equivalent
from repro.oracle_queries import QUERY1_SQL, QUERY2_SQL

AB = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])


class TestInitialFacts:
    def test_matches_semiring_initialization(self, spark):
        g = Graph.of([(0, "a", 1), (1, "b", 2), (0, "b", 1)])
        enc = GrammarEncoding(AB)
        got = {
            (r.i, r.j, r.nt)
            for r in initial_facts_df(spark, g.to_spark(spark), enc).collect()
        }
        assert got == enc.initial_facts(g)

    def test_unknown_labels_dropped(self, spark):
        g = Graph.of([(0, "z", 1)])
        enc = GrammarEncoding(AB)
        assert initial_facts_df(spark, g.to_spark(spark), enc).count() == 0


class TestClosure:
    def test_schema(self, spark, example_graph, example_cnf):
        df = closure_df(spark, example_graph, example_cnf)
        assert [f.name for f in df.schema.fields] == ["i", "j", "nonterminal"]

    def test_rows_distinct(self, spark, example_graph, example_cnf):
        df = closure_df(spark, example_graph, example_cnf)
        assert df.count() == df.distinct().count()

    def test_naive_and_seminaive_loops_agree(self, spark):
        g = Graph.of(
            [(0, "a", 1), (1, "a", 2), (2, "b", 3), (3, "b", 4), (1, "b", 4)]
        )
        rules = CFG.of(
            [("S", ("A", "T")), ("S", ("A", "B")), ("T", ("S", "B")),
             ("A", ("a",)), ("B", ("b",))]
        )
        assert parse_spark(spark, g, rules) == parse_spark(
            spark, g, rules, algorithm="naive"
        )

    def test_unknown_algorithm_rejected(self, spark):
        g = Graph.of([(0, "a", 1)])
        with pytest.raises(ValueError, match="algorithm"):
            closure_facts(spark, g.to_spark(spark), AB, algorithm="bogus")

    def test_max_iterations_cuts_loop(self, spark):
        # deep chain needs many semi-naive rounds; capping must stop early
        edges = [(i, "a", i + 1) for i in range(6)] + [
            (6 + i, "b", 7 + i) for i in range(6)
        ]
        rules = CFG.of(
            [("S", ("A", "T")), ("S", ("A", "B")), ("T", ("S", "B")),
             ("A", ("a",)), ("B", ("b",))]
        )
        _, iters = closure_facts(
            spark, Graph.of(edges).to_spark(spark), rules, max_iterations=2
        )
        assert iters == 2

    def test_matches_naive_reference(self, spark):
        g = Graph.of([(0, "a", 1), (1, "b", 0), (0, "b", 0), (1, "a", 1)])
        rules = CFG.of(
            [("S", ("A", "B")), ("S", ("S", "S")), ("A", ("a",)), ("B", ("b",))]
        )
        assert parse_spark(spark, g, rules) == parse_naive(g, rules)


@pytest.mark.parametrize("name", ["skos", "travel", "univ-bench"])
class TestDuckDBOracle:
    """Full query results vs DuckDB recursive CTEs on ontology graphs."""

    def test_query1_equivalent(self, spark, name):
        g = query_graph(name)
        grammar = to_cnf(query1())
        result = (
            closure_df(spark, g, grammar)
            .where(F.col("nonterminal") == "S")
            .select("i", "j")
        )
        assert_equivalent(result, QUERY1_SQL, e=g.to_spark(spark))

    def test_query2_equivalent(self, spark, name):
        g = query_graph(name)
        grammar = to_cnf(query2())
        result = (
            closure_df(spark, g, grammar)
            .where(F.col("nonterminal") == "S")
            .select("i", "j")
        )
        assert_equivalent(result, QUERY2_SQL, e=g.to_spark(spark))


class TestOracleOnLocalEngines:
    """The DuckDB oracle also cross-checks the local engines (results
    shipped through a Spark DataFrame for the comparison)."""

    @pytest.mark.parametrize("engine", ["hellings", "csr", "dense"])
    def test_query1_people_pets(self, spark, engine):
        from repro.core.api import graph_parse

        g = query_graph("people-pets")
        rel = graph_parse(g, query1(), engine=engine)["S"]
        df = spark.createDataFrame(
            sorted(rel) or [(None, None)], schema="i long, j long"
        )
        assert_equivalent(df, QUERY1_SQL, e=g.to_spark(spark))
