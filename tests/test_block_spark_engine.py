"""Block-partitioned Spark engine tests (per-partition matrix kernels)."""
import pytest

from repro.baseline.naive import parse_naive
from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.cfg.queries import query2
from repro.core.block_spark_engine import parse_spark_block
from repro.graphs.edges import Graph
from repro.graphs.ontology import query_graph

AB = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])


class TestBlockEngine:
    def test_single_block(self, spark):
        g = Graph.of([(0, "a", 1), (1, "b", 2)])
        got = parse_spark_block(spark, g, AB, block_size=8)
        assert got == parse_naive(g, AB)

    def test_multi_block_cross_boundary(self, spark):
        # block_size 2 forces the S derivation to span block boundaries
        g = Graph.of([(0, "a", 3), (3, "b", 5)])
        got = parse_spark_block(spark, g, AB, block_size=2)
        assert got == parse_naive(g, AB)

    def test_node_count_not_multiple_of_block(self, spark):
        g = Graph.of([(0, "a", 1), (1, "b", 2)], n_nodes=5)
        got = parse_spark_block(spark, g, AB, block_size=3)
        assert got == parse_naive(g, AB)

    def test_cyclic_graph(self, spark):
        g = Graph.of([(0, "a", 1), (1, "b", 0), (0, "b", 0)])
        rules = CFG.of(
            [("S", ("A", "B")), ("S", ("S", "S")), ("A", ("a",)), ("B", ("b",))]
        )
        assert parse_spark_block(spark, g, rules, block_size=2) == parse_naive(
            g, rules
        )

    def test_empty_result(self, spark):
        g = Graph.of([(0, "z", 1)])
        got = parse_spark_block(spark, g, AB, block_size=4)
        assert all(not v for v in got.values())

    @pytest.mark.parametrize("bs", [1, 2, 7, 64])
    def test_block_size_invariance(self, spark, bs):
        g = Graph.of(
            [(0, "a", 1), (1, "a", 2), (2, "b", 3), (3, "b", 4), (1, "b", 4)]
        )
        rules = CFG.of(
            [("S", ("A", "T")), ("S", ("A", "B")), ("T", ("S", "B")),
             ("A", ("a",)), ("B", ("b",))]
        )
        assert parse_spark_block(spark, g, rules, block_size=bs) == parse_naive(
            g, rules
        )

    def test_ontology_query2_matches_csr(self, spark):
        from repro.core.sparse_engine import parse_csr

        g = query_graph("skos")
        grammar = to_cnf(query2())
        assert parse_spark_block(spark, g, grammar, block_size=64) == parse_csr(
            g, grammar
        )
