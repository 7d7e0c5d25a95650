"""Baseline-specific tests for the Hellings worklist algorithm (the
paper's GLL comparator stand-in)."""
from repro.baseline.hellings import parse_hellings
from repro.baseline.naive import parse_naive
from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.cfg.queries import query1, query2
from repro.graphs.edges import Graph
from repro.graphs.ontology import query_graph

AB = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])


class TestWorklist:
    def test_empty_result_grammar_unmatched(self):
        g = Graph.of([(0, "z", 1)])
        r = parse_hellings(g, AB)
        assert all(not v for v in r.values())

    def test_left_extension(self):
        # new fact must combine with facts ENDING at its start node
        g = Graph.of([(0, "a", 1), (1, "b", 2)])
        assert parse_hellings(g, AB)["S"] == {(0, 2)}

    def test_right_extension_order_independence(self):
        # same language, edges listed in reverse order
        g = Graph.of([(1, "b", 2), (0, "a", 1)])
        assert parse_hellings(g, AB)["S"] == {(0, 2)}

    def test_long_chain_propagation(self):
        # S -> a S b | ab over a^5 b^5 chain: deepest nesting (0,10)
        rules = CFG.of(
            [("S", ("A", "T")), ("S", ("A", "B")), ("T", ("S", "B")),
             ("A", ("a",)), ("B", ("b",))]
        )
        edges = [(i, "a", i + 1) for i in range(5)] + [
            (5 + i, "b", 6 + i) for i in range(5)
        ]
        r = parse_hellings(Graph.of(edges), rules)
        assert (0, 10) in r["S"]
        assert r["S"] == {(4, 6), (3, 7), (2, 8), (1, 9), (0, 10)}

    def test_dense_small_graph_matches_naive(self):
        # complete digraph on 4 nodes with alternating labels
        edges = [
            (i, "a" if (i + j) % 2 else "b", j)
            for i in range(4)
            for j in range(4)
        ]
        g = Graph.of(edges)
        rules = CFG.of(
            [("S", ("A", "B")), ("S", ("S", "S")), ("A", ("a",)), ("B", ("b",))]
        )
        assert parse_hellings(g, rules) == parse_naive(g, rules)


class TestOnOntologies:
    def test_matches_naive_on_skos_query2(self):
        g = query_graph("skos")
        grammar = to_cnf(query2())
        assert parse_hellings(g, grammar) == parse_naive(g, grammar)

    def test_query1_result_counts_engine_independent(self):
        from repro.core.sparse_engine import parse_csr

        g = query_graph("travel")
        grammar = to_cnf(query1())
        assert (
            parse_hellings(g, grammar)["S"] == parse_csr(g, grammar)["S"]
        )
