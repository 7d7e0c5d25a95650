"""Tests for the synthetic ontology dataset substitute
(repro.graphs.ontology) and the Graph substrate (repro.graphs.edges)."""
import pytest

from repro.cfg.queries import SCO, SCO_R, TYPE, TYPE_R
from repro.graphs.edges import Graph, repeat_graph
from repro.graphs.ontology import (
    GRAPH_NAMES,
    ONTOLOGY_SPECS,
    SYNTHETIC_SPECS,
    n_triples,
    ontology_graph,
    query_graph,
)
from repro.bench.paper_numbers import PAPER_TABLE1, PAPER_TABLE2


class TestGraph:
    def test_of_dedups_and_sorts(self):
        g = Graph.of([(1, "a", 0), (0, "a", 1), (0, "a", 1)])
        assert g.edges == ((0, "a", 1), (1, "a", 0))

    def test_n_nodes_inferred(self):
        assert Graph.of([(0, "a", 5)]).n_nodes == 6

    def test_n_nodes_explicit_isolated(self):
        assert Graph.of([(0, "a", 1)], n_nodes=10).n_nodes == 10

    def test_n_nodes_too_small_rejected(self):
        with pytest.raises(ValueError):
            Graph.of([(0, "a", 5)], n_nodes=3)

    def test_negative_node_rejected(self):
        with pytest.raises(ValueError):
            Graph.of([(-1, "a", 0)])

    def test_labels(self):
        g = Graph.of([(0, "a", 1), (1, "b", 0)])
        assert g.labels == {"a", "b"}

    def test_with_inverses(self):
        g = Graph.of([(0, "p", 1)]).with_inverses()
        assert g.edges == ((0, "p", 1), (1, "p_r", 0))

    def test_with_inverses_doubles_count(self):
        g = Graph.of([(0, "a", 1), (1, "b", 2)])
        assert g.with_inverses().n_edges == 2 * g.n_edges

    def test_to_spark_schema(self, spark):
        df = Graph.of([(0, "a", 1)]).to_spark(spark)
        assert df.columns == ["src", "label", "dst"]
        assert df.count() == 1

    def test_to_pandas(self):
        pdf = Graph.of([(0, "a", 1)]).to_pandas()
        assert list(pdf.columns) == ["src", "label", "dst"]


class TestRepeatGraph:
    def test_disjoint_copies(self):
        g = Graph.of([(0, "a", 1)])
        r = repeat_graph(g, 3)
        assert r.n_edges == 3 and r.n_nodes == 6
        assert (2, "a", 3) in r.edges and (4, "a", 5) in r.edges

    def test_identity(self):
        g = Graph.of([(0, "a", 1)])
        assert repeat_graph(g, 1) == g

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            repeat_graph(Graph.of([(0, "a", 1)]), 0)


@pytest.mark.parametrize("name", sorted(ONTOLOGY_SPECS))
class TestOntologyGenerator:
    def test_triples_match_paper_exactly(self, name):
        assert ontology_graph(name).n_edges == PAPER_TABLE1[name][0]
        assert ontology_graph(name).n_edges == PAPER_TABLE2[name][0]

    def test_deterministic(self, name):
        assert ontology_graph(name) == ontology_graph(name)

    def test_only_paper_predicates(self, name):
        assert ontology_graph(name).labels <= {SCO, TYPE}

    def test_query_graph_is_inverse_closed(self, name):
        q = query_graph(name)
        assert q.labels <= {SCO, TYPE, SCO_R, TYPE_R}
        fwd = {(s, l, d) for s, l, d in q.edges if not l.endswith("_r")}
        for s, l, d in fwd:
            assert (d, l + "_r", s) in q.edges

    def test_query_graph_doubles_triples(self, name):
        assert query_graph(name).n_edges == 2 * n_triples(name)


@pytest.mark.parametrize("name", sorted(SYNTHETIC_SPECS))
class TestSyntheticGraphs:
    def test_triples_match_paper(self, name):
        assert n_triples(name) == PAPER_TABLE1[name][0]

    def test_is_eight_disjoint_copies(self, name):
        base, k = SYNTHETIC_SPECS[name]
        assert k == 8
        g = ontology_graph(name)
        b = ontology_graph(base)
        assert g.n_edges == 8 * b.n_edges
        assert g.n_nodes == 8 * b.n_nodes


class TestSuite:
    def test_graph_names_in_table_order(self):
        assert GRAPH_NAMES == tuple(PAPER_TABLE1)

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            ontology_graph("nonexistent")
