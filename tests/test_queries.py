"""The paper's query grammar definitions (repro.cfg.queries)."""
from repro.cfg.cnf import to_cnf
from repro.cfg.queries import (
    SCO,
    SCO_R,
    TYPE,
    TYPE_R,
    example_grammar_cnf,
    example_graph_edges,
    query1,
    query2,
)


class TestQuery1:
    def test_four_productions(self):
        assert len(query1().productions) == 4

    def test_single_nonterminal(self):
        assert query1().nonterminals == {"S"}

    def test_terminals_are_paper_alphabet(self):
        assert query1().terminals == {SCO, SCO_R, TYPE, TYPE_R}

    def test_normalizes(self):
        assert to_cnf(query1()).is_cnf()


class TestQuery2:
    def test_four_productions(self):
        assert len(query2().productions) == 4

    def test_two_nonterminals(self):
        assert query2().nonterminals == {"S", "B"}

    def test_terminals_subclass_only(self):
        assert query2().terminals == {SCO, SCO_R}

    def test_normalizes(self):
        assert to_cnf(query2()).is_cnf()


class TestExampleGrammar:
    def test_is_cnf_as_printed(self):
        # Figure 4 is already in normal form
        assert example_grammar_cnf().is_cnf()

    def test_ten_productions(self):
        assert len(example_grammar_cnf().productions) == 10

    def test_seven_nonterminals(self):
        assert example_grammar_cnf().nonterminals == {
            "S", "S1", "S2", "S3", "S4", "S5", "S6",
        }


class TestExampleGraph:
    def test_five_edges_three_nodes(self):
        edges = example_graph_edges()
        assert len(edges) == 5
        assert {n for s, _, d in edges for n in (s, d)} == {0, 1, 2}
