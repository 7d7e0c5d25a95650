"""Unit tests for the CFG representation (repro.cfg.grammar)."""
import pytest

from repro.cfg.grammar import CFG, Production


class TestProduction:
    def test_simple(self):
        p = Production("S", ("a", "b"))
        assert p.lhs == "S" and p.rhs == ("a", "b")

    def test_epsilon_rejected(self):
        with pytest.raises(ValueError, match="epsilon"):
            Production("S", ())

    def test_empty_lhs_rejected(self):
        with pytest.raises(ValueError):
            Production("", ("a",))

    def test_empty_symbol_rejected(self):
        with pytest.raises(ValueError):
            Production("S", ("a", ""))

    def test_ordering_deterministic(self):
        a = Production("A", ("x",))
        b = Production("B", ("x",))
        assert sorted([b, a]) == [a, b]

    def test_hashable(self):
        assert len({Production("S", ("a",)), Production("S", ("a",))}) == 1


class TestCFG:
    def test_of_builds_sorted_unique(self):
        g = CFG.of([("S", ["a"]), ("S", ["a"]), ("A", ["b"])])
        assert len(g.productions) == 2
        assert g.productions[0].lhs == "A"

    def test_empty_grammar_rejected(self):
        with pytest.raises(ValueError):
            CFG.of([])

    def test_nonterminals_are_lhs_symbols(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert g.nonterminals == {"S", "A", "B"}

    def test_extra_nonterminals(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",))], extra_nonterminals=["B"])
        assert "B" in g.nonterminals
        assert "B" not in g.terminals

    def test_terminals_inferred(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert g.terminals == {"a", "b"}

    def test_symbol_both_sides_is_nonterminal(self):
        # "A" appears on a rhs and as a lhs: non-terminal, not terminal.
        g = CFG.of([("S", ("A", "A")), ("A", ("a",))])
        assert "A" in g.nonterminals and "A" not in g.terminals

    def test_productions_of(self):
        g = CFG.of([("S", ("a",)), ("S", ("b",)), ("A", ("c",))])
        assert len(g.productions_of("S")) == 2
        assert g.productions_of("missing") == ()

    def test_equality_order_independent(self):
        g1 = CFG.of([("S", ("a",)), ("A", ("b",))])
        g2 = CFG.of([("A", ("b",)), ("S", ("a",))])
        assert g1 == g2


class TestCNFPredicate:
    def test_cnf_accepts_binary_and_terminal(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert g.is_cnf()

    def test_cnf_rejects_unit(self):
        g = CFG.of([("S", ("A",)), ("A", ("a",))])
        assert not g.is_cnf()

    def test_cnf_rejects_long_rhs(self):
        g = CFG.of([("S", ("a", "b", "c"))])
        assert not g.is_cnf()

    def test_cnf_rejects_mixed_binary(self):
        # rhs of length 2 with a terminal is not CNF
        g = CFG.of([("S", ("A", "b")), ("A", ("a",))])
        assert not g.is_cnf()

    def test_binary_rules(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert g.binary_rules() == (("S", "A", "B"),)

    def test_terminal_rules(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert set(g.terminal_rules()) == {("A", "a"), ("B", "b")}

    def test_rules_require_cnf(self):
        g = CFG.of([("S", ("a", "b", "c"))])
        with pytest.raises(ValueError, match="Chomsky"):
            g.binary_rules()
        with pytest.raises(ValueError, match="Chomsky"):
            g.terminal_rules()
