"""Unit tests for the CNF transformation (repro.cfg.cnf).

Language preservation is checked semantically: the original and the
normalized grammar must define the same relations R_A (for original
non-terminals) on probe graphs, evaluated with the naive reference
engine.
"""
import pytest

from repro.baseline.naive import parse_naive
from repro.cfg.cnf import bin_step, term_step, to_cnf, unit_step
from repro.cfg.grammar import CFG
from repro.cfg.queries import (
    example_grammar_cnf,
    example_graph_edges,
    query1,
    query2,
)
from repro.graphs.edges import Graph


class TestTermStep:
    def test_wraps_terminals_in_long_rhs(self):
        g = term_step(CFG.of([("S", ("a", "S", "b")), ("S", ("a", "b"))]))
        for p in g.productions:
            if len(p.rhs) >= 2:
                assert all(s in g.nonterminals for s in p.rhs)

    def test_keeps_single_terminal_rules(self):
        g = term_step(CFG.of([("S", ("a",))]))
        assert g == CFG.of([("S", ("a",))])

    def test_shared_wrapper_per_terminal(self):
        g = term_step(CFG.of([("S", ("a", "a")), ("A", ("a", "a"))]))
        wrappers = [p.lhs for p in g.productions if p.rhs == ("a",)]
        assert len(wrappers) == 1


class TestBinStep:
    def test_splits_long_rhs(self):
        g = bin_step(term_step(CFG.of([("S", ("a", "S", "b"))])))
        assert all(len(p.rhs) <= 2 for p in g.productions)

    def test_preserves_binary(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert bin_step(g) == g

    def test_four_symbol_rhs(self):
        g = bin_step(term_step(CFG.of([("S", ("a", "b", "c", "d"))])))
        assert all(len(p.rhs) <= 2 for p in g.productions)
        assert g.is_cnf()


class TestUnitStep:
    def test_removes_unit_productions(self):
        g = unit_step(CFG.of([("S", ("A",)), ("A", ("a",))]))
        nts = g.nonterminals
        assert all(
            not (len(p.rhs) == 1 and p.rhs[0] in nts) for p in g.productions
        )

    def test_inherits_productions(self):
        g = unit_step(CFG.of([("S", ("A",)), ("A", ("a",))]))
        assert ("S", ("a",)) in [(p.lhs, p.rhs) for p in g.productions]

    def test_unit_chain(self):
        g = unit_step(CFG.of([("S", ("A",)), ("A", ("B",)), ("B", ("b",))]))
        prods = [(p.lhs, p.rhs) for p in g.productions]
        assert ("S", ("b",)) in prods and ("A", ("b",)) in prods

    def test_unit_cycle(self):
        g = unit_step(CFG.of([("S", ("A",)), ("A", ("S",)), ("S", ("a",))]))
        prods = [(p.lhs, p.rhs) for p in g.productions]
        assert ("A", ("a",)) in prods and ("S", ("a",)) in prods

    def test_only_unit_productions_rejected(self):
        with pytest.raises(ValueError, match="empty"):
            unit_step(CFG.of([("S", ("A",)), ("A", ("S",))]))


PROBE_GRAPHS = [
    # a^n b^n ladder
    Graph.of([(0, "a", 1), (1, "a", 2), (2, "b", 3), (3, "b", 4), (1, "b", 4)]),
    # cycle with both labels
    Graph.of([(0, "a", 1), (1, "b", 0), (0, "b", 0)]),
    # multi-edge
    Graph.of([(0, "a", 1), (0, "b", 1), (1, "a", 0)]),
]

GRAMMARS = [
    CFG.of([("S", ("a", "S", "b")), ("S", ("a", "b"))]),
    CFG.of([("S", ("a", "S")), ("S", ("a",))]),
    CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("S",)), ("B", ("b",))]),
    CFG.of([("S", ("a", "b", "a", "b"))]),
    query1(),
    query2(),
]


class TestToCnf:
    @pytest.mark.parametrize("g", GRAMMARS, ids=lambda g: str(hash(g) % 10**6))
    def test_output_is_cnf(self, g):
        assert to_cnf(g).is_cnf()

    @pytest.mark.parametrize("g", GRAMMARS, ids=lambda g: str(hash(g) % 10**6))
    @pytest.mark.parametrize("graph", PROBE_GRAPHS, ids=["ladder", "cycle", "multi"])
    def test_language_preserved_on_probe_graphs(self, g, graph):
        cnf = to_cnf(g)
        # relabel probe edges onto the grammar's terminals where needed
        terms = sorted(g.terminals)
        mapping = {"a": terms[0], "b": terms[-1]}
        relabeled = Graph.of(
            [(s, mapping.get(l, l), d) for s, l, d in graph.edges]
        )
        r_orig = brute_relations(relabeled, g)
        r_cnf = parse_naive(relabeled, cnf)
        for a in g.nonterminals:
            assert r_cnf[a] == r_orig[a], f"relation changed for {a}"

    def test_idempotent_on_cnf(self):
        g = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
        assert to_cnf(g).is_cnf()

    def test_example_grammar_matches_paper_normalization(self, example_graph=None):
        """to_cnf(query1-style grammar) defines the same R_S as the
        paper's hand-normalized G' (Figure 4) on the worked example."""
        graph = Graph.of(example_graph_edges())
        ours = parse_naive(graph, to_cnf(query1()))["S"]
        papers = parse_naive(graph, example_grammar_cnf())["S"]
        assert ours == papers == frozenset({(0, 0), (0, 2), (1, 2)})


def brute_relations(graph: Graph, g: CFG) -> dict[str, frozenset]:
    """Brute-force R_A for an arbitrary (non-CNF) epsilon-free grammar:
    bottom-up fixpoint over general productions."""
    facts: set[tuple[str, int, int]] = set()
    nts = g.nonterminals
    # seed with edges interpreted as terminal symbols
    changed = True
    while changed:
        changed = False
        for p in g.productions:
            # match rhs symbol by symbol, extending path spans
            spans = {(n, n) for n in range(graph.n_nodes)}
            for sym in p.rhs:
                new_spans = set()
                for (i, j) in spans:
                    if sym in nts:
                        for (a, x, y) in facts:
                            if a == sym and x == j:
                                new_spans.add((i, y))
                    else:
                        for (s, l, d) in graph.edges:
                            if s == j and l == sym:
                                new_spans.add((i, d))
                spans = new_spans
            for (i, j) in spans:
                f = (p.lhs, i, j)
                if f not in facts:
                    facts.add(f)
                    changed = True
    out = {a: set() for a in nts}
    for a, i, j in facts:
        out[a].add((i, j))
    return {a: frozenset(s) for a, s in out.items()}
