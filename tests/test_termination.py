"""Theorem 2/3 behaviors: termination, monotonicity, iteration bounds."""
import numpy as np

from repro.cfg.grammar import CFG
from repro.cfg.queries import example_grammar_cnf, example_graph_edges
from repro.core.dense_engine import closure_steps
from repro.graphs.edges import Graph

BRACKET = CFG.of(
    [("S", ("A", "T")), ("S", ("A", "B")), ("T", ("S", "B")),
     ("A", ("a",)), ("B", ("b",))]
)


class TestTermination:
    def test_monotone_growth(self):
        """Line 9 only ever adds non-terminals (Theorem 2's argument):
        nnz per state is strictly increasing until the fixpoint."""
        g = Graph.of(example_graph_edges())
        counts = [int(m.sum()) for m in closure_steps(g, example_grammar_cnf())]
        assert counts == sorted(counts)
        assert len(set(counts)) == len(counts), "each kept iteration adds facts"

    def test_superset_each_step(self):
        g = Graph.of(example_graph_edges())
        prev = None
        for m in closure_steps(g, example_grammar_cnf()):
            if prev is not None:
                assert (m | prev == m).all(), "T must grow monotonically"
            prev = m

    def test_iteration_count_bounded(self):
        """Theorem 2: at most |V|^2 |N| productive iterations."""
        g = Graph.of(example_graph_edges())
        grammar = example_grammar_cnf()
        steps = sum(1 for _ in closure_steps(g, grammar))
        assert steps <= g.n_nodes**2 * len(grammar.nonterminals)

    def test_cycle_terminates(self):
        """On a cyclic graph the language is infinite but the relation
        is finite — the fixpoint must still be reached (the scenario
        where Valiant's own closure does not directly apply)."""
        g = Graph.of([(0, "a", 1), (1, "a", 0), (0, "b", 0)])
        steps = sum(1 for _ in closure_steps(g, BRACKET))
        assert steps <= g.n_nodes**2 * len(BRACKET.nonterminals)

    def test_doubling_height_convergence(self):
        """T <- T ∪ T·T doubles the reachable derivation height per
        round for a balanced grammar (S -> S S | a): covering an
        a^32 chain takes ~log2(32) iterations, not 31."""
        n = 32
        g = Graph.of([(i, "a", i + 1) for i in range(n)])
        grammar = CFG.of([("S", ("S", "S")), ("S", ("a",))])
        steps = sum(1 for _ in closure_steps(g, grammar))
        assert steps <= 7, f"expected ~log2({n}) iterations, got {steps}"

    def test_linear_grammar_iterates_linearly(self):
        """For the linear bracket grammar each nesting level needs two
        rounds — documents that the speedup is grammar-dependent."""
        k = 8
        edges = [(i, "a", i + 1) for i in range(k)] + [
            (k + i, "b", k + 1 + i) for i in range(k)
        ]
        steps = sum(1 for _ in closure_steps(Graph.of(edges), BRACKET))
        assert steps == 2 * k
