"""Unit tests for the subset-of-N bitset algebra (repro.core.semiring)."""
import pytest

from repro.cfg.grammar import CFG
from repro.core.semiring import MAX_NONTERMINALS, GrammarEncoding
from repro.graphs.edges import Graph

G = CFG.of(
    [
        ("S", ("A", "B")),
        ("S", ("B", "A")),
        ("A", ("a",)),
        ("B", ("b",)),
    ]
)


@pytest.fixture
def enc() -> GrammarEncoding:
    return GrammarEncoding(G)


class TestEncoding:
    def test_requires_cnf(self):
        with pytest.raises(ValueError, match="CNF"):
            GrammarEncoding(CFG.of([("S", ("a", "b", "c"))]))

    def test_nonterminals_sorted(self, enc):
        assert enc.nonterminals == ("A", "B", "S")

    def test_index_roundtrip(self, enc):
        for k, a in enumerate(enc.nonterminals):
            assert enc.index[a] == k

    def test_binary_rules_as_indices(self, enc):
        a, b, s = enc.index["A"], enc.index["B"], enc.index["S"]
        assert set(enc.binary) == {(s, a, b), (s, b, a)}

    def test_terminal_heads(self, enc):
        assert enc.terminal_heads["a"] == 1 << enc.index["A"]
        assert enc.terminal_heads["b"] == 1 << enc.index["B"]

    def test_n(self, enc):
        assert enc.n == 3

    def test_too_many_nonterminals(self):
        rules = [(f"N{i}", ("x",)) for i in range(MAX_NONTERMINALS + 1)]
        with pytest.raises(ValueError, match="non-terminals"):
            GrammarEncoding(CFG.of(rules))

    def test_max_nonterminals_ok(self):
        rules = [(f"N{i:02d}", ("x",)) for i in range(MAX_NONTERMINALS)]
        enc = GrammarEncoding(CFG.of(rules))
        assert enc.n == MAX_NONTERMINALS


class TestSubsetAlgebra:
    def test_mask_decode_roundtrip(self, enc):
        m = enc.mask_of(["A", "S"])
        assert enc.decode(m) == {"A", "S"}

    def test_empty_mask(self, enc):
        assert enc.mask_of([]) == 0
        assert enc.decode(0) == frozenset()

    def test_subset_product_paper_definition(self, enc):
        # {A} . {B} = {S} because S -> A B
        got = enc.subset_product(enc.mask_of(["A"]), enc.mask_of(["B"]))
        assert enc.decode(got) == {"S"}

    def test_subset_product_commuted_rule(self, enc):
        got = enc.subset_product(enc.mask_of(["B"]), enc.mask_of(["A"]))
        assert enc.decode(got) == {"S"}

    def test_subset_product_empty_when_no_rule(self, enc):
        assert enc.subset_product(enc.mask_of(["A"]), enc.mask_of(["A"])) == 0
        assert enc.subset_product(0, enc.mask_of(["B"])) == 0

    def test_subset_product_union_semantics(self, enc):
        # {A,B} . {A,B} triggers both S -> AB and S -> BA
        m = enc.mask_of(["A", "B"])
        assert enc.decode(enc.subset_product(m, m)) == {"S"}


class TestInitialFacts:
    def test_single_edges(self, enc):
        g = Graph.of([(0, "a", 1), (1, "b", 2)])
        assert enc.initial_facts(g) == {
            (0, 1, enc.index["A"]),
            (1, 2, enc.index["B"]),
        }

    def test_multi_edge_union(self, enc):
        # paper: multiple edges between one node pair union their heads
        g = Graph.of([(0, "a", 1), (0, "b", 1)])
        assert enc.initial_facts(g) == {
            (0, 1, enc.index["A"]),
            (0, 1, enc.index["B"]),
        }

    def test_unknown_label_ignored(self, enc):
        g = Graph.of([(0, "z", 1)])
        assert enc.initial_facts(g) == set()

    def test_self_loop(self, enc):
        g = Graph.of([(3, "a", 3)])
        assert enc.initial_facts(g) == {(3, 3, enc.index["A"])}
