"""The subset-of-N algebra underlying the paper's matrix multiplication.

The paper multiplies matrices whose elements are *subsets of N* (the
non-terminal set), with

    N1 · N2 = { A | ∃ B ∈ N1, C ∈ N2 : (A -> BC) ∈ P }

as element product and set union as addition. With |N| <= 64 a subset
is a machine word: non-terminal ``k`` is bit ``1 << k``. Every engine
in :mod:`repro.core` shares this encoding via :class:`GrammarEncoding`.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import cached_property

from repro.cfg.grammar import CFG
from repro.graphs.edges import Graph

MAX_NONTERMINALS = 64


@dataclass(frozen=True)
class GrammarEncoding:
    """Bit-index encoding of a CNF grammar.

    * ``nonterminals[k]`` is the non-terminal with bit index ``k``
      (sorted, so the encoding is deterministic).
    * ``binary`` holds ``(A, B, C)`` index triples for rules ``A -> BC``.
    * ``terminal_heads[x]`` is the bitmask of heads of rules ``A -> x``.
    """

    grammar: CFG

    def __post_init__(self) -> None:
        if not self.grammar.is_cnf():
            raise ValueError("GrammarEncoding requires a CNF grammar")
        if len(self.grammar.nonterminals) > MAX_NONTERMINALS:
            raise ValueError(
                f"more than {MAX_NONTERMINALS} non-terminals; "
                "bitset encoding uses one uint64 word"
            )

    @cached_property
    def nonterminals(self) -> tuple[str, ...]:
        return tuple(sorted(self.grammar.nonterminals))

    @cached_property
    def index(self) -> dict[str, int]:
        return {a: k for k, a in enumerate(self.nonterminals)}

    @cached_property
    def binary(self) -> tuple[tuple[int, int, int], ...]:
        ix = self.index
        return tuple(
            sorted((ix[a], ix[b], ix[c]) for a, b, c in self.grammar.binary_rules())
        )

    @cached_property
    def terminal_heads(self) -> dict[str, int]:
        out: dict[str, int] = {}
        for a, x in self.grammar.terminal_rules():
            out[x] = out.get(x, 0) | (1 << self.index[a])
        return out

    @property
    def n(self) -> int:
        return len(self.nonterminals)

    # ---- subset algebra -------------------------------------------------

    def mask_of(self, nts) -> int:
        """Bitmask of a collection of non-terminal names."""
        m = 0
        for a in nts:
            m |= 1 << self.index[a]
        return m

    def decode(self, mask: int) -> frozenset[str]:
        """Non-terminal names present in ``mask``."""
        return frozenset(
            a for k, a in enumerate(self.nonterminals) if mask >> k & 1
        )

    def subset_product(self, m1: int, m2: int) -> int:
        """``N1 · N2`` on bitmask-encoded subsets — the paper's element
        product. Used by the reference engines and by tests; the bulk
        engines vectorize the same rule table instead."""
        out = 0
        for a, b, c in self.binary:
            if m1 >> b & 1 and m2 >> c & 1:
                out |= 1 << a
        return out

    # ---- graph initialization (Algorithm 1 lines 6-7) -------------------

    def initial_facts(self, graph: Graph) -> set[tuple[int, int, int]]:
        """``{(i, j, k) | (i, x, j) ∈ E, (A_k -> x) ∈ P}``.

        Multiple edges between the same node pair contribute the union
        of their head sets, exactly as the paper notes for multigraphs.
        """
        facts: set[tuple[int, int, int]] = set()
        th = self.terminal_heads
        for s, l, d in graph.edges:
            heads = th.get(l, 0)
            k = 0
            while heads:
                if heads & 1:
                    facts.add((s, d, k))
                heads >>= 1
                k += 1
        return facts
