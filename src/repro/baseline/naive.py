"""Trivially-correct reference evaluator for CFPQ.

A direct transcription of the paper's Algorithm 1 over a Python matrix
of bitmask cells, with the element product computed rule-by-rule. It is
O(|V|^3) Python-level work per iteration and exists purely as a
correctness oracle for the optimized engines (dense / CSR / Spark) and
for the property-based cross-engine tests.
"""
from __future__ import annotations

from repro.cfg.grammar import CFG
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph


def parse_naive(graph: Graph, grammar: CFG) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all context-free relations ``R_A`` by the paper's
    Algorithm 1, executed cell-by-cell in pure Python."""
    enc = GrammarEncoding(grammar)
    n = graph.n_nodes
    t = [[0] * n for _ in range(n)]
    for i, j, k in enc.initial_facts(graph):
        t[i][j] |= 1 << k
    changed = True
    while changed:
        changed = False
        # T <- T ∪ (T · T), with T·T evaluated on the *current* T,
        # exactly as line 9 of Algorithm 1.
        prod = [[0] * n for _ in range(n)]
        for i in range(n):
            row = t[i]
            for r in range(n):
                m1 = row[r]
                if not m1:
                    continue
                trow = t[r]
                for j in range(n):
                    m2 = trow[j]
                    if m2:
                        prod[i][j] |= enc.subset_product(m1, m2)
        for i in range(n):
            for j in range(n):
                new = t[i][j] | prod[i][j]
                if new != t[i][j]:
                    t[i][j] = new
                    changed = True
    return relations_from_cells(enc, t)


def relations_from_cells(
    enc: GrammarEncoding, t: list[list[int]]
) -> dict[str, frozenset[tuple[int, int]]]:
    """Decode a bitmask cell matrix into ``{A: R_A}`` for every
    non-terminal (empty relations included, so engines compare equal)."""
    out: dict[str, set[tuple[int, int]]] = {a: set() for a in enc.nonterminals}
    for i, row in enumerate(t):
        for j, mask in enumerate(row):
            while mask:
                k = (mask & -mask).bit_length() - 1
                out[enc.nonterminals[k]].add((i, j))
                mask &= mask - 1
    return {a: frozenset(s) for a, s in out.items()}
