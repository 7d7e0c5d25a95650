"""Worklist-based CFPQ baseline (the paper's GLL comparator).

The paper times its matrix algorithm against the GLL-based CFPQ
implementation of Grigorev & Ragozina [5] — a per-edge, worklist-driven
parser with no bulk matrix operations. That F#/.NET artifact is not
available here, so this module substitutes the classic Hellings
algorithm (the paper's reference [6]), which has the identical
execution character: one fact ``(A, i, j)`` at a time, propagated
through indexes, purely sequential. It computes exactly the same
relations ``R_A``, so `#results` columns are engine-independent and the
matrix-vs-worklist performance comparison is preserved.

Complexity: O(|P| · |V|^3) in the worst case, but proportional to the
number of derivable facts times the fan-in/out on real graphs — the
same regime in which GLL operates.
"""
from __future__ import annotations

from collections import deque

from repro.cfg.grammar import CFG
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph


def parse_hellings(graph: Graph, grammar: CFG) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all ``R_A`` with Hellings' worklist algorithm."""
    enc = GrammarEncoding(grammar)

    # Rule indexes: for a fact with non-terminal X used as the left
    # (resp. right) child, which (head, sibling) pairs apply.
    as_left: dict[int, list[tuple[int, int]]] = {}
    as_right: dict[int, list[tuple[int, int]]] = {}
    for a, b, c in enc.binary:
        as_left.setdefault(b, []).append((a, c))
        as_right.setdefault(c, []).append((a, b))

    facts: set[tuple[int, int, int]] = set(enc.initial_facts(graph))
    work: deque[tuple[int, int, int]] = deque(sorted(facts))

    # starting_at[j][C] = nodes k with (C, j, k) in facts
    # ending_at[i][B]  = nodes k with (B, k, i) in facts
    starting_at: dict[int, dict[int, set[int]]] = {}
    ending_at: dict[int, dict[int, set[int]]] = {}
    for i, j, x in facts:
        starting_at.setdefault(i, {}).setdefault(x, set()).add(j)
        ending_at.setdefault(j, {}).setdefault(x, set()).add(i)

    def add(i: int, j: int, x: int) -> None:
        f = (i, j, x)
        if f not in facts:
            facts.add(f)
            starting_at.setdefault(i, {}).setdefault(x, set()).add(j)
            ending_at.setdefault(j, {}).setdefault(x, set()).add(i)
            work.append(f)

    while work:
        i, j, x = work.popleft()
        # X as left child:  (X, i, j) + (C, j, k)  =>  (A, i, k)
        for a, c in as_left.get(x, ()):
            for k in list(starting_at.get(j, {}).get(c, ())):
                add(i, k, a)
        # X as right child: (B, k, i) + (X, i, j)  =>  (A, k, j)
        for a, b in as_right.get(x, ()):
            for k in list(ending_at.get(i, {}).get(b, ())):
                add(k, j, a)

    out: dict[str, set[tuple[int, int]]] = {a: set() for a in enc.nonterminals}
    for i, j, x in facts:
        out[enc.nonterminals[x]].add((i, j))
    return {a: frozenset(s) for a, s in out.items()}
