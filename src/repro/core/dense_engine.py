"""Dense-matrix engine — the analogue of the paper's dGPU implementation.

The paper's dGPU variant stores the |V|x|V| subset matrix densely
(row-major) and runs the closure on CUBLAS. Here the subset matrix is
decomposed, exactly as in the paper's complexity argument (|N|^2
Boolean matrix multiplications), into one dense |V|x|V| Boolean matrix
per non-terminal, and each rule ``A -> BC`` contributes one Boolean
matmul ``M_A |= M_B x M_C`` per closure iteration. Matmuls run through
BLAS in float32 (exact for |V| < 2^24) — the container's stand-in for
CUBLAS.

As in the paper, the dense representation "significantly degrades
performance with increasing of the graph size"; the benchmark harness
omits this engine on the large repeated graphs g1-g3, as the paper
does.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np

from repro.cfg.grammar import CFG
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph


def _initial(enc: GrammarEncoding, graph: Graph) -> np.ndarray:
    """Stacked Boolean matrices ``M[k] = {(i,j) | A_k ∈ T0[i,j]}``."""
    n = graph.n_nodes
    m = np.zeros((enc.n, n, n), dtype=bool)
    for i, j, k in enc.initial_facts(graph):
        m[k, i, j] = True
    return m


def _bool_matmul(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Boolean matrix product via float32 BLAS (exact: row sums < 2^24)."""
    return (a.astype(np.float32) @ b.astype(np.float32)) > 0.5


def closure_steps(graph: Graph, grammar: CFG) -> Iterator[np.ndarray]:
    """Yield the matrix state after every iteration of Algorithm 1's
    loop (line 9, ``T <- T ∪ T·T``), starting with T0.

    Each yielded value is the stacked Boolean array of shape
    ``(|N|, |V|, |V|)``; the worked-example test decodes it back into
    the paper's set-matrix form T0..T5 (Figures 6-8).
    """
    enc = GrammarEncoding(grammar)
    m = _initial(enc, graph)
    yield m.copy()
    while True:
        prod = np.zeros_like(m)
        for a, b, c in enc.binary:
            prod[a] |= _bool_matmul(m[b], m[c])
        new = m | prod
        if (new == m).all():
            return
        m = new
        yield m.copy()


def parse_dense(graph: Graph, grammar: CFG) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all ``R_A`` with the dense engine (Theorem 1: the final
    matrix is the transitive closure b+, so ``A ∈ b+[i,j] ⟺ (i,j) ∈ R_A``)."""
    enc = GrammarEncoding(grammar)
    m = _initial(enc, graph)
    for m in closure_steps(graph, grammar):  # the last yielded state is b+
        pass
    return masks_to_relations(enc, m)


def masks_to_relations(
    enc: GrammarEncoding, m: np.ndarray
) -> dict[str, frozenset[tuple[int, int]]]:
    """Decode stacked Boolean matrices into ``{A: R_A}``."""
    out: dict[str, frozenset[tuple[int, int]]] = {}
    for k, a in enumerate(enc.nonterminals):
        ii, jj = np.nonzero(m[k])
        out[a] = frozenset(zip(ii.tolist(), jj.tolist()))
    return out
