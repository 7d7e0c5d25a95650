"""Sparse CSR engine — the analogue of the paper's sCPU implementation.

One :class:`repro.core.csr.BoolCSR` matrix per non-terminal; each
closure iteration evaluates every rule ``A -> BC`` as a Boolean sparse
matmul ``M_B @ M_C`` on the *current* state and unions the products in
(Algorithm 1, line 9: ``T <- T ∪ T·T``). Fixpoint is detected by total
nnz, which is monotone (Theorem 2's termination argument).
"""
from __future__ import annotations

from repro.cfg.grammar import CFG
from repro.core.csr import BoolCSR
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph


def parse_csr(graph: Graph, grammar: CFG) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all ``R_A`` with the CSR sparse engine."""
    enc = GrammarEncoding(grammar)
    n = graph.n_nodes
    m: list[BoolCSR] = [BoolCSR.empty(n) for _ in range(enc.n)]
    per_nt: dict[int, tuple[list[int], list[int]]] = {}
    for i, j, k in enc.initial_facts(graph):
        per_nt.setdefault(k, ([], []))[0].append(i)
        per_nt[k][1].append(j)
    for k, (rows, cols) in per_nt.items():
        m[k] = BoolCSR.from_coo(n, rows, cols)

    while True:
        prod: dict[int, BoolCSR] = {}
        for a, b, c in enc.binary:
            p = m[b].spmm(m[c])
            if p.nnz:
                prod[a] = prod[a].union(p) if a in prod else p
        changed = False
        for a, p in prod.items():
            new = m[a].union(p)
            if new.nnz != m[a].nnz:
                m[a] = new
                changed = True
        if not changed:
            break

    out: dict[str, frozenset[tuple[int, int]]] = {}
    for k, name in enumerate(enc.nonterminals):
        rows, cols = m[k].to_coo()
        out[name] = frozenset(zip(rows.tolist(), cols.tolist()))
    return out
