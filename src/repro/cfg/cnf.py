"""Transformation of an epsilon-free CFG into Chomsky normal form.

The paper assumes its input grammar is in Chomsky normal form (CNF)
without epsilon rules and without a distinguished start symbol, and
normalizes both evaluation queries by hand (its Figure 4). This module
is the general transformer: ``to_cnf`` applies the classic TERM, BIN
and UNIT steps, preserving the language of *every original
non-terminal* (not just a start symbol), which is exactly what
relational query semantics needs — `R_A` must be unchanged for each
user-visible ``A``.

Epsilon elimination is intentionally absent: the input grammar must be
epsilon-free (enforced by :class:`repro.cfg.grammar.Production`), which
mirrors the paper's setup where only non-empty paths are queried.
"""
from __future__ import annotations

from repro.cfg.grammar import CFG, Production


def _fresh(base: str, taken: set[str]) -> str:
    """A deterministic fresh symbol name derived from ``base``."""
    cand = base
    k = 0
    while cand in taken:
        k += 1
        cand = f"{base}#{k}"
    taken.add(cand)
    return cand


def term_step(g: CFG) -> CFG:
    """TERM: in every rhs of length >= 2, replace each terminal ``x``
    with a fresh non-terminal ``T{x}`` and add ``T{x} -> x``."""
    nts = set(g.nonterminals)
    taken = set(nts) | set(g.terminals)
    wrapper: dict[str, str] = {}
    out: list[tuple[str, tuple[str, ...]]] = []
    extra: list[tuple[str, tuple[str, ...]]] = []
    for p in g.productions:
        if len(p.rhs) == 1:
            out.append((p.lhs, p.rhs))
            continue
        rhs = []
        for s in p.rhs:
            if s in nts:
                rhs.append(s)
            else:
                if s not in wrapper:
                    wrapper[s] = _fresh(f"T{{{s}}}", taken)
                    extra.append((wrapper[s], (s,)))
                rhs.append(wrapper[s])
        out.append((p.lhs, tuple(rhs)))
    return CFG.of(out + extra, g.extra_nonterminals)


def bin_step(g: CFG) -> CFG:
    """BIN: split every rhs of length k >= 3 into a chain of k-1 binary
    rules with fresh intermediate non-terminals."""
    taken = set(g.nonterminals) | set(g.terminals)
    out: list[tuple[str, tuple[str, ...]]] = []
    for idx, p in enumerate(g.productions):
        if len(p.rhs) <= 2:
            out.append((p.lhs, p.rhs))
            continue
        # A -> X1 X2 ... Xk  becomes  A -> X1 B1, B1 -> X2 B2, ...
        prev = p.lhs
        symbols = list(p.rhs)
        for i in range(len(symbols) - 2):
            mid = _fresh(f"{p.lhs}.{idx}.{i}", taken)
            out.append((prev, (symbols[i], mid)))
            prev = mid
        out.append((prev, (symbols[-2], symbols[-1])))
    return CFG.of(out, g.extra_nonterminals)


def unit_step(g: CFG) -> CFG:
    """UNIT: eliminate unit productions ``A -> B`` (both non-terminals).

    Computes the reflexive-transitive unit-pair closure and gives every
    ``A`` the non-unit productions of every ``B`` it unit-derives.
    """
    nts = g.nonterminals
    unit_of: dict[str, set[str]] = {a: {a} for a in nts}
    changed = True
    while changed:
        changed = False
        for p in g.productions:
            if len(p.rhs) == 1 and p.rhs[0] in nts:
                for a in list(unit_of):
                    if p.lhs in unit_of[a] and p.rhs[0] not in unit_of[a]:
                        unit_of[a].add(p.rhs[0])
                        changed = True
    out: list[tuple[str, tuple[str, ...]]] = []
    for a in sorted(nts):
        for b in sorted(unit_of[a]):
            for p in g.productions_of(b):
                if len(p.rhs) == 1 and p.rhs[0] in nts:
                    continue  # unit production, dropped
                out.append((a, p.rhs))
    if not out:
        raise ValueError("grammar has no non-unit productions; language is empty")
    return CFG.of(out, g.extra_nonterminals)


def to_cnf(g: CFG) -> CFG:
    """Full CNF pipeline: TERM, then BIN, then UNIT.

    The result satisfies :meth:`CFG.is_cnf` and defines the same
    relation ``R_A`` for every non-terminal ``A`` of the input grammar
    (fresh helper non-terminals are added, none removed).
    """
    out = unit_step(bin_step(term_step(g)))
    assert out.is_cnf(), "internal error: CNF pipeline produced a non-CNF grammar"
    return out
