"""Context-free grammar representation used throughout the reproduction.

The paper (following Hellings) works with grammars *without* a
distinguished start non-terminal: the start symbol is named per query.
Epsilon rules are excluded by construction (the paper's Algorithm 1 only
handles Chomsky-normal-form grammars without epsilon; empty paths are
handled trivially outside the algorithm).

A grammar is a set of :class:`Production` objects over plain-string
symbols. A symbol is a non-terminal iff it appears as some production's
left-hand side (or is listed explicitly in ``extra_nonterminals``);
every other symbol is a terminal, i.e. an edge label of the queried
graph.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable


@dataclass(frozen=True, order=True)
class Production:
    """A single production ``lhs -> rhs[0] rhs[1] ...``.

    ``rhs`` must be non-empty: epsilon rules are rejected at the grammar
    level (see module docstring).
    """

    lhs: str
    rhs: tuple[str, ...]

    def __post_init__(self) -> None:
        if not self.lhs:
            raise ValueError("production lhs must be a non-empty symbol")
        if len(self.rhs) == 0:
            raise ValueError(
                f"epsilon production {self.lhs} -> ε is not supported "
                "(the paper's algorithm excludes epsilon rules)"
            )
        if any(not s for s in self.rhs):
            raise ValueError(f"empty symbol in rhs of {self.lhs} -> {self.rhs}")


@dataclass(frozen=True)
class CFG:
    """An epsilon-free context-free grammar ``G = (N, Sigma, P)``.

    ``productions`` is stored as a sorted tuple so equal grammars compare
    and hash equal regardless of construction order.
    """

    productions: tuple[Production, ...]
    extra_nonterminals: frozenset[str] = field(default_factory=frozenset)

    @staticmethod
    def of(
        rules: Iterable[tuple[str, Iterable[str]]],
        extra_nonterminals: Iterable[str] = (),
    ) -> "CFG":
        """Build a grammar from ``(lhs, rhs-sequence)`` pairs."""
        prods = tuple(sorted(Production(lhs, tuple(rhs)) for lhs, rhs in rules))
        return CFG(prods, frozenset(extra_nonterminals))

    def __post_init__(self) -> None:
        object.__setattr__(self, "productions", tuple(sorted(set(self.productions))))
        if not self.productions:
            raise ValueError("a grammar must have at least one production")

    @property
    def nonterminals(self) -> frozenset[str]:
        """All lhs symbols plus any explicitly declared non-terminals."""
        return frozenset(p.lhs for p in self.productions) | self.extra_nonterminals

    @property
    def terminals(self) -> frozenset[str]:
        """Symbols appearing on a rhs that are not non-terminals."""
        nts = self.nonterminals
        return frozenset(
            s for p in self.productions for s in p.rhs if s not in nts
        )

    def productions_of(self, lhs: str) -> tuple[Production, ...]:
        return tuple(p for p in self.productions if p.lhs == lhs)

    # ---- Chomsky normal form queries ------------------------------------

    def is_cnf(self) -> bool:
        """True iff every production is ``A -> B C`` or ``A -> x``.

        This is the exact input class of the paper's Algorithm 1.
        """
        nts = self.nonterminals
        for p in self.productions:
            if len(p.rhs) == 1:
                if p.rhs[0] in nts:  # unit production A -> B
                    return False
            elif len(p.rhs) == 2:
                if p.rhs[0] not in nts or p.rhs[1] not in nts:
                    return False
            else:
                return False
        return True

    def binary_rules(self) -> tuple[tuple[str, str, str], ...]:
        """CNF rules ``A -> B C`` as ``(A, B, C)`` triples (sorted)."""
        self._require_cnf()
        return tuple(
            (p.lhs, p.rhs[0], p.rhs[1])
            for p in self.productions
            if len(p.rhs) == 2
        )

    def terminal_rules(self) -> tuple[tuple[str, str], ...]:
        """CNF rules ``A -> x`` as ``(A, x)`` pairs (sorted)."""
        self._require_cnf()
        return tuple(
            (p.lhs, p.rhs[0]) for p in self.productions if len(p.rhs) == 1
        )

    def _require_cnf(self) -> None:
        if not self.is_cnf():
            raise ValueError(
                "grammar is not in Chomsky normal form; run repro.cfg.cnf.to_cnf first"
            )
