"""Shared fixtures/helpers for the test suite (session SparkSession
comes from the repo-root conftest)."""
from __future__ import annotations

import pytest

from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.cfg.queries import (
    example_grammar_cnf,
    example_graph_edges,
    query1,
    query2,
)
from repro.graphs.edges import Graph


@pytest.fixture(scope="session")
def example_graph() -> Graph:
    """The paper's worked-example graph (Figure 5)."""
    return Graph.of(example_graph_edges())


@pytest.fixture(scope="session")
def example_cnf() -> CFG:
    """The paper's hand-normalized grammar G' (Figure 4)."""
    return example_grammar_cnf()


@pytest.fixture(scope="session")
def q1_cnf() -> CFG:
    """Query 1 (Figure 10), CNF-normalized."""
    return to_cnf(query1())


@pytest.fixture(scope="session")
def q2_cnf() -> CFG:
    """Query 2 (Figure 11), CNF-normalized."""
    return to_cnf(query2())


#: The raw (non-CNF) bracket grammar, handy for CNF-pipeline tests.
BRACKET_RAW = CFG.of([("S", ("a", "S", "b")), ("S", ("a", "b"))])
