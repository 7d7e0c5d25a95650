"""Front door: ``graph_parse(graph, grammar, engine=...)``.

Mirrors the paper's Algorithm 1 signature — a graph and a CNF grammar
in, the full family of context-free relations ``{A: R_A}`` out — with
the engine (the paper's dGPU / sCPU / sGPU columns plus the baselines)
selected by name. Non-CNF grammars are normalized automatically.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession

from repro.baseline.hellings import parse_hellings
from repro.baseline.naive import parse_naive
from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.core.dense_engine import parse_dense
from repro.core.sparse_engine import parse_csr
from repro.core.spark_engine import parse_spark
from repro.core.block_spark_engine import parse_spark_block
from repro.graphs.edges import Graph

Relations = dict[str, frozenset[tuple[int, int]]]

#: Local engines: Graph x CFG -> Relations.
LOCAL_ENGINES: dict[str, Callable[[Graph, CFG], Relations]] = {
    "naive": parse_naive,
    "hellings": parse_hellings,
    "dense": parse_dense,
    "csr": parse_csr,
}

#: Distributed engines: SparkSession x Graph x CFG -> Relations.
SPARK_ENGINES: dict[str, Callable[..., Relations]] = {
    "spark": parse_spark,
    "spark-block": parse_spark_block,
}

ENGINES: tuple[str, ...] = tuple(LOCAL_ENGINES) + tuple(SPARK_ENGINES)

#: The paper's implementation names mapped onto this reproduction's
#: engines (see DESIGN.md §3 for the substitution rationale).
PAPER_IMPLEMENTATIONS: dict[str, str] = {
    "GLL": "hellings",
    "dGPU": "dense",
    "sCPU": "csr",
    "sGPU": "spark",
}


def graph_parse(
    graph: Graph,
    grammar: CFG,
    *,
    engine: str = "csr",
    spark: SparkSession | None = None,
) -> Relations:
    """Evaluate a context-free path query with the selected engine.

    Returns ``{A: R_A}`` for every non-terminal of the (normalized)
    grammar. Query a start symbol ``S`` as ``result["S"]`` — the
    paper's relational query semantics.
    """
    if not grammar.is_cnf():
        grammar = to_cnf(grammar)
    if engine in LOCAL_ENGINES:
        return LOCAL_ENGINES[engine](graph, grammar)
    if engine in SPARK_ENGINES:
        if spark is None:
            raise ValueError(f"engine {engine!r} requires a SparkSession")
        return SPARK_ENGINES[engine](spark, graph, grammar)
    raise ValueError(f"unknown engine {engine!r}; available: {ENGINES}")
