"""Edge-labeled directed graph substrate.

The paper's data model: ``D = (V, E)`` with ``E ⊆ V × Σ × V``. Nodes
are integers ``0..n_nodes-1`` (the paper numbers nodes the same way).
RDF inputs are converted by adding, for every triple ``(o, p, s)``, the
edges ``(o, p, s)`` and ``(s, p⁻¹, o)``; here the inverse label is
``p + "_r"``.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

INVERSE_SUFFIX = "_r"

EDGE_SCHEMA = T.StructType(
    [
        T.StructField("src", T.LongType(), False),
        T.StructField("label", T.StringType(), False),
        T.StructField("dst", T.LongType(), False),
    ]
)


@dataclass(frozen=True)
class Graph:
    """An immutable edge-labeled directed graph.

    ``edges`` is a deduplicated, sorted tuple of ``(src, label, dst)``;
    ``n_nodes`` may exceed the largest referenced node (isolated nodes
    are allowed and do not affect query results).
    """

    edges: tuple[tuple[int, str, int], ...]
    n_nodes: int

    @staticmethod
    def of(edges, n_nodes: int | None = None) -> "Graph":
        es = tuple(sorted({(int(s), str(l), int(d)) for s, l, d in edges}))
        max_ref = max((max(s, d) for s, _, d in es), default=-1)
        if n_nodes is None:
            n_nodes = max_ref + 1
        if max_ref >= n_nodes:
            raise ValueError(f"edge references node {max_ref} >= n_nodes={n_nodes}")
        if any(s < 0 or d < 0 for s, _, d in es):
            raise ValueError("node ids must be non-negative")
        return Graph(es, n_nodes)

    @property
    def n_edges(self) -> int:
        return len(self.edges)

    @property
    def labels(self) -> frozenset[str]:
        return frozenset(l for _, l, _ in self.edges)

    def with_inverses(self) -> "Graph":
        """RDF conversion: add ``(dst, label_r, src)`` for every edge.

        Matches the paper's dataset preparation: "For each triple
        (o,p,s) from a RDF file, we added edges (o,p,s) and (s,p⁻¹,o)".
        """
        inv = [(d, l + INVERSE_SUFFIX, s) for s, l, d in self.edges]
        return Graph.of(self.edges + tuple(inv), self.n_nodes)

    def to_pandas(self) -> pd.DataFrame:
        return pd.DataFrame(self.edges, columns=["src", "label", "dst"]).astype(
            {"src": "int64", "label": "string", "dst": "int64"}
        )

    def to_spark(self, spark: SparkSession) -> DataFrame:
        """Edges as a Spark DataFrame ``(src: long, label: string, dst: long)``."""
        return spark.createDataFrame(
            [(s, l, d) for s, l, d in self.edges], schema=EDGE_SCHEMA
        )


def repeat_graph(g: Graph, k: int) -> Graph:
    """``k`` disjoint copies of ``g`` (node ids offset per copy).

    This is the natural reading of the paper's construction of its
    synthetic graphs g1, g2, g3 "by simple repeating the existing
    graphs"; their #triples are exactly 8x funding, wine and pizza.
    """
    if k < 1:
        raise ValueError("k must be >= 1")
    edges: list[tuple[int, str, int]] = []
    for c in range(k):
        off = c * g.n_nodes
        edges.extend((s + off, l, d + off) for s, l, d in g.edges)
    return Graph.of(edges, g.n_nodes * k)
