"""Harness that regenerates the paper's evaluation tables.

For each graph in the suite and each implementation column the harness
times one full query evaluation (grammar already CNF-normalized, graph
already built — exactly what the paper times) and records
``#results = |R_S|``. Output is a paper-style text table plus a
markdown paper-vs-measured comparison for EXPERIMENTS.md.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.cfg.cnf import to_cnf
from repro.cfg.grammar import CFG
from repro.core.api import PAPER_IMPLEMENTATIONS, graph_parse
from repro.graphs.edges import Graph
from repro.graphs.ontology import GRAPH_NAMES, n_triples, query_graph
from repro.bench.paper_numbers import PaperRow

#: Paper column order.
COLUMNS: tuple[str, ...] = ("GLL", "dGPU", "sCPU", "sGPU")

#: Graphs on which the paper omits the dense implementation.
DENSE_SKIP: frozenset[str] = frozenset({"g1", "g2", "g3"})


@dataclass
class TableRow:
    """One evaluated table row (one graph, all implementations)."""

    name: str
    n_triples: int
    n_results: int | None = None
    times_ms: dict[str, float] = field(default_factory=dict)


def run_cell(
    graph: Graph,
    grammar_cnf: CFG,
    impl: str,
    *,
    spark: SparkSession | None = None,
    start: str = "S",
) -> tuple[int, float]:
    """Evaluate one (graph, implementation) cell.

    Returns ``(|R_S|, elapsed_ms)``. ``impl`` is a paper column name
    (GLL/dGPU/sCPU/sGPU) or a repro engine name.
    """
    engine = PAPER_IMPLEMENTATIONS.get(impl, impl)
    t0 = time.perf_counter()
    relations = graph_parse(graph, grammar_cnf, engine=engine, spark=spark)
    elapsed_ms = (time.perf_counter() - t0) * 1e3
    return len(relations[start]), elapsed_ms


def run_table(
    grammar: CFG,
    *,
    spark: SparkSession,
    graph_names: tuple[str, ...] = GRAPH_NAMES,
    columns: tuple[str, ...] = COLUMNS,
    start: str = "S",
) -> list[TableRow]:
    """Evaluate a full paper table: every graph x every implementation.

    The dense column is skipped on g1-g3 as in the paper. All
    implementations must agree on ``#results`` (asserted here — this is
    the paper's own cross-check "All implementations ... have the same
    #results").
    """
    grammar_cnf = grammar if grammar.is_cnf() else to_cnf(grammar)
    rows: list[TableRow] = []
    for name in graph_names:
        graph = query_graph(name)
        row = TableRow(name=name, n_triples=n_triples(name))
        for impl in columns:
            if impl == "dGPU" and name in DENSE_SKIP:
                continue
            count, ms = run_cell(
                graph, grammar_cnf, impl, spark=spark, start=start
            )
            if row.n_results is None:
                row.n_results = count
            elif row.n_results != count:
                raise AssertionError(
                    f"{name}: {impl} returned {count} results, "
                    f"previous implementations returned {row.n_results}"
                )
            row.times_ms[impl] = ms
        rows.append(row)
    return rows


def format_table(
    rows: list[TableRow], *, title: str, columns: tuple[str, ...] = COLUMNS
) -> str:
    """Render rows in the paper's table layout."""
    header = ["Ontology", "#triples", "#results"] + [f"{c}(ms)" for c in columns]
    lines = [title, "\t".join(header)]
    for r in rows:
        cells = [r.name, str(r.n_triples), str(r.n_results)]
        for c in columns:
            t = r.times_ms.get(c)
            cells.append("-" if t is None else f"{t:.0f}")
        lines.append("\t".join(cells))
    return "\n".join(lines)


def format_comparison(
    rows: list[TableRow],
    paper: dict[str, PaperRow],
    *,
    title: str,
    columns: tuple[str, ...] = COLUMNS,
) -> str:
    """Markdown table with the paper's numbers next to measured ones,
    for EXPERIMENTS.md."""
    head = (
        f"### {title}\n\n"
        "| Ontology | #triples | #results (paper / here) | "
        + " | ".join(f"{c} ms (paper / here)" for c in columns)
        + " |\n|" + "---|" * (3 + len(columns))
    )
    lines = [head]
    for r in rows:
        p = paper[r.name]
        cells = [
            r.name,
            str(r.n_triples),
            f"{p[1]} / {r.n_results}",
        ]
        for k, c in enumerate(columns):
            pv = p[2 + k]
            mv = r.times_ms.get(c)
            cells.append(
                f"{'-' if pv is None else pv} / "
                f"{'-' if mv is None else f'{mv:.0f}'}"
            )
        lines.append("| " + " | ".join(cells) + " |")
    return "\n".join(lines)
