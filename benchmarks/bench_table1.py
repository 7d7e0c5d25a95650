"""Benchmark regenerating the paper's Table 1 (Query 1).

One pytest-benchmark entry per (graph x implementation) cell, timed
exactly as the paper times it: grammar already normalized, graph
already loaded, the measured region is one full query evaluation. The
dGPU (dense) column is omitted on g1-g3 as in the paper. After all
cells run, the assembled paper-style table and the paper-vs-measured
comparison are printed (captured in bench_output.txt).

Run: ``pytest benchmarks/bench_table1.py --benchmark-only``
"""
import pathlib

import pytest

from repro.bench.harness import (
    COLUMNS,
    DENSE_SKIP,
    TableRow,
    format_comparison,
    format_table,
    run_cell,
)
from repro.bench.paper_numbers import PAPER_TABLE1
from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query1
from repro.graphs.ontology import GRAPH_NAMES, n_triples, query_graph

CELLS = [
    (name, impl)
    for name in GRAPH_NAMES
    for impl in COLUMNS
    if not (impl == "dGPU" and name in DENSE_SKIP)
]

_rows: dict[str, TableRow] = {}


@pytest.fixture(scope="module")
def grammar():
    return to_cnf(query1())


@pytest.fixture(scope="module", autouse=True)
def _report():
    """After every cell has been measured, print the assembled table and
    persist it (pytest captures teardown prints, so the file under
    benchmarks/out/ is the reliable artifact for EXPERIMENTS.md)."""
    yield
    rows = [_rows[n] for n in GRAPH_NAMES if n in _rows]
    if not rows:
        return
    text = (
        format_table(rows, title="Table 1: Evaluation results for Query 1")
        + "\n\n"
        + format_comparison(rows, PAPER_TABLE1, title="Table 1 (paper / here)")
        + "\n"
    )
    out = pathlib.Path(__file__).parent / "out"
    out.mkdir(exist_ok=True)
    (out / "table1.txt").write_text(text)
    print("\n" + text)


@pytest.mark.parametrize(
    ("name", "impl"), CELLS, ids=[f"{n}-{i}" for n, i in CELLS]
)
def test_table1_cell(benchmark, spark, grammar, name, impl):
    graph = query_graph(name)  # built outside the timed region

    count, ms = benchmark.pedantic(
        run_cell, args=(graph, grammar, impl), kwargs={"spark": spark},
        rounds=1, iterations=1,
    )
    benchmark.extra_info["n_results"] = count
    row = _rows.setdefault(name, TableRow(name, n_triples(name)))
    if row.n_results is None:
        row.n_results = count
    # the paper's own cross-check: every implementation, same #results
    assert row.n_results == count, (name, impl, count, row.n_results)
    row.times_ms[impl] = ms
