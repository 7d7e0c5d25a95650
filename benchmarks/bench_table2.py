"""Benchmark regenerating the paper's Table 2 (Query 2).

Same harness as bench_table1 with the Query 2 grammar; see that module
for methodology. Run:
``pytest benchmarks/bench_table2.py --benchmark-only``
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
from repro.bench.paper_numbers import PAPER_TABLE2
from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query2
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
    return to_cnf(query2())


@pytest.fixture(scope="module", autouse=True)
def _report():
    """See bench_table1._report — file under benchmarks/out/ is the
    reliable artifact."""
    yield
    rows = [_rows[n] for n in GRAPH_NAMES if n in _rows]
    if not rows:
        return
    text = (
        format_table(rows, title="Table 2: Evaluation results for Query 2")
        + "\n\n"
        + format_comparison(rows, PAPER_TABLE2, title="Table 2 (paper / here)")
        + "\n"
    )
    out = pathlib.Path(__file__).parent / "out"
    out.mkdir(exist_ok=True)
    (out / "table2.txt").write_text(text)
    print("\n" + text)


@pytest.mark.parametrize(
    ("name", "impl"), CELLS, ids=[f"{n}-{i}" for n, i in CELLS]
)
def test_table2_cell(benchmark, spark, grammar, name, impl):
    graph = query_graph(name)

    count, ms = benchmark.pedantic(
        run_cell, args=(graph, grammar, impl), kwargs={"spark": spark},
        rounds=1, iterations=1,
    )
    benchmark.extra_info["n_results"] = count
    row = _rows.setdefault(name, TableRow(name, n_triples(name)))
    if row.n_results is None:
        row.n_results = count
    assert row.n_results == count, (name, impl, count, row.n_results)
    row.times_ms[impl] = ms
