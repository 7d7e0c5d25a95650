"""Micro-benchmarks of the primitives Algorithm 1 is built from.

The paper's complexity claim (Theorem 3) prices the closure in units
of Boolean matrix multiplication (BMM) and union (BMU); these benches
measure the repro's actual BMM/BMU kernels — dense BLAS, hand-rolled
CSR, and one distributed T·T round — on the wine query graph so the
table-level times in bench_table*.py can be decomposed.

Run: ``pytest benchmarks/bench_primitives.py --benchmark-only``
"""
import numpy as np
import pytest

from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query1
from repro.core.csr import BoolCSR
from repro.core.dense_engine import _bool_matmul
from repro.core.semiring import GrammarEncoding
from repro.graphs.ontology import query_graph


@pytest.fixture(scope="module")
def wine_adjacency():
    """Boolean adjacency of the wine query graph (all labels merged) —
    a realistic sparsity pattern for kernel benches."""
    g = query_graph("wine")
    a = np.zeros((g.n_nodes, g.n_nodes), dtype=bool)
    for s, _, d in g.edges:
        a[s, d] = True
    return a


def test_dense_bmm(benchmark, wine_adjacency):
    benchmark(_bool_matmul, wine_adjacency, wine_adjacency)


def test_dense_bmu(benchmark, wine_adjacency):
    shifted = np.roll(wine_adjacency, 1, axis=1)
    benchmark(np.logical_or, wine_adjacency, shifted)


def test_csr_spmm(benchmark, wine_adjacency):
    m = BoolCSR.from_dense(wine_adjacency)
    result = benchmark(m.spmm, m)
    assert result.nnz > 0


def test_csr_union(benchmark, wine_adjacency):
    m = BoolCSR.from_dense(wine_adjacency)
    p = m.spmm(m)
    result = benchmark(m.union, p)
    assert result.nnz >= m.nnz


def test_spark_multiply_round(benchmark, spark):
    """One distributed T·T round (two Catalyst joins + distinct) on the
    wine initial fact matrix."""
    from repro.core.spark_engine import _multiply, _rules_df, initial_facts_df

    g = query_graph("wine")
    enc = GrammarEncoding(to_cnf(query1()))
    rules = _rules_df(spark, enc)
    t0 = initial_facts_df(spark, g.to_spark(spark), enc).localCheckpoint(
        eager=True
    )

    def round_():
        return _multiply(t0, t0, rules).count()

    count = benchmark.pedantic(round_, rounds=3, iterations=1)
    assert count > 0
