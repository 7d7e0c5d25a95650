"""Property-based cross-engine agreement: random graphs x random CNF
grammars, all engines must produce identical relations.

The naive engine is the specification (a literal cell-by-cell
transcription of Algorithm 1); hellings / dense / csr must match it on
arbitrary inputs. Spark engines are covered by a smaller deterministic
sample (JVM round-trips are too slow for hypothesis example counts).
"""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baseline.hellings import parse_hellings
from repro.baseline.naive import parse_naive
from repro.cfg.grammar import CFG
from repro.core.dense_engine import parse_dense
from repro.core.sparse_engine import parse_csr
from repro.graphs.edges import Graph

LABELS = ("a", "b")
NTS = ("S", "A", "B")


@st.composite
def cnf_grammars(draw):
    """Random small CNF grammars over labels {a, b}, non-terminals
    {S, A, B}; always at least one terminal rule."""
    term_rules = draw(
        st.lists(
            st.tuples(st.sampled_from(NTS), st.sampled_from(LABELS)),
            min_size=1,
            max_size=4,
            unique=True,
        )
    )
    bin_rules = draw(
        st.lists(
            st.tuples(
                st.sampled_from(NTS), st.sampled_from(NTS), st.sampled_from(NTS)
            ),
            max_size=5,
            unique=True,
        )
    )
    rules = [(a, (x,)) for a, x in term_rules] + [
        (a, (b, c)) for a, b, c in bin_rules
    ]
    g = CFG.of(rules, extra_nonterminals=NTS)
    assert g.is_cnf()
    return g


@st.composite
def graphs(draw):
    n = draw(st.integers(1, 6))
    edges = draw(
        st.lists(
            st.tuples(
                st.integers(0, n - 1),
                st.sampled_from(LABELS),
                st.integers(0, n - 1),
            ),
            min_size=1,
            max_size=12,
        )
    )
    return Graph.of(edges, n_nodes=n)


@settings(max_examples=80, deadline=None)
@given(graph=graphs(), grammar=cnf_grammars())
def test_hellings_matches_naive(graph, grammar):
    assert parse_hellings(graph, grammar) == parse_naive(graph, grammar)


@settings(max_examples=80, deadline=None)
@given(graph=graphs(), grammar=cnf_grammars())
def test_dense_matches_naive(graph, grammar):
    assert parse_dense(graph, grammar) == parse_naive(graph, grammar)


@settings(max_examples=80, deadline=None)
@given(graph=graphs(), grammar=cnf_grammars())
def test_csr_matches_naive(graph, grammar):
    assert parse_csr(graph, grammar) == parse_naive(graph, grammar)


@settings(max_examples=40, deadline=None)
@given(graph=graphs(), grammar=cnf_grammars())
def test_local_engines_pairwise(graph, grammar):
    ref = parse_hellings(graph, grammar)
    assert parse_dense(graph, grammar) == ref
    assert parse_csr(graph, grammar) == ref


#: Deterministic sample for the Spark engines: a few adversarial
#: graph/grammar pairs drawn from the same distributions.
SPARK_SAMPLE = [
    (
        Graph.of([(0, "a", 0)]),
        CFG.of([("S", ("S", "S")), ("S", ("a",))]),
    ),
    (
        Graph.of([(0, "a", 1), (1, "a", 0), (1, "b", 1)]),
        CFG.of([("S", ("A", "S")), ("S", ("b",)), ("A", ("a",))]),
    ),
    (
        Graph.of([(i, "a", (i + 1) % 5) for i in range(5)]),
        CFG.of([("S", ("S", "S")), ("S", ("a",))]),
    ),
]


@pytest.mark.parametrize("idx", range(len(SPARK_SAMPLE)))
def test_spark_matches_naive_on_sample(spark, idx):
    from repro.core.spark_engine import parse_spark

    graph, grammar = SPARK_SAMPLE[idx]
    assert parse_spark(spark, graph, grammar) == parse_naive(graph, grammar)


@pytest.mark.parametrize("idx", range(len(SPARK_SAMPLE)))
def test_block_spark_matches_naive_on_sample(spark, idx):
    from repro.core.block_spark_engine import parse_spark_block

    graph, grammar = SPARK_SAMPLE[idx]
    assert parse_spark_block(spark, graph, grammar, block_size=2) == parse_naive(
        graph, grammar
    )
