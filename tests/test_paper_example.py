"""The paper's worked example (§4.3), asserted verbatim.

Figures 6-8 give the matrix states T0..T5 of Algorithm 1 on the
3-node example graph with the hand-normalized grammar G'; Figure 9
gives the resulting relations R_S..R_S6. These are exact, engine-
independent ground truth — every engine must reproduce Figure 9, and
the dense engine (whose loop is the literal Algorithm 1) must walk
through exactly the matrix states of Figures 6-8.
"""
import pytest

from repro.baseline.hellings import parse_hellings
from repro.baseline.naive import parse_naive
from repro.core.dense_engine import closure_steps, masks_to_relations
from repro.core.semiring import GrammarEncoding
from repro.core.sparse_engine import parse_csr

#: Figure 9, transcribed.
FIGURE_9 = {
    "S": {(0, 0), (0, 2), (1, 2)},
    "S1": {(0, 0)},
    "S2": {(2, 0)},
    "S3": {(0, 1), (1, 2)},
    "S4": {(2, 2)},
    "S5": {(0, 0), (1, 0)},
    "S6": {(0, 2), (1, 2)},
}

#: Figures 6-8: the set-matrix states T0..T5 (T6 = T5).
MATRICES = [
    # T0 (Figure 6)
    [[{"S1"}, {"S3"}, set()], [set(), set(), {"S3"}], [{"S2"}, set(), {"S4"}]],
    # T1 (Figure 7)
    [[{"S1"}, {"S3"}, set()], [set(), set(), {"S3", "S"}], [{"S2"}, set(), {"S4"}]],
    # T2 (Figure 8)
    [[{"S1"}, {"S3"}, set()], [{"S5"}, set(), {"S3", "S", "S6"}], [{"S2"}, set(), {"S4"}]],
    # T3
    [[{"S1"}, {"S3"}, {"S"}], [{"S5"}, set(), {"S3", "S", "S6"}], [{"S2"}, set(), {"S4"}]],
    # T4
    [[{"S1", "S5"}, {"S3"}, {"S", "S6"}], [{"S5"}, set(), {"S3", "S", "S6"}], [{"S2"}, set(), {"S4"}]],
    # T5 (= T6, the fixpoint)
    [[{"S1", "S5", "S"}, {"S3"}, {"S", "S6"}], [{"S5"}, set(), {"S3", "S", "S6"}], [{"S2"}, set(), {"S4"}]],
]


def decode_state(enc: GrammarEncoding, m) -> list[list[set]]:
    n = m.shape[1]
    return [
        [set(enc.nonterminals[k] for k in range(enc.n) if m[k, i, j]) for j in range(n)]
        for i in range(n)
    ]


class TestMatrixStates:
    def test_dense_engine_walks_figures_6_to_8(self, example_graph, example_cnf):
        enc = GrammarEncoding(example_cnf)
        states = [decode_state(enc, m) for m in closure_steps(example_graph, example_cnf)]
        assert len(states) == len(MATRICES), (
            f"expected fixpoint after {len(MATRICES) - 1} productive "
            f"iterations (paper: T6 = T5), got {len(states) - 1}"
        )
        for step, (got, want) in enumerate(zip(states, MATRICES)):
            assert got == want, f"matrix T{step} differs from the paper"

    def test_final_state_decodes_to_figure_9(self, example_graph, example_cnf):
        enc = GrammarEncoding(example_cnf)
        for m in closure_steps(example_graph, example_cnf):
            pass
        rels = masks_to_relations(enc, m)
        assert rels == {a: frozenset(s) for a, s in FIGURE_9.items()}


ENGINES = {
    "naive": parse_naive,
    "hellings": parse_hellings,
    "csr": parse_csr,
}


@pytest.mark.parametrize("engine", sorted(ENGINES))
class TestFigure9AllEngines:
    def test_relations_match_figure_9(self, engine, example_graph, example_cnf):
        got = ENGINES[engine](example_graph, example_cnf)
        assert got == {a: frozenset(s) for a, s in FIGURE_9.items()}

    @pytest.mark.parametrize("nt", sorted(FIGURE_9))
    def test_per_nonterminal(self, engine, nt, example_graph, example_cnf):
        got = ENGINES[engine](example_graph, example_cnf)
        assert got[nt] == frozenset(FIGURE_9[nt])


class TestSparkEnginesFigure9:
    def test_spark_join_engine(self, spark, example_graph, example_cnf):
        from repro.core.spark_engine import parse_spark

        got = parse_spark(spark, example_graph, example_cnf)
        assert got == {a: frozenset(s) for a, s in FIGURE_9.items()}

    def test_spark_naive_loop(self, spark, example_graph, example_cnf):
        from repro.core.spark_engine import parse_spark

        got = parse_spark(spark, example_graph, example_cnf, algorithm="naive")
        assert got == {a: frozenset(s) for a, s in FIGURE_9.items()}

    def test_spark_block_engine(self, spark, example_graph, example_cnf):
        from repro.core.block_spark_engine import parse_spark_block

        got = parse_spark_block(spark, example_graph, example_cnf, block_size=2)
        assert got == {a: frozenset(s) for a, s in FIGURE_9.items()}
