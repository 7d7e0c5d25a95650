"""Front-door API tests (repro.core.api)."""
import pytest

from repro.cfg.grammar import CFG
from repro.cfg.queries import query1
from repro.core.api import (
    ENGINES,
    LOCAL_ENGINES,
    PAPER_IMPLEMENTATIONS,
    SPARK_ENGINES,
    graph_parse,
)
from repro.graphs.edges import Graph

AB = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
G = Graph.of([(0, "a", 1), (1, "b", 2)])


class TestRegistry:
    def test_all_engines_listed(self):
        assert set(ENGINES) == {
            "naive", "hellings", "dense", "csr", "spark", "spark-block",
        }

    def test_local_and_spark_disjoint(self):
        assert not set(LOCAL_ENGINES) & set(SPARK_ENGINES)

    def test_paper_mapping_targets_exist(self):
        for impl, engine in PAPER_IMPLEMENTATIONS.items():
            assert engine in ENGINES, (impl, engine)

    def test_paper_columns(self):
        assert set(PAPER_IMPLEMENTATIONS) == {"GLL", "dGPU", "sCPU", "sGPU"}


class TestGraphParse:
    def test_default_engine(self):
        assert graph_parse(G, AB)["S"] == {(0, 2)}

    def test_unknown_engine(self):
        with pytest.raises(ValueError, match="unknown engine"):
            graph_parse(G, AB, engine="gpu")

    def test_spark_engine_requires_session(self):
        with pytest.raises(ValueError, match="SparkSession"):
            graph_parse(G, AB, engine="spark")

    def test_non_cnf_grammar_normalized_automatically(self):
        # query1 is not CNF; graph_parse must normalize and still
        # expose the original non-terminal S
        g = Graph.of([(0, "type_r", 1), (1, "type", 2)])
        rel = graph_parse(g, query1(), engine="csr")
        assert rel["S"] == {(0, 2)}

    def test_every_local_engine_runs(self):
        for engine in LOCAL_ENGINES:
            assert graph_parse(G, AB, engine=engine)["S"] == {(0, 2)}

    def test_spark_engines_run(self, spark):
        for engine in SPARK_ENGINES:
            rel = graph_parse(G, AB, engine=engine, spark=spark)
            assert rel["S"] == {(0, 2)}

    def test_result_covers_all_nonterminals(self):
        rel = graph_parse(G, AB, engine="csr")
        assert set(rel) == {"S", "A", "B"}
