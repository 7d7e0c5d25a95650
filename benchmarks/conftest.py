"""Benchmark-suite fixtures: warm the Spark session before timing.

Without this, JVM startup, Arrow initialization and first-query codegen
land in whichever cell happens to run first (the paper's GPU timings
likewise exclude CUDA context creation).
"""
import pytest

from repro.cfg.grammar import CFG
from repro.core.spark_engine import parse_spark
from repro.graphs.edges import Graph


@pytest.fixture(scope="session", autouse=True)
def warm_spark(spark):
    g = Graph.of([(0, "a", 1), (1, "b", 2)])
    rules = CFG.of([("S", ("A", "B")), ("A", ("a",)), ("B", ("b",))])
    parse_spark(spark, g, rules)
    yield
