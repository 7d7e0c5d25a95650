"""Distributed Spark engine — the analogue of the paper's sGPU variant.

The paper's point is that Algorithm 1 spends all its time in bulk
sparse matrix primitives, which a data-parallel backend (CUSPARSE on a
GTX 1070 there) accelerates. Here the backend is Spark: the subset
matrix ``T`` lives as a DataFrame of coordinate-form facts
``(i, j, nt)`` — exactly a sparse matrix over the subset-of-N semiring
— and one closure round

    T <- T ∪ (T · T)

is pure Catalyst: a shuffle self-join on the inner index (``L.j =
R.i``), a join against the binary-rule table (the semiring's element
product), a project and a distinct. All 16 local cores participate in
every round, which is this container's stand-in for the paper's 1920
CUDA cores.

Two loop strategies are provided:

* ``algorithm="naive"`` — the literal Algorithm 1: multiply the full
  ``T`` by itself each round. Matches the paper line by line; used by
  fidelity tests.
* ``algorithm="seminaive"`` (default) — the standard Datalog delta
  optimization: only products involving at least one *new* fact are
  recomputed (``ΔT·T ∪ T·ΔT``). Produces the identical fixpoint
  (checked by tests) and is how a production Spark job would run it.

Lineage is truncated every round with ``localCheckpoint`` so the plan
does not grow with the iteration count.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.cfg.grammar import CFG
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph

FACT_SCHEMA = T.StructType(
    [
        T.StructField("i", T.LongType(), False),
        T.StructField("j", T.LongType(), False),
        T.StructField("nt", T.IntegerType(), False),
    ]
)


def _rules_df(spark: SparkSession, enc: GrammarEncoding) -> DataFrame:
    """Binary rules ``A -> BC`` as ``(a, b, c)`` bit-index rows."""
    return spark.createDataFrame(
        [(a, b, c) for a, b, c in enc.binary],
        schema="a int, b int, c int",
    )


def _terminal_rules_df(spark: SparkSession, enc: GrammarEncoding) -> DataFrame:
    """Terminal rules ``A -> x`` as ``(label, nt)`` rows."""
    rows = [
        (x, enc.index[a]) for a, x in enc.grammar.terminal_rules()
    ]
    return spark.createDataFrame(rows, schema="label string, nt int")


def initial_facts_df(
    spark: SparkSession, edges: DataFrame, enc: GrammarEncoding
) -> DataFrame:
    """Algorithm 1 lines 6-7 as a relational join: every edge
    ``(i, x, j)`` joined with every terminal rule ``A -> x`` yields the
    fact ``(i, j, A)``. Multi-edges collapse via ``distinct``."""
    return (
        edges.join(_terminal_rules_df(spark, enc), "label")
        .select(
            F.col("src").cast("long").alias("i"),
            F.col("dst").cast("long").alias("j"),
            F.col("nt"),
        )
        .distinct()
    )


def _multiply(left: DataFrame, right: DataFrame, rules: DataFrame) -> DataFrame:
    """One subset-matrix product ``left · right``: join on the inner
    index, then map child-pairs to heads through the rule table."""
    l = left.select(
        F.col("i"), F.col("j").alias("k"), F.col("nt").alias("b")
    )
    r = right.select(
        F.col("i").alias("k"), F.col("j"), F.col("nt").alias("c")
    )
    return (
        l.join(r, "k")
        .join(rules, ["b", "c"])
        .select("i", "j", F.col("a").alias("nt"))
        .distinct()
    )


def closure_facts(
    spark: SparkSession,
    edges: DataFrame,
    grammar: CFG,
    *,
    algorithm: str = "seminaive",
    max_iterations: int | None = None,
) -> tuple[DataFrame, int]:
    """Compute the transitive closure ``b+`` of Algorithm 1.

    Returns ``(facts, iterations)`` where ``facts`` is the closed
    DataFrame ``(i, j, nt)`` (nt = bit index) and ``iterations`` counts
    executed loop rounds. ``max_iterations`` is a safety valve for
    tests; Theorem 2 guarantees termination without it.
    """
    enc = GrammarEncoding(grammar)
    rules = _rules_df(spark, enc)
    total = initial_facts_df(spark, edges, enc).localCheckpoint(eager=True)
    iterations = 0

    if algorithm == "naive":
        prev_count = total.count()
        while max_iterations is None or iterations < max_iterations:
            total = (
                total.union(_multiply(total, total, rules))
                .distinct()
                .localCheckpoint(eager=True)
            )
            iterations += 1
            count = total.count()
            if count == prev_count:
                break
            prev_count = count
        return total, iterations

    if algorithm != "seminaive":
        raise ValueError(f"unknown algorithm {algorithm!r}")

    delta = total
    while max_iterations is None or iterations < max_iterations:
        produced = _multiply(delta, total, rules).union(
            _multiply(total, delta, rules)
        )
        delta = (
            produced.distinct()
            .join(total, ["i", "j", "nt"], "left_anti")
            .localCheckpoint(eager=True)
        )
        iterations += 1
        if delta.isEmpty():
            break
        # delta is disjoint from total by the anti-join, so no distinct.
        total = total.union(delta).localCheckpoint(eager=True)
    return total, iterations


def closure_df(
    spark: SparkSession,
    graph: Graph,
    grammar: CFG,
    *,
    algorithm: str = "seminaive",
) -> DataFrame:
    """The closure with decoded non-terminal names:
    ``(i: long, j: long, nonterminal: string)`` — ``A ∈ b+[i,j]`` rows.
    This is the DataFrame the DuckDB oracle tests compare against."""
    enc = GrammarEncoding(grammar)
    facts, _ = closure_facts(
        spark, graph.to_spark(spark), grammar, algorithm=algorithm
    )
    names = spark.createDataFrame(
        [(k, a) for k, a in enumerate(enc.nonterminals)],
        schema="nt int, nonterminal string",
    )
    return facts.join(names, "nt").select("i", "j", "nonterminal")


def parse_spark(
    spark: SparkSession,
    graph: Graph,
    grammar: CFG,
    *,
    algorithm: str = "seminaive",
) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all ``R_A`` with the Spark engine (collects to driver)."""
    enc = GrammarEncoding(grammar)
    facts, _ = closure_facts(
        spark, graph.to_spark(spark), grammar, algorithm=algorithm
    )
    out: dict[str, set[tuple[int, int]]] = {a: set() for a in enc.nonterminals}
    for row in facts.collect():
        out[enc.nonterminals[row.nt]].add((row.i, row.j))
    return {a: frozenset(s) for a, s in out.items()}
