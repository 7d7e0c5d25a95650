"""Block-partitioned Spark engine — per-partition matrix kernels.

A second sGPU analogue, matching the reproduction hint "sparse matrix
operations per partition": the node set is tiled into ``bs x bs``
blocks; only *nonzero blocks* are materialized (block-sparse storage),
each block being a dense ``uint64`` bitmask array — bit ``k`` of cell
``(i, j)`` says ``A_k ∈ T[i, j]``, i.e. the whole subset-of-N matrix
element in one machine word.

One closure round is block matrix multiplication: a Catalyst join pairs
blocks on the shared inner block index, then an ``applyInPandas``
kernel multiplies each pair on the executor with vectorized numpy
(one Boolean matmul per grammar rule, exactly the paper's |N|^2-BMM
decomposition) and ORs partial products per output block. The fixpoint
test is the total popcount, monotone per Theorem 2.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.cfg.grammar import CFG
from repro.core.semiring import GrammarEncoding
from repro.graphs.edges import Graph

BLOCK_SCHEMA = "bi long, bj long, data binary"


def _initial_blocks(
    spark: SparkSession, graph: Graph, enc: GrammarEncoding, bs: int
) -> DataFrame:
    """T0 in block-sparse form: one row per nonzero ``bs x bs`` block."""
    blocks: dict[tuple[int, int], np.ndarray] = {}
    for i, j, k in enc.initial_facts(graph):
        key = (i // bs, j // bs)
        if key not in blocks:
            blocks[key] = np.zeros((bs, bs), dtype=np.uint64)
        blocks[key][i % bs, j % bs] |= np.uint64(1 << k)
    rows = [
        (int(bi), int(bj), arr.tobytes())
        for (bi, bj), arr in sorted(blocks.items())
    ]
    if not rows:
        rows = []
    return spark.createDataFrame(rows, schema=BLOCK_SCHEMA)


def _decode(data: bytes, bs: int) -> np.ndarray:
    return np.frombuffer(data, dtype=np.uint64).reshape(bs, bs)


def _make_product_kernel(rules: tuple[tuple[int, int, int], ...], bs: int):
    """Kernel for one output block: OR over inner-index partial products
    of the per-rule Boolean matmuls, on bitmask-packed blocks."""

    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        out = np.zeros((bs, bs), dtype=np.uint64)
        for adata, bdata in zip(pdf["adata"], pdf["bdata"]):
            a = _decode(adata, bs)
            b = _decode(bdata, bs)
            for head, left, right in rules:
                mb = ((a >> np.uint64(left)) & np.uint64(1)).astype(np.float32)
                mc = ((b >> np.uint64(right)) & np.uint64(1)).astype(np.float32)
                hit = (mb @ mc) > 0.5
                out |= hit.astype(np.uint64) << np.uint64(head)
        return pd.DataFrame(
            {
                "bi": [int(pdf["bi"].iloc[0])],
                "bj": [int(pdf["bj"].iloc[0])],
                "data": [out.tobytes()],
            }
        )

    return kernel


def _make_or_kernel(bs: int):
    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        out = np.zeros((bs, bs), dtype=np.uint64)
        for data in pdf["data"]:
            out |= _decode(data, bs)
        return pd.DataFrame(
            {
                "bi": [int(pdf["bi"].iloc[0])],
                "bj": [int(pdf["bj"].iloc[0])],
                "data": [out.tobytes()],
            }
        )

    return kernel


def _popcount_series(data: pd.Series) -> pd.Series:
    return data.map(
        lambda b: int(np.unpackbits(np.frombuffer(b, dtype=np.uint8)).sum())
    )


def _total_popcount(blocks: DataFrame) -> int:
    # The pandas_udf is created lazily (not at module import): executors
    # import this module when unpickling the kernels, and udf creation
    # needs an active session on the driver only.
    from pyspark.sql.types import LongType

    popcount = F.pandas_udf(_popcount_series, LongType())
    row = blocks.select(F.sum(popcount("data")).alias("s")).collect()[0]
    return int(row.s or 0)


def parse_spark_block(
    spark: SparkSession,
    graph: Graph,
    grammar: CFG,
    *,
    block_size: int = 64,
) -> dict[str, frozenset[tuple[int, int]]]:
    """Compute all ``R_A`` with the block-partitioned Spark engine."""
    enc = GrammarEncoding(grammar)
    bs = block_size
    blocks = _initial_blocks(spark, graph, enc, bs).localCheckpoint(eager=True)
    product_kernel = _make_product_kernel(enc.binary, bs)
    or_kernel = _make_or_kernel(bs)

    count = _total_popcount(blocks)
    while True:
        a = blocks.select(
            F.col("bi"), F.col("bj").alias("k"), F.col("data").alias("adata")
        )
        b = blocks.select(
            F.col("bi").alias("k"), F.col("bj"), F.col("data").alias("bdata")
        )
        prod = (
            a.join(b, "k")
            .groupBy("bi", "bj")
            .applyInPandas(product_kernel, BLOCK_SCHEMA)
        )
        blocks = (
            blocks.union(prod)
            .groupBy("bi", "bj")
            .applyInPandas(or_kernel, BLOCK_SCHEMA)
            .localCheckpoint(eager=True)
        )
        new_count = _total_popcount(blocks)
        if new_count == count:
            break
        count = new_count

    out: dict[str, set[tuple[int, int]]] = {a: set() for a in enc.nonterminals}
    for row in blocks.collect():
        arr = _decode(row.data, bs)
        ii, jj = np.nonzero(arr)
        for i, j in zip(ii.tolist(), jj.tolist()):
            mask = int(arr[i, j])
            gi, gj = row.bi * bs + i, row.bj * bs + j
            while mask:
                k = (mask & -mask).bit_length() - 1
                out[enc.nonterminals[k]].add((gi, gj))
                mask &= mask - 1
    return {a: frozenset(s) for a, s in out.items()}
