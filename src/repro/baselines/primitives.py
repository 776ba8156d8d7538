"""MapEdges / GatherEdges lower-bound primitives (paper Appendix C.3.1).

MapEdges maps over every edge and reduces a constant per vertex — the cost of
just reading the graph. GatherEdges additionally performs an indirect read of
a per-vertex array at the neighbor id — the empirical lower bound for any
connectivity algorithm that must inspect both endpoints of every edge. In
dataflow, the indirect read is a join of the edge table with a vertex-keyed
table, followed by a per-vertex reduction.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def map_edges(edges_df: DataFrame) -> tuple[int, float]:
    """Degree reduction (one value per edge). Returns (rows, seconds)."""
    t0 = time.perf_counter()
    rows = edges_df.groupBy("src").agg(F.count(F.lit(1)).alias("deg")).count()
    return rows, time.perf_counter() - t0


def gather_edges(spark: SparkSession, edges_df: DataFrame, n: int) -> tuple[int, float]:
    """Indirect read per edge (join on neighbor id) + min reduction."""
    vals = spark.createDataFrame(
        pd.DataFrame({"v": np.arange(n, dtype=np.int64), "val": np.arange(n, dtype=np.int64)})
    )
    t0 = time.perf_counter()
    rows = (
        edges_df.join(vals, edges_df.dst == vals.v)
        .groupBy("src")
        .agg(F.min("val").alias("m"))
        .count()
    )
    return rows, time.perf_counter() - t0
