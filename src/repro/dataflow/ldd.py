"""Miller–Peng–Xu low-diameter decomposition as an iterative DataFrame program.

Each vertex draws a shift δ_v ~ Exp(β); vertex v wakes up (starts its own
cluster) in round ⌊δ_max − δ_v⌋ if still unclustered, and clusters grow by
one BFS hop per round (ties broken by minimum center id, optionally over a
random permutation of priorities). Produces clusters of strong diameter
O(log n / β) cutting O(βm) edges in expectation (paper §3.2).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def ldd_labels(
    spark: SparkSession,
    edges_df: DataFrame,
    n: int,
    beta: float = 0.2,
    seed: int = 0,
    permute: bool = False,
) -> tuple[DataFrame, int]:
    """One LDD round-set; returns (labels, rounds).

    ``labels`` has columns ``v, center, parent``: every vertex, its cluster
    center, and its BFS-tree parent within the cluster (``parent = v`` for
    centers) — the parent edges are the partial spanning forest used by LDD
    sampling for spanning forest (Definition B.2).
    """
    g = np.random.default_rng(seed)
    shifts = g.exponential(1.0 / beta, n)
    start = np.floor(shifts.max() - shifts).astype(np.int64)
    # cluster-priority = center id, optionally permuted so vertex order and
    # tie-break order decouple (the `permute` knob of Appendix C.3)
    prio = g.permutation(n).astype(np.int64) if permute else np.arange(n, dtype=np.int64)
    starts_df = spark.createDataFrame(
        pd.DataFrame({"v": np.arange(n, dtype=np.int64), "start": start, "prio": prio})
    ).localCheckpoint()

    labels = spark.createDataFrame([], "v long, center long, parent long").localCheckpoint()
    frontier = labels.select("v", "center")
    labeled = 0
    t = 0
    while labeled < n:
        new_centers = (
            starts_df.filter(F.col("start") <= t)
            .join(labels.select("v"), "v", "left_anti")
            .select(F.col("v"), F.col("v").alias("center"), F.col("v").alias("parent"))
        )
        adopted = (
            edges_df.join(frontier, edges_df.src == frontier.v)
            .select(edges_df.dst.alias("v"), F.col("center"), edges_df.src.alias("parent"))
        )
        cand = new_centers.unionByName(adopted)
        # priority tie-break: min (prio[center], center, parent)
        cand = cand.join(starts_df.select(F.col("v").alias("center"), F.col("prio")), "center")
        new = (
            cand.join(labels.select("v"), "v", "left_anti")
            .groupBy("v")
            .agg(F.min(F.struct("prio", "center", "parent")).alias("s"))
            .select("v", F.col("s.center").alias("center"), F.col("s.parent").alias("parent"))
            .localCheckpoint()
        )
        cnt = new.count()
        if cnt == 0 and labeled < n:
            # no growth and no new starts yet — jump to the next start time
            t += 1
            frontier = labels.limit(0).select("v", "center")
            continue
        labels = labels.unionByName(new).localCheckpoint()
        frontier = new.select("v", "center")
        labeled += cnt
        t += 1
    return labels, t
