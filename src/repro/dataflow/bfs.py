"""Breadth-first search as an iterative DataFrame program.

Each round joins the frontier with the edge table and anti-joins the visited
set — the dataflow analog of Ligra's edgeMap. Direction-optimization (the
paper's dense iterations) has no cost asymmetry in dataflow: both sparse and
dense traversal are the same join, so the optimization is a no-op here; we
note this in DESIGN.md. ``localCheckpoint`` truncates lineage every round.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def bfs_tree(
    spark: SparkSession,
    edges_df: DataFrame,
    source: int,
    max_rounds: int | None = None,
) -> tuple[DataFrame, int]:
    """BFS from ``source``; returns (tree, rounds).

    ``tree`` has columns ``v, parent, dist``: every vertex reachable from
    ``source`` with its BFS-tree parent (``parent = v`` for the source).
    """
    visited = spark.createDataFrame([(source, source, 0)], "v long, parent long, dist int").localCheckpoint()
    frontier = visited.select("v")
    rounds = 0
    while True:
        if max_rounds is not None and rounds >= max_rounds:
            break
        cand = (
            edges_df.join(frontier, edges_df.src == frontier.v)
            .select(edges_df.dst.alias("v"), edges_df.src.alias("parent"))
            .groupBy("v")
            .agg(F.min("parent").alias("parent"))
        )
        new = cand.join(visited.select("v").withColumnRenamed("v", "vv"), cand.v == F.col("vv"), "left_anti")
        new = new.withColumn("dist", F.lit(rounds + 1)).localCheckpoint()
        if new.isEmpty():
            break
        visited = visited.unionByName(new).localCheckpoint()
        frontier = new.select("v")
        rounds += 1
    return visited, rounds
