"""Other min-based finish methods as iterative Catalyst dataflow programs.

Implements the full Liu-Tarjan framework (all 16 rule combinations of
Appendix D.4), Stergiou's two-array algorithm, Shiloach-Vishkin, and
Label-Propagation. Each synchronous round is a set of joins and min
aggregations over a parents DataFrame — the MPC setting these algorithms
were designed for maps directly onto Spark's bulk-synchronous shuffles.

All functions take a symmetric edges DataFrame over vertices [0, n) and
return ``(labels ndarray, rounds)``. Sampling composes via contraction in
``repro.core.framework`` (Theorem 5): the frequent component becomes
contracted vertex 0, the smallest possible ID, so it is never relabeled.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

MAX_ROUNDS = 500

LT_CODES = (
    "cusa", "crsa", "pusa", "prsa", "pus", "prs", "eusa", "eus",
    "cufa", "crfa", "pufa", "prfa", "puf", "prf", "eufa", "euf",
)


@dataclass(frozen=True)
class LTSpec:
    """One Liu-Tarjan rule combination.

    connect: connect | parent | extended — candidate generation rule.
    root_up: update only round-start roots.
    shortcut: one | full — one compression step vs. to fixpoint.
    alter: rewrite edge endpoints to current labels after the round.
    """

    connect: str
    root_up: bool
    shortcut: str
    alter: bool

    @classmethod
    def from_code(cls, code: str) -> "LTSpec":
        code = code.lower()
        if code not in LT_CODES:
            raise KeyError(f"unknown Liu-Tarjan code {code!r}; options: {LT_CODES}")
        connect = {"c": "connect", "p": "parent", "e": "extended"}[code[0]]
        root_up = code[1] == "r"
        shortcut = {"s": "one", "f": "full"}[code[2]]
        alter = code.endswith("a") and len(code) == 4
        return cls(connect, root_up, shortcut, alter)


def _init_labels(spark: SparkSession, n: int) -> DataFrame:
    return spark.range(n).select(F.col("id").alias("v"), F.col("id").alias("p")).localCheckpoint()


def _shortcut_once(P: DataFrame) -> DataFrame:
    """P[v] ← P[P[v]] for all v, synchronously."""
    Pp = P.select(F.col("v").alias("w"), F.col("p").alias("gp"))
    return P.join(Pp, P.p == Pp.w).select("v", F.col("gp").alias("p"))


def _changed(P_old: DataFrame, P_new: DataFrame) -> int:
    old = P_old.select("v", F.col("p").alias("old"))
    return P_new.join(old, "v").filter(F.col("p") != F.col("old")).count()


def _full_shortcut(P: DataFrame) -> DataFrame:
    while True:
        P2 = _shortcut_once(P).localCheckpoint()
        if _changed(P, P2) == 0:
            return P2
        P = P2


def _labels_np(P: DataFrame, n: int) -> np.ndarray:
    pdf = P.toPandas().sort_values("v")
    out = np.arange(n, dtype=np.int64)
    out[pdf["v"].to_numpy()] = pdf["p"].to_numpy()
    return out


def liu_tarjan(
    spark: SparkSession, edges_df: DataFrame, n: int, spec: LTSpec | str = "crfa"
) -> tuple[np.ndarray, int]:
    """Run one Liu-Tarjan variant to convergence."""
    if isinstance(spec, str):
        spec = LTSpec.from_code(spec)
    P = _init_labels(spark, n)
    E = edges_df.select("src", "dst").localCheckpoint() if spec.alter else edges_df
    rounds = 0
    while True:
        rounds += 1
        if rounds > MAX_ROUNDS:
            raise RuntimeError(f"Liu-Tarjan {spec} exceeded {MAX_ROUNDS} rounds")
        Pd = P.select(F.col("v").alias("dv"), F.col("p").alias("dp"))
        if spec.connect == "connect":
            # Connect: the edge endpoints are candidates for each other
            # (requires Alter for correctness, as in Liu-Tarjan).
            cand = E.select(F.col("src").alias("x"), F.col("dst").alias("cand"))
        else:
            # ParentConnect: P[dst] is a candidate for P[src] — the update
            # lands at the *parent*, which under RootUp is the round-start
            # root once trees are flat (Liu-Tarjan's P-* algorithms).
            Ps = P.select(F.col("v").alias("sv"), F.col("p").alias("sp"))
            both = E.join(Pd, E.dst == Pd.dv).join(Ps, E.src == F.col("sv"))
            parent_cand = both.select(F.col("sp").alias("x"), F.col("dp").alias("cand"))
            if spec.connect == "parent":
                cand = parent_cand
            else:  # extended: P[dst] is also a candidate for src itself
                up_cand = both.select(F.col("src").alias("x"), F.col("dp").alias("cand"))
                cand = parent_cand.unionByName(up_cand)
        agg = cand.groupBy("x").agg(F.min("cand").alias("c"))
        joined = P.join(agg, P.v == agg.x, "left")
        upd_ok = F.col("c").isNotNull() & (F.col("c") < F.col("p"))
        if spec.root_up:
            upd_ok = upd_ok & (F.col("p") == F.col("v"))
        P2 = joined.select("v", F.when(upd_ok, F.col("c")).otherwise(F.col("p")).alias("p")).localCheckpoint()
        P3 = _full_shortcut(P2) if spec.shortcut == "full" else _shortcut_once(P2).localCheckpoint()
        chg = _changed(P, P3)
        if spec.alter:
            Pm = P3.select(F.col("v").alias("mv"), F.col("p").alias("mp"))
            E = (
                E.join(Pm, E.src == Pm.mv)
                .select(F.col("mp").alias("src"), "dst")
                .join(Pm.withColumnRenamed("mv", "mv2").withColumnRenamed("mp", "mp2"), F.col("dst") == F.col("mv2"))
                .select("src", F.col("mp2").alias("dst"))
                .filter(F.col("src") != F.col("dst"))
                .distinct()
                .localCheckpoint()
            )
        P = P3
        if chg == 0:
            return _labels_np(P, n), rounds


def stergiou(spark: SparkSession, edges_df: DataFrame, n: int) -> tuple[np.ndarray, int]:
    """Stergiou et al.'s BSP algorithm: ParentConnect from a *previous* parents
    array, min-update into the current one, then Shortcut (paper B.2.5)."""
    P = _init_labels(spark, n)
    prev = P
    rounds = 0
    while True:
        rounds += 1
        if rounds > MAX_ROUNDS:
            raise RuntimeError("Stergiou exceeded round budget")
        prevd = prev.select(F.col("v").alias("dv"), F.col("p").alias("dp"))
        cand = edges_df.join(prevd, edges_df.dst == F.col("dv")).select(
            F.col("src").alias("x"), F.col("dp").alias("cand")
        )
        agg = cand.groupBy("x").agg(F.min("cand").alias("c"))
        joined = P.join(agg, P.v == agg.x, "left")
        P2 = joined.select(
            "v",
            F.when(F.col("c").isNotNull() & (F.col("c") < F.col("p")), F.col("c")).otherwise(F.col("p")).alias("p"),
        ).localCheckpoint()
        P3 = _shortcut_once(P2).localCheckpoint()
        chg = _changed(P, P3)
        prev, P = P, P3
        if chg == 0:
            return _labels_np(P, n), rounds


def shiloach_vishkin(spark: SparkSession, edges_df: DataFrame, n: int) -> tuple[np.ndarray, int]:
    """Shiloach-Vishkin with writeMin hooks on round-start roots and full
    pointer jumping per round (paper Algorithm 15)."""
    P = _init_labels(spark, n)
    prev = P
    rounds = 0
    while True:
        rounds += 1
        if rounds > MAX_ROUNDS:
            raise RuntimeError("SV exceeded round budget")
        Ps = P.select(F.col("v").alias("sv"), F.col("p").alias("pu"))
        Pd = P.select(F.col("v").alias("dv"), F.col("p").alias("pv"))
        both = edges_df.join(Ps, edges_df.src == F.col("sv")).join(Pd, edges_df.dst == F.col("dv"))
        lh = both.select(
            F.least("pu", "pv").alias("l"), F.greatest("pu", "pv").alias("h")
        ).filter(F.col("l") != F.col("h"))
        roots = prev.filter(F.col("p") == F.col("v")).select(F.col("v").alias("rv"))
        hooks = lh.join(roots, lh.h == F.col("rv")).groupBy("h").agg(F.min("l").alias("l"))
        joined = P.join(hooks, P.v == hooks.h, "left")
        P2 = joined.select("v", F.least(F.col("p"), F.coalesce(F.col("l"), F.col("p"))).alias("p")).localCheckpoint()
        P3 = _full_shortcut(P2)
        chg = _changed(P, P3)
        prev, P = P3, P3
        if chg == 0:
            return _labels_np(P, n), rounds


def label_propagation(spark: SparkSession, edges_df: DataFrame, n: int) -> tuple[np.ndarray, int]:
    """Folklore frontier-based min label propagation ((min, min)-SpMV)."""
    P = _init_labels(spark, n)
    frontier = P.select("v")
    rounds = 0
    while True:
        rounds += 1
        if rounds > 10 * MAX_ROUNDS:
            raise RuntimeError("Label-Propagation exceeded round budget")
        Ps = P.select(F.col("v").alias("sv"), F.col("p").alias("sp"))
        cand = (
            edges_df.join(frontier, edges_df.src == frontier.v)
            .join(Ps, edges_df.src == F.col("sv"))
            .select(edges_df.dst.alias("x"), F.col("sp").alias("cand"))
            .groupBy("x")
            .agg(F.min("cand").alias("c"))
        )
        joined = P.join(cand, P.v == cand.x, "left")
        upd = F.col("c").isNotNull() & (F.col("c") < F.col("p"))
        P2 = joined.select("v", F.when(upd, F.col("c")).otherwise(F.col("p")).alias("p"), upd.alias("chg")).localCheckpoint()
        frontier = P2.filter("chg").select("v").localCheckpoint()
        cnt = frontier.count()
        P = P2.select("v", "p")
        if cnt == 0:
            return _labels_np(P, n), rounds
