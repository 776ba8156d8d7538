"""Table harnesses: one function per paper table.

Each ``tableN(spark, scale)`` runs the experiment on the stand-in suite and
returns a pandas DataFrame with the measured rows; ``to_markdown`` writes it
under results/. Sampling passes are cached per (graph, scheme, scale) so the
Table 3 sweep shares one sampling run across all finish methods, like the
paper's framework does.
"""
from __future__ import annotations

import time
from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.bfscc import bfscc
from repro.baselines.gap import gap_afforest, gap_sv
from repro.baselines.multistep import multistep
from repro.baselines.patwary import patwary_rm
from repro.baselines.primitives import gather_edges, map_edges
from repro.baselines.stinger_like import StingerLike
from repro.baselines.workeff import workeff_cc
from repro.core.framework import connectivity, finish_with_sample, run_sampling
from repro.core.streaming import StreamingConnectIt
from repro.graphs import suite
from repro.graphs.ground_truth import canonicalize, cc_labels, same_partition
from repro.graphs.stats import graph_stats
from repro.unionfind import UFSpec

RESULTS_DIR = Path(__file__).resolve().parents[3] / "results"

_SAMPLE_CACHE: dict[tuple, tuple] = {}


def cached_sample(spark: SparkSession, name: str, scheme: str, scale: str):
    """One sampling pass per (graph, scheme, scale), shared across finishes."""
    key = (name, scheme, scale)
    if key not in _SAMPLE_CACHE:
        g = suite.get(name, scale)
        t0 = time.perf_counter()
        sample = run_sampling(spark, g, scheme)
        _SAMPLE_CACHE[key] = (sample, time.perf_counter() - t0)
    return _SAMPLE_CACHE[key]


def _truth(g) -> np.ndarray:
    return canonicalize(cc_labels(g.n, g.src, g.dst))


def _check(labels: np.ndarray, g) -> None:
    assert same_partition(labels, _truth(g)), f"wrong components on {g.name}"


def df_to_markdown(df: pd.DataFrame) -> str:
    """Minimal markdown table writer (tabulate is not installed offline)."""

    def fmt(x) -> str:
        if isinstance(x, float):
            return f"{x:.4g}"
        return "" if x is None else str(x)

    cols = list(df.columns)
    lines = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for _, row in df.iterrows():
        lines.append("| " + " | ".join(fmt(v) for v in row) + " |")
    return "\n".join(lines) + "\n"


def to_markdown(df: pd.DataFrame, name: str) -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{name}.md"
    path.write_text(df_to_markdown(df))
    return path


# ---------------------------------------------------------------- Table 1 --
def table1(spark: SparkSession, scale: str = "mini") -> pd.DataFrame:
    """Massive-graph race: ConnectIt fastest vs our implemented systems on the
    Hyperlink stand-ins (paper Table 1 compares against other publications'
    reported numbers; our comparators are the same systems rebuilt here)."""
    # warmup: first-touch Spark costs (window exec, Arrow, codegen) must not
    # land on whichever system is timed first
    connectivity(spark, suite.get("CW", "test"), "kout", "uf-rem-cas")
    rows = []
    for name in ("HL14", "HL12"):
        g = suite.get(name, scale)
        systems = {
            "ConnectIt (kout + UF-Rem-CAS)": lambda: connectivity(spark, g, "kout", "uf-rem-cas"),
            "BFSCC (Ligra)": lambda: bfscc(spark, g),
            "WorkeffCC (Shun et al.)": lambda: workeff_cc(spark, g),
            "MultiStep (Slota et al.)": lambda: multistep(spark, g),
            "GAP-SV": lambda: gap_sv(spark, g),
            "GAP-Afforest": lambda: gap_afforest(spark, g),
        }
        for sysname, fn in systems.items():
            t0 = time.perf_counter()
            labels, info = fn()
            dt = time.perf_counter() - t0
            _check(np.asarray(labels), g)
            rows.append({"graph": name, "system": sysname, "time_s": dt, "n": g.n, "m": g.m})
    df = pd.DataFrame(rows)
    best = df[df.system.str.startswith("ConnectIt")].set_index("graph").time_s
    df["speedup_vs_connectit"] = [
        r.time_s / best[r.graph] for r in df.itertuples()
    ]
    return df


# ---------------------------------------------------------------- Table 2 --
def table2(spark: SparkSession, scale: str = "mini") -> pd.DataFrame:
    return pd.DataFrame([graph_stats(suite.get(n, scale), spark) for n in suite.GRAPH_NAMES])


# ---------------------------------------------------------------- Table 3 --
UF_ALGOS = ("uf-early", "uf-hooks", "uf-async", "uf-rem-cas", "uf-rem-lock", "uf-jtb")
MIN_ALGOS = ("lt-prf", "sv", "labelprop")
LOW_DIAM = ("LJ", "CO", "TW", "FR", "CW")


def table3(
    spark: SparkSession,
    scale: str = "mini",
    graphs: tuple[str, ...] = tuple(suite.GRAPH_NAMES),
    include_systems: bool = True,
    minbased_nosample_graphs: tuple[str, ...] = LOW_DIAM + ("RO",),
    schemes: tuple[str, ...] = ("none", "kout", "bfs", "ldd"),
    systems_graphs: tuple[str, ...] | None = None,
) -> pd.DataFrame:
    """Static running times: algorithm family × sampling scheme × graph.

    Wall-clock plus the work metric (edges processed in the finish phase);
    the paper's ranking claims are checked against both. Min-based finishes
    without sampling are restricted to ``minbased_nosample_graphs``, and the
    system baselines to ``systems_graphs``, since dataflow rounds on
    high-diameter graphs otherwise dominate the sweep budget.
    """
    rows = []
    for name in graphs:
        g = suite.get(name, scale)
        truth = _truth(g)
        for scheme in schemes:
            if scheme == "bfs" and name == "RO" and scale != "test":
                continue  # diameter-many dataflow rounds; Table 6 reports it
            sample, sample_t = cached_sample(spark, name, scheme, scale)
            algos = list(UF_ALGOS) + [
                a for a in MIN_ALGOS if scheme != "none" or name in minbased_nosample_graphs
            ]
            for algo in algos:
                labels, info = finish_with_sample(
                    spark, g, sample, algo, sampling=scheme, sample_time=sample_t
                )
                assert same_partition(labels, truth), (name, scheme, algo)
                rows.append(
                    {
                        "graph": name,
                        "sampling": scheme,
                        "algorithm": algo,
                        "time_s": info["total_time_s"],
                        "finish_time_s": info["finish_time_s"],
                        "finish_edges": info["finish_edges"],
                        "rounds": info.get("rounds"),
                    }
                )
        if include_systems and (systems_graphs is None or name in systems_graphs):
            for sysname, fn in {
                "sys:BFSCC": lambda: bfscc(spark, g),
                "sys:WorkeffCC": lambda: workeff_cc(spark, g),
                "sys:MultiStep": lambda: multistep(spark, g),
                "sys:GAP-SV": lambda: gap_sv(spark, g),
                "sys:GAP-Afforest": lambda: gap_afforest(spark, g),
                "sys:PatwaryRM": lambda: patwary_rm(g),
            }.items():
                t0 = time.perf_counter()
                labels, info = fn()
                dt = time.perf_counter() - t0
                assert same_partition(np.asarray(labels), truth), (name, sysname)
                rows.append(
                    {"graph": name, "sampling": "-", "algorithm": sysname, "time_s": dt,
                     "finish_time_s": dt, "finish_edges": g.m_directed, "rounds": info.get("rounds")}
                )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Table 4 --
STREAM_ALGOS = {
    "UF-Early": UFSpec("uf-early", "naive"),
    "UF-Hooks": UFSpec("uf-hooks", "naive"),
    "UF-Async": UFSpec("uf-async", "naive"),
    "UF-Rem-CAS": UFSpec("uf-rem-cas", "naive", "split-one"),
    "UF-Rem-Lock": UFSpec("uf-rem-lock", "naive", "split-one"),
    "UF-JTB": UFSpec("uf-jtb", "two-try"),
    "Liu-Tarjan": "lt-root",
    "SV": "sv",
}


def table4(
    spark: SparkSession, scale: str = "mini", graphs: tuple[str, ...] | None = None
) -> pd.DataFrame:
    """Maximum streaming throughput: the whole graph as one COO batch."""
    names = graphs or tuple(suite.GRAPH_NAMES) + ("RM", "BA")
    rows = []
    for name in names:
        g = suite.streaming_graph(name, scale) if name in ("RM", "BA") else suite.get(name, scale)
        edges = np.stack([g.src, g.dst], axis=1)
        truth = _truth(g)
        for algname, alg in STREAM_ALGOS.items():
            s = StreamingConnectIt(g.n, alg)
            t0 = time.perf_counter()
            s.process_batch(edges)
            dt = time.perf_counter() - t0
            assert same_partition(canonicalize(s.labels()), truth), (name, algname)
            rows.append(
                {"graph": name, "algorithm": algname, "updates": len(edges),
                 "time_s": dt, "updates_per_s": len(edges) / dt}
            )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Table 5 --
def table5(
    spark: SparkSession,
    scale: str = "mini",
    batch_sizes: tuple[int, ...] = (10, 100, 1_000, 10_000, 100_000, 1_000_000),
    total_edges: int | None = None,
) -> pd.DataFrame:
    """STINGER-analog vs ConnectIt UF-Rem-CAS{SplitAtomicOne}: batch inserts
    into an empty graph, per-batch latency and throughput."""
    n = {"test": 1 << 10, "mini": 1 << 14, "bench": 1 << 17}[scale]
    total = total_edges or {"test": 20_000, "mini": 200_000, "bench": 1_000_000}[scale]
    from repro.graphs.generators import rmat

    stream_g = rmat(n, total, a=0.5, b=0.1, c=0.1, seed=7, name="stream")
    edges = np.stack([stream_g.src, stream_g.dst], axis=1)[:total]
    rows = []
    for bs in batch_sizes:
        if bs > len(edges):
            continue
        nbatches = max(1, len(edges) // bs)
        use = edges[: nbatches * bs]
        # ConnectIt
        s = StreamingConnectIt(stream_g.n, UFSpec("uf-rem-cas", "naive", "split-one"))
        t0 = time.perf_counter()
        for i in range(nbatches):
            s.process_batch(use[i * bs : (i + 1) * bs])
        ct = (time.perf_counter() - t0) / nbatches
        # STINGER-analog
        st = StingerLike(stream_g.n)
        t0 = time.perf_counter()
        for i in range(nbatches):
            st.process_batch(use[i * bs : (i + 1) * bs])
        stt = (time.perf_counter() - t0) / nbatches
        assert same_partition(canonicalize(s.labels()), canonicalize(st.labels()))
        rows.append(
            {"batch": bs, "stinger_s": stt, "stinger_rate": bs / stt,
             "connectit_s": ct, "connectit_rate": bs / ct, "speedup": stt / ct}
        )
    return pd.DataFrame(rows)


# ------------------------------------------------------------- Tables 6/7 --
def table6(spark: SparkSession, scale: str = "mini") -> pd.DataFrame:
    """BFS and LDD sampling: time, coverage, inter-component edge fraction."""
    rows = []
    for name in suite.GRAPH_NAMES:
        g = suite.get(name, scale)
        b, bt = cached_sample(spark, name, "bfs", scale)
        l, lt = cached_sample(spark, name, "ldd", scale)
        rows.append(
            {"graph": name,
             "bfs_s": bt, "bfs_cov": b.coverage(), "bfs_ic": b.intercomponent_fraction(g),
             "ldd_s": lt, "ldd_cov": l.coverage(), "ldd_ic": l.intercomponent_fraction(g)}
        )
    return pd.DataFrame(rows)


def table7(spark: SparkSession, scale: str = "mini") -> pd.DataFrame:
    """k-out(Hybrid) sampling (k=2): time, coverage, inter-component fraction."""
    rows = []
    for name in suite.GRAPH_NAMES:
        g = suite.get(name, scale)
        s, t = cached_sample(spark, name, "kout", scale)
        rows.append(
            {"graph": name, "kout_s": t, "kout_cov": s.coverage(),
             "kout_ic": s.intercomponent_fraction(g)}
        )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Table 8 --
def table8(spark: SparkSession, scale: str = "mini") -> pd.DataFrame:
    """MapEdges / GatherEdges lower bounds vs fastest ConnectIt times."""
    rows = []
    for name in suite.GRAPH_NAMES:
        g = suite.get(name, scale)
        edges = g.df(spark).localCheckpoint()
        _, map_t = map_edges(edges)
        _, gather_t = gather_edges(spark, edges, g.n)
        _, info_ns = connectivity(spark, g, "none", "uf-rem-cas")
        sample, st_ = cached_sample(spark, name, "kout", scale)
        _, info_s = finish_with_sample(spark, g, sample, "uf-rem-cas", sampling="kout", sample_time=st_)
        rows.append(
            {"graph": name, "map_s": map_t, "gather_s": gather_t,
             "cc_nosample_s": info_ns["total_time_s"], "cc_sample_s": info_s["total_time_s"]}
        )
    return pd.DataFrame(rows)
