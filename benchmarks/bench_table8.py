"""Table 8 benchmarks: MapEdges / GatherEdges primitives vs ConnectIt."""
import pytest

from repro.baselines.primitives import gather_edges, map_edges
from repro.core.framework import connectivity
from repro.graphs import suite

G = suite.get("TW", "test")


@pytest.fixture(scope="module")
def edges(spark):
    e = G.df(spark).localCheckpoint()
    e.count()
    return e


def bench_map_edges(benchmark, spark, edges):
    benchmark.pedantic(lambda: map_edges(edges), rounds=3, iterations=1)


def bench_gather_edges(benchmark, spark, edges):
    benchmark.pedantic(lambda: gather_edges(spark, edges, G.n), rounds=3, iterations=1)


def bench_connectit_sampled(benchmark, spark, edges):
    benchmark.pedantic(
        lambda: connectivity(spark, G, "kout", "uf-rem-cas"), rounds=3, iterations=1
    )
