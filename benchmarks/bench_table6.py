"""Table 6 benchmarks: BFS vs LDD sampling cost on low/high-diameter inputs."""
import pytest

from repro.core.sampling import bfs_sample, ldd_sample
from repro.graphs import suite


@pytest.mark.parametrize("name", ["RO", "CO"])
def bench_bfs_sampling(benchmark, spark, name):
    g = suite.get(name, "test")
    benchmark.pedantic(lambda: bfs_sample(spark, g, seed=1), rounds=1, iterations=1)


@pytest.mark.parametrize("name", ["RO", "CO"])
def bench_ldd_sampling(benchmark, spark, name):
    g = suite.get(name, "test")
    benchmark.pedantic(lambda: ldd_sample(spark, g, beta=0.2), rounds=1, iterations=1)
