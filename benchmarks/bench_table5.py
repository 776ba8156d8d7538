"""Table 5 benchmarks: batch-insert latency, STINGER-analog vs ConnectIt."""
import numpy as np
import pytest

from repro.baselines.stinger_like import StingerLike
from repro.core.streaming import StreamingConnectIt
from repro.graphs.generators import rmat
from repro.unionfind import UFSpec

N = 1 << 12
G = rmat(N, 20_000, a=0.5, b=0.1, c=0.1, seed=7, name="stream")
EDGES = np.stack([G.src, G.dst], axis=1)[:20_000]


@pytest.mark.parametrize("batch", [100, 10_000])
def bench_connectit_batches(benchmark, batch):
    def run():
        s = StreamingConnectIt(N, UFSpec("uf-rem-cas", "naive", "split-one"))
        for i in range(0, len(EDGES), batch):
            s.process_batch(EDGES[i : i + batch])

    benchmark.pedantic(run, rounds=2, iterations=1)


@pytest.mark.parametrize("batch", [100, 10_000])
def bench_stinger_like_batches(benchmark, batch):
    def run():
        st = StingerLike(N)
        for i in range(0, len(EDGES), batch):
            st.process_batch(EDGES[i : i + batch])

    benchmark.pedantic(run, rounds=1, iterations=1)
