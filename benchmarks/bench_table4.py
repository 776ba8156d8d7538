"""Table 4 benchmarks: streaming throughput per algorithm family on the RMAT
streaming input (whole graph as one batch)."""
import numpy as np
import pytest

from repro.core.streaming import StreamingConnectIt
from repro.graphs import suite
from repro.harness.tables import STREAM_ALGOS

G = suite.streaming_graph("RM", "test")
EDGES = np.stack([G.src, G.dst], axis=1)


@pytest.mark.parametrize("alg", sorted(STREAM_ALGOS))
def bench_stream_single_batch(benchmark, alg):
    def run():
        s = StreamingConnectIt(G.n, STREAM_ALGOS[alg])
        s.process_batch(EDGES)
        return s

    benchmark.pedantic(run, rounds=2, iterations=1)
