"""Table 2 benchmark: graph stats + load time over the suite."""
from repro.graphs import suite
from repro.graphs.stats import graph_stats


def bench_table2_stats(benchmark, spark):
    def run():
        return [graph_stats(suite.get(n, "test"), spark) for n in suite.GRAPH_NAMES]

    rows = benchmark.pedantic(run, rounds=2, iterations=1)
