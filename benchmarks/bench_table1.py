"""Table 1 benchmark: ConnectIt's fastest config vs the strongest baseline
(WorkeffCC, the paper's previous record holder) on the HL12 stand-in."""
import pytest

from repro.baselines.workeff import workeff_cc
from repro.core.framework import connectivity
from repro.graphs import suite

SCALE = "test"


@pytest.fixture(scope="module")
def hl12():
    return suite.get("HL12", SCALE)


def bench_connectit_fastest_hl12(benchmark, spark, hl12):
    benchmark.pedantic(
        lambda: connectivity(spark, hl12, "kout", "uf-rem-cas"), rounds=3, iterations=1
    )


def bench_workeffcc_hl12(benchmark, spark, hl12):
    benchmark.pedantic(lambda: workeff_cc(spark, hl12), rounds=1, iterations=1)
