"""Table 3 benchmarks: representative static-connectivity cells.

One cell per (algorithm family × sampling scheme) on the CW stand-in; the
full sweep that regenerates the table lives in jobs/table3.py.
"""
import pytest

from repro.core.framework import finish_with_sample, run_sampling
from repro.graphs import suite

SCALE = "test"
G = suite.get("CW", SCALE)

_samples = {}


def _sample(spark, scheme):
    if scheme not in _samples:
        _samples[scheme] = run_sampling(spark, G, scheme)
    return _samples[scheme]


@pytest.mark.parametrize("scheme", ["none", "kout", "bfs", "ldd"])
def bench_uf_rem_cas(benchmark, spark, scheme):
    s = _sample(spark, scheme)
    benchmark.pedantic(
        lambda: finish_with_sample(spark, G, s, "uf-rem-cas", sampling=scheme),
        rounds=3, iterations=1,
    )


@pytest.mark.parametrize("algo", ["uf-async", "uf-hooks", "uf-early", "uf-rem-lock", "uf-jtb"])
def bench_uf_variants_kout(benchmark, spark, algo):
    s = _sample(spark, "kout")
    benchmark.pedantic(
        lambda: finish_with_sample(spark, G, s, algo, sampling="kout"), rounds=3, iterations=1
    )


@pytest.mark.parametrize("algo", ["sv", "labelprop", "lt-prf", "stergiou"])
def bench_minbased_kout(benchmark, spark, algo):
    s = _sample(spark, "kout")
    benchmark.pedantic(
        lambda: finish_with_sample(spark, G, s, algo, sampling="kout"), rounds=1, iterations=1
    )


def bench_sv_nosample(benchmark, spark):
    s = _sample(spark, "none")
    benchmark.pedantic(
        lambda: finish_with_sample(spark, G, s, "sv", sampling="none"), rounds=1, iterations=1
    )
