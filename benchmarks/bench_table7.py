"""Table 7 benchmarks: k-out sampling variants on the web-ordered stand-in."""
import pytest

from repro.core.sampling import KOUT_VARIANTS, kout_sample
from repro.graphs import suite

G = suite.get("HL12", "test")


@pytest.mark.parametrize("variant", KOUT_VARIANTS)
def bench_kout_variant(benchmark, spark, variant):
    benchmark.pedantic(
        lambda: kout_sample(spark, G, k=2, variant=variant), rounds=2, iterations=1
    )
