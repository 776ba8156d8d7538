"""The ConnectIt framework (Algorithm 1): full sampling × finish matrix."""
import numpy as np
import pandas as pd
import pytest

from repro.core.framework import (
    ALL_FINISHES,
    MINBASED_FINISHES,
    UF_FINISHES,
    connectivity,
    finish_with_sample,
    identify_frequent,
    run_sampling,
)
from repro.graphs import suite
from repro.graphs.ground_truth import canonicalize, cc_labels, same_partition
from repro.oracle import assert_equivalent
from repro.unionfind import UFSpec

G = suite.get("CW", "test")
TRUTH = canonicalize(cc_labels(G.n, G.src, G.dst))

# one cached sample per scheme, shared across the finish matrix (like the
# harness and the paper's framework)
_samples: dict = {}


@pytest.fixture(scope="module", params=["none", "kout", "bfs", "ldd"])
def scheme_sample(request, spark):
    scheme = request.param
    if scheme not in _samples:
        _samples[scheme] = run_sampling(spark, G, scheme)
    return scheme, _samples[scheme]


FINISHES = list(UF_FINISHES) + ["sv", "stergiou", "labelprop", "lt-crfa", "lt-prf", "lt-pus", "lt-eufa"]


@pytest.mark.parametrize("finish", FINISHES)
def test_matrix(spark, scheme_sample, finish):
    scheme, sample = scheme_sample
    labels, info = finish_with_sample(spark, G, sample, finish, sampling=scheme)
    assert same_partition(labels, TRUTH), (scheme, finish)
    assert info["finish_time_s"] >= 0


def test_identify_frequent():
    lab = np.array([2, 2, 2, 7, 7, 9])
    assert identify_frequent(lab) == (2, 3)


def test_sampling_reduces_finish_edges(spark):
    _, info_ns = connectivity(spark, G, "none", "uf-rem-cas")
    _, info_s = connectivity(spark, G, "kout", "uf-rem-cas")
    assert info_s["finish_edges"] < info_ns["finish_edges"]
    assert info_s["frequent_coverage"] > 0.5


def test_minbased_contraction_shrinks_graph(spark):
    _, info = connectivity(spark, G, "kout", "sv")
    assert info["contracted_n"] < G.n / 5
    assert info["finish_edges"] < G.m_directed / 5


def test_spark_uf_path(spark):
    labels, _ = connectivity(spark, G, "kout", "uf-rem-cas", spark_uf=True, num_partitions=4)
    assert same_partition(labels, TRUTH)


def test_spark_uf_no_sampling(spark):
    labels, _ = connectivity(spark, G, "none", "uf-async", spark_uf=True, num_partitions=3)
    assert same_partition(labels, TRUTH)


def test_custom_uf_spec(spark):
    labels, _ = connectivity(
        spark, G, "none", "uf-rem-lock", uf_spec=UFSpec("uf-rem-lock", "halve", "splice")
    )
    assert same_partition(labels, TRUTH)


def test_uf_spec_mismatch_raises(spark):
    with pytest.raises(ValueError, match="does not match"):
        connectivity(spark, G, "none", "uf-rem-cas", uf_spec=UFSpec("uf-async", "naive"))


def test_unknown_finish_raises(spark):
    with pytest.raises(KeyError):
        connectivity(spark, G, "none", "nope")


def test_unknown_sampling_raises(spark):
    with pytest.raises(KeyError):
        connectivity(spark, G, "zigzag", "uf-rem-cas")


def test_all_finishes_listed():
    assert len(MINBASED_FINISHES) == 3 + 16
    assert len(ALL_FINISHES) == 6 + 19


def test_result_via_duckdb_oracle(spark):
    labels, _ = connectivity(spark, G, "kout", "uf-rem-cas")
    got = spark.createDataFrame(pd.DataFrame({"v": np.arange(G.n), "label": labels}))
    truth_pdf = pd.DataFrame({"v": np.arange(G.n), "label": TRUTH})
    assert_equivalent(got, "SELECT v, label FROM truth", truth=truth_pdf)


def test_component_count_via_oracle(spark):
    labels, _ = connectivity(spark, G, "ldd", "uf-hooks")
    got = (
        spark.createDataFrame(pd.DataFrame({"v": np.arange(G.n), "label": labels}))
        .selectExpr("count(distinct label) as n_comp")
    )
    truth_pdf = pd.DataFrame({"label": TRUTH})
    assert_equivalent(got, "SELECT COUNT(DISTINCT label) AS n_comp FROM truth", truth=truth_pdf)
