"""Min-based dataflow finish methods: all 16 Liu-Tarjan variants, Stergiou,
Shiloach-Vishkin, and Label-Propagation, against the ground truth."""
import numpy as np
import pandas as pd
import pytest

from repro.core.minbased import (
    LT_CODES,
    LTSpec,
    label_propagation,
    liu_tarjan,
    shiloach_vishkin,
    stergiou,
)
from repro.graphs import generators as gen
from repro.graphs.ground_truth import cc_labels, same_partition
from repro.oracle import assert_equivalent

SMALL = gen.disjoint_union("small", [gen.cycle(6), gen.path_graph(7), gen.star(5)])
RMAT = gen.rmat(80, 320, seed=9)


@pytest.fixture(scope="module")
def small_edges(spark):
    e = SMALL.df(spark).localCheckpoint()
    e.count()
    return e


@pytest.fixture(scope="module")
def rmat_edges(spark):
    e = RMAT.df(spark).localCheckpoint()
    e.count()
    return e


@pytest.mark.parametrize("code", LT_CODES)
def test_liu_tarjan_all_variants(spark, small_edges, code):
    truth = cc_labels(SMALL.n, SMALL.src, SMALL.dst)
    labels, rounds = liu_tarjan(spark, small_edges, SMALL.n, code)
    assert same_partition(labels, truth), code
    assert rounds >= 1


@pytest.mark.parametrize("code", ["crfa", "prf", "pus", "euf"])
def test_liu_tarjan_on_rmat(spark, rmat_edges, code):
    truth = cc_labels(RMAT.n, RMAT.src, RMAT.dst)
    labels, _ = liu_tarjan(spark, rmat_edges, RMAT.n, code)
    assert same_partition(labels, truth)


def test_lt_spec_parsing():
    s = LTSpec.from_code("crfa")
    assert s == LTSpec("connect", True, "full", True)
    s = LTSpec.from_code("pus")
    assert s == LTSpec("parent", False, "one", False)
    s = LTSpec.from_code("eusa")
    assert s == LTSpec("extended", False, "one", True)
    with pytest.raises(KeyError):
        LTSpec.from_code("zzz")


def test_lt_code_list_matches_paper():
    assert len(LT_CODES) == 16  # the 16 combinations of Appendix D.4


def test_stergiou(spark, small_edges, rmat_edges):
    for g, e in ((SMALL, small_edges), (RMAT, rmat_edges)):
        truth = cc_labels(g.n, g.src, g.dst)
        labels, rounds = stergiou(spark, e, g.n)
        assert same_partition(labels, truth)
        assert rounds >= 1


def test_shiloach_vishkin(spark, small_edges, rmat_edges):
    for g, e in ((SMALL, small_edges), (RMAT, rmat_edges)):
        truth = cc_labels(g.n, g.src, g.dst)
        labels, rounds = shiloach_vishkin(spark, e, g.n)
        assert same_partition(labels, truth)


def test_sv_logarithmic_rounds(spark):
    g = gen.path_graph(64)
    e = g.df(spark)
    _, rounds = shiloach_vishkin(spark, e, g.n)
    assert rounds <= 10  # pointer jumping: O(log n), not O(diameter)


def test_label_propagation(spark, small_edges):
    truth = cc_labels(SMALL.n, SMALL.src, SMALL.dst)
    labels, rounds = label_propagation(spark, small_edges, SMALL.n)
    assert same_partition(labels, truth)


def test_label_propagation_rounds_track_diameter(spark):
    g = gen.path_graph(20)
    _, rounds = label_propagation(spark, g.df(spark), g.n)
    assert rounds >= g.n - 2  # min label crawls one hop per round


def test_minbased_labels_via_oracle(spark, small_edges):
    labels, _ = liu_tarjan(spark, small_edges, SMALL.n, "prf")
    got = spark.createDataFrame(pd.DataFrame({"v": np.arange(SMALL.n), "label": labels}))
    truth = pd.DataFrame({"v": np.arange(SMALL.n), "label": cc_labels(SMALL.n, SMALL.src, SMALL.dst)})
    assert_equivalent(got, "SELECT v, label FROM truth", truth=truth)
