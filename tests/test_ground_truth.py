"""Ground-truth oracle tests: the reference CC checked against brute BFS,
and label tables cross-checked through the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs import generators as gen
from repro.graphs.ground_truth import (
    bfs_labels_cc,
    bfs_levels,
    canonicalize,
    cc_labels,
    largest_component_size,
    num_components,
    same_partition,
)
from repro.oracle import assert_equivalent

CASES = {
    "grid": gen.grid(5, 6),
    "path": gen.path_graph(15),
    "cycle": gen.cycle(10),
    "star": gen.star(12),
    "rmat": gen.rmat(90, 300, seed=7),
    "multi": gen.disjoint_union("m", [gen.path_graph(6), gen.cycle(5), gen.star(4), gen.complete(3)]),
    "web": gen.web_like(3, 10, extra_components=3, seed=1),
    "isolated": gen.from_pairs("iso", 10, [0, 1], [1, 2]),
}


@pytest.mark.parametrize("name", sorted(CASES))
def test_cc_matches_brute_force(name):
    g = CASES[name]
    assert same_partition(cc_labels(g.n, g.src, g.dst), bfs_labels_cc(g.n, g.src, g.dst))


@pytest.mark.parametrize("name", sorted(CASES))
def test_cc_labels_are_canonical_min(name):
    g = CASES[name]
    lab = cc_labels(g.n, g.src, g.dst)
    assert np.array_equal(lab, canonicalize(lab))  # min-label propagation → min ids


def test_num_components_multi():
    g = CASES["multi"]
    assert num_components(cc_labels(g.n, g.src, g.dst)) == 4


def test_largest_component():
    g = gen.disjoint_union("m", [gen.complete(8), gen.path_graph(3)])
    assert largest_component_size(cc_labels(g.n, g.src, g.dst)) == 8


def test_empty_edges():
    lab = cc_labels(5, np.empty(0, np.int64), np.empty(0, np.int64))
    assert num_components(lab) == 5


def test_canonicalize_idempotent():
    lab = np.array([3, 3, 5, 5, 3], dtype=np.int64)
    c = canonicalize(lab)
    assert np.array_equal(c, canonicalize(c))
    assert np.array_equal(c, np.array([0, 0, 2, 2, 0]))


def test_same_partition_detects_difference():
    assert same_partition(np.array([0, 0, 1]), np.array([5, 5, 9]))
    assert not same_partition(np.array([0, 0, 1]), np.array([0, 1, 1]))


@pytest.mark.parametrize("name,dists", [
    ("path", None),
    ("star", None),
])
def test_bfs_levels_known(name, dists):
    g = CASES[name]
    indptr, indices = g.csr()
    d = bfs_levels(indptr, indices, 0)
    if name == "path":
        assert np.array_equal(d, np.arange(g.n))
    else:
        assert d[0] == 0 and (d[1:] == 1).all()


def test_bfs_levels_unreachable():
    g = CASES["multi"]
    indptr, indices = g.csr()
    d = bfs_levels(indptr, indices, 0)
    assert (d < 0).any() and d[0] == 0


def test_labels_via_duckdb_oracle(spark):
    """Route a labeling table through the DuckDB result-equality oracle."""
    g = CASES["web"]
    lab = cc_labels(g.n, g.src, g.dst)
    got = spark.createDataFrame(pd.DataFrame({"v": np.arange(g.n), "label": lab}))
    truth = pd.DataFrame({"v": np.arange(g.n), "label": bfs_labels_cc(g.n, g.src, g.dst)})
    # brute-force labels use BFS roots; canonicalize both sides in SQL space
    truth["label"] = canonicalize(truth["label"].to_numpy())
    assert_equivalent(got, "SELECT v, label FROM truth", truth=truth)


def test_component_histogram_via_oracle(spark):
    g = CASES["multi"]
    lab = cc_labels(g.n, g.src, g.dst)
    pdf = pd.DataFrame({"v": np.arange(g.n), "label": lab})
    got = (
        spark.createDataFrame(pdf)
        .groupBy("label")
        .count()
        .withColumnRenamed("count", "sz")
    )
    assert_equivalent(got, "SELECT label, COUNT(*) AS sz FROM labels GROUP BY label", labels=pdf)
