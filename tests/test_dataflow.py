"""Dataflow kernels: BFS and LDD against the numpy ground truth."""
import numpy as np
import pytest

from repro.dataflow.bfs import bfs_tree
from repro.dataflow.ldd import ldd_labels
from repro.graphs import generators as gen
from repro.graphs.ground_truth import bfs_levels, canonicalize, cc_labels


@pytest.fixture(scope="module")
def grid():
    return gen.grid(6, 9)


@pytest.fixture(scope="module")
def grid_edges(spark, grid):
    e = grid.df(spark).localCheckpoint()
    e.count()
    return e


def test_bfs_distances(spark, grid, grid_edges):
    tree, rounds = bfs_tree(spark, grid_edges, 0)
    pdf = tree.toPandas().sort_values("v")
    indptr, indices = grid.csr()
    dist = bfs_levels(indptr, indices, 0)
    assert np.array_equal(pdf["v"].to_numpy(), np.arange(grid.n))
    assert np.array_equal(pdf["dist"].to_numpy(), dist)
    assert rounds == dist.max()


def test_bfs_tree_parents_are_edges(spark, grid, grid_edges):
    tree, _ = bfs_tree(spark, grid_edges, 5)
    pairs = set(zip(grid.src.tolist(), grid.dst.tolist()))
    for v, p in tree.select("v", "parent").toPandas().to_numpy():
        assert v == p or (p, v) in pairs


def test_bfs_partial_component(spark):
    g = gen.disjoint_union("m", [gen.path_graph(5), gen.cycle(6)])
    e = g.df(spark)
    tree, _ = bfs_tree(spark, e, 0)
    vs = set(tree.toPandas()["v"].tolist())
    assert vs == {0, 1, 2, 3, 4}


def test_bfs_max_rounds(spark):
    g = gen.path_graph(10)
    tree, rounds = bfs_tree(spark, g.df(spark), 0, max_rounds=3)
    assert rounds == 3
    assert tree.count() == 4


def test_ldd_covers_and_is_partial_labeling(spark, grid, grid_edges):
    lab, rounds = ldd_labels(spark, grid_edges, grid.n, beta=0.4, seed=2)
    pdf = lab.toPandas().sort_values("v")
    assert len(pdf) == grid.n
    truth = canonicalize(cc_labels(grid.n, grid.src, grid.dst))
    for center, vs in pdf.groupby("center")["v"]:
        assert len(set(truth[vs.to_numpy()])) == 1  # clusters within components


def test_ldd_parents_are_edges(spark, grid, grid_edges):
    lab, _ = ldd_labels(spark, grid_edges, grid.n, beta=0.3, seed=3)
    pairs = set(zip(grid.src.tolist(), grid.dst.tolist()))
    for v, c, p in lab.toPandas()[["v", "center", "parent"]].to_numpy():
        assert v == p or (p, v) in pairs


def test_ldd_multi_component(spark):
    g = gen.disjoint_union("m", [gen.path_graph(6), gen.star(5)])
    lab, _ = ldd_labels(spark, g.df(spark), g.n, beta=0.5, seed=1)
    pdf = lab.toPandas()
    assert len(pdf) == g.n
    # no cluster crosses the component boundary
    truth = canonicalize(cc_labels(g.n, g.src, g.dst))
    for center, vs in pdf.groupby("center")["v"]:
        assert len(set(truth[vs.to_numpy()])) == 1


def test_ldd_beta_controls_fragmentation(spark):
    """Higher β wakes more centers early → more clusters (in expectation);
    checked on a long path where growth is slow."""
    g = gen.path_graph(120)
    e = g.df(spark).localCheckpoint()
    lo, _ = ldd_labels(spark, e, g.n, beta=0.05, seed=4)
    hi, _ = ldd_labels(spark, e, g.n, beta=0.9, seed=4)
    assert hi.select("center").distinct().count() > lo.select("center").distinct().count()
