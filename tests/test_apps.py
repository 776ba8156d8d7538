"""End-to-end applications: AMSF (§5.1) and index-based SCAN (§5.2)."""
import numpy as np
import pytest

from repro.apps.amsf import amsf, boruvka_msf, kruskal_msf
from repro.apps.scan import (
    build_index,
    gs_query_connectit,
    gs_query_sequential,
    naive_scan,
)
from repro.graphs import generators as gen
from repro.graphs.ground_truth import cc_labels, same_partition

WG = {
    "grid": gen.grid(8, 10),
    "rmat": gen.rmat(100, 500, seed=11),
    "multi": gen.disjoint_union("m", [gen.cycle(8), gen.complete(5), gen.path_graph(6)]),
}


@pytest.mark.parametrize("gname", sorted(WG))
def test_boruvka_matches_kruskal(gname):
    g = WG[gname]
    w = g.with_weights(seed=3)
    exact = kruskal_msf(w, g.n)
    bor, _ = boruvka_msf(w, g.n)
    assert len(bor) == len(exact)
    assert abs(bor.w.sum() - exact.w.sum()) < 1e-9


@pytest.mark.parametrize("gname", sorted(WG))
@pytest.mark.parametrize("variant", ["ea", "f", "nf", "nf-s"])
def test_amsf_bounds_and_spanning(gname, variant):
    g = WG[gname]
    w = g.with_weights(seed=3)
    eps = 0.25
    exact = kruskal_msf(w, g.n)
    forest, info = amsf(w, g.n, eps=eps, variant=variant)
    w_opt, w_apx = exact.w.sum(), forest.w.sum()
    assert len(forest) == len(exact)
    assert w_opt - 1e-9 <= w_apx <= (1 + eps) * w_opt + 1e-9
    fl = cc_labels(
        g.n,
        np.concatenate([forest.u.to_numpy(), forest.v.to_numpy()]),
        np.concatenate([forest.v.to_numpy(), forest.u.to_numpy()]),
    )
    assert same_partition(fl, cc_labels(g.n, g.src, g.dst))


def test_amsf_sampling_reduces_scans():
    g = gen.rmat(200, 2000, seed=4)
    w = g.with_weights(seed=4)
    _, nf = amsf(w, g.n, variant="nf")
    _, nfs = amsf(w, g.n, variant="nf-s")
    assert nfs["edges_scanned"] < nf["edges_scanned"]


def test_amsf_unknown_variant():
    g = WG["grid"]
    with pytest.raises(KeyError):
        amsf(g.with_weights(), g.n, variant="zz")


def test_amsf_eps_tightens():
    g = WG["rmat"]
    w = g.with_weights(seed=6)
    exact = kruskal_msf(w, g.n).w.sum()
    loose = amsf(w, g.n, eps=1.0, variant="nf")[0].w.sum()
    tight = amsf(w, g.n, eps=0.05, variant="nf")[0].w.sum()
    assert tight <= loose + 1e-9
    assert tight <= 1.05 * exact + 1e-9


SCAN_G = gen.disjoint_union(
    "scan", [gen.complete(6), gen.complete(5), gen.path_graph(8), gen.star(5)]
)


def test_index_similarities_match_naive(spark):
    idx = build_index(spark, SCAN_G)
    # verify a few similarities against the direct definition
    nbrs = [set() for _ in range(SCAN_G.n)]
    for a, b in zip(SCAN_G.src.tolist(), SCAN_G.dst.tolist()):
        nbrs[a].add(b)
    for u, v, sigma in idx.sample(min(20, len(idx)), random_state=0).to_numpy():
        u, v = int(u), int(v)
        ca, cb = nbrs[u] | {u}, nbrs[v] | {v}
        expect = len(ca & cb) / np.sqrt(len(ca) * len(cb))
        assert abs(sigma - expect) < 1e-9


@pytest.mark.parametrize("eps,mu", [(0.5, 3), (0.7, 2), (0.3, 4), (0.9, 2)])
def test_queries_match_naive(spark, eps, mu):
    idx = build_index(spark, SCAN_G)
    seq, _ = gs_query_sequential(idx, SCAN_G.n, eps, mu)
    par, _ = gs_query_connectit(idx, SCAN_G.n, eps, mu)
    naive = naive_scan(SCAN_G, eps, mu)
    assert np.array_equal(seq, par), "sequential vs ConnectIt query mismatch"
    assert np.array_equal(par, naive), "query vs naive SCAN mismatch"


def test_scan_finds_cliques(spark):
    idx = build_index(spark, SCAN_G)
    labels, _ = gs_query_connectit(idx, SCAN_G.n, 0.5, 3)
    # the two cliques cluster; each clique one label
    assert len(set(labels[:6])) == 1 and labels[0] >= 0
    assert len(set(labels[6:11])) == 1 and labels[6] >= 0
    assert labels[0] != labels[6]
