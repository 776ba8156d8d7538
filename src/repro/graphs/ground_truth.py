"""Trusted reference implementations used as test oracles.

``cc_labels`` is a vectorized min-label algorithm (hook + pointer-jump until
fixpoint) whose correctness is itself verified against brute-force BFS on
tiny graphs. Result-checking tests route label tables through
``repro.oracle.assert_equivalent`` (DuckDB) against these references.
"""
from __future__ import annotations

import numpy as np


def cc_labels(n: int, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Connectivity labeling; each vertex's label is the min id in its component."""
    p = np.arange(n, dtype=np.int64)
    if len(src):
        src = np.asarray(src, dtype=np.int64)
        dst = np.asarray(dst, dtype=np.int64)
    while True:
        old = p.copy()
        if len(src):
            np.minimum.at(p, src, p[dst])
        # full pointer jumping
        while True:
            pp = p[p]
            if np.array_equal(pp, p):
                break
            p = pp
        if np.array_equal(p, old):
            break
    return p


def canonicalize(labels: np.ndarray) -> np.ndarray:
    """Map each label class to the minimum vertex id it contains.

    Makes labelings comparable across algorithms that pick different
    representatives (e.g. UF-JTB's random priorities).
    """
    labels = np.asarray(labels, dtype=np.int64)
    n = len(labels)
    rep = np.full(labels.max() + 1 if n else 0, np.iinfo(np.int64).max, dtype=np.int64)
    np.minimum.at(rep, labels, np.arange(n, dtype=np.int64))
    return rep[labels]


def num_components(labels: np.ndarray) -> int:
    return len(np.unique(labels))


def largest_component_size(labels: np.ndarray) -> int:
    if len(labels) == 0:
        return 0
    return int(np.bincount(canonicalize(labels)).max())


def same_partition(a: np.ndarray, b: np.ndarray) -> bool:
    """True iff two labelings induce the same partition of the vertices."""
    return bool(np.array_equal(canonicalize(a), canonicalize(b)))


def bfs_levels(indptr: np.ndarray, indices: np.ndarray, source: int) -> np.ndarray:
    """Vectorized BFS distances over CSR; unreachable vertices get -1."""
    n = len(indptr) - 1
    dist = np.full(n, -1, dtype=np.int64)
    dist[source] = 0
    frontier = np.array([source], dtype=np.int64)
    d = 0
    while len(frontier):
        starts = indptr[frontier]
        counts = indptr[frontier + 1] - starts
        total = int(counts.sum())
        if total == 0:
            break
        # gather all neighbors of the frontier in one shot: repeat each
        # vertex's CSR start and add the within-adjacency offset
        intra = np.arange(total) - np.repeat(np.cumsum(counts) - counts, counts)
        nbrs = indices[np.repeat(starts, counts) + intra]
        new = np.unique(nbrs[dist[nbrs] < 0])
        d += 1
        dist[new] = d
        frontier = new
    return dist


def bfs_labels_cc(n: int, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Brute-force CC via repeated BFS — the oracle for the oracle (tiny n only)."""
    from repro.graphs.generators import Graph

    g = Graph("tmp", n, np.asarray(src, dtype=np.int64), np.asarray(dst, dtype=np.int64))
    indptr, indices = g.csr()
    labels = np.full(n, -1, dtype=np.int64)
    for v in range(n):
        if labels[v] < 0:
            dist = bfs_levels(indptr, indices, v)
            labels[(dist >= 0) & (labels < 0)] = v
    return labels
