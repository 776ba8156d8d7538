"""Property-based tests (hypothesis) for the union-find substrate."""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.graphs.ground_truth import cc_labels, same_partition
from repro.unionfind import UFSpec, run_components

edge_lists = st.lists(
    st.tuples(st.integers(0, 29), st.integers(0, 29)), min_size=0, max_size=120
)

SPECS = [
    UFSpec("uf-rem-cas", "naive", "split-one"),
    UFSpec("uf-rem-cas", "halve", "splice"),
    UFSpec("uf-rem-lock", "split", "halve-one"),
    UFSpec("uf-async", "compress"),
    UFSpec("uf-hooks", "halve"),
    UFSpec("uf-early", "naive"),
    UFSpec("uf-jtb", "two-try"),
]


def _sym(pairs):
    e = np.array([(u, v) for u, v in pairs if u != v], dtype=np.int64).reshape(-1, 2)
    return np.concatenate([e, e[:, ::-1]]) if len(e) else e


@given(pairs=edge_lists, data=st.data())
@settings(max_examples=60, deadline=None)
def test_random_graphs_all_specs(pairs, data):
    e = _sym(pairs)
    truth = cc_labels(30, e[:, 0], e[:, 1]) if len(e) else np.arange(30)
    spec = data.draw(st.sampled_from(SPECS))
    labels, _ = run_components(30, e, spec)
    assert same_partition(labels, truth)


@given(pairs=edge_lists, seed=st.integers(0, 2**16))
@settings(max_examples=40, deadline=None)
def test_order_invariance(pairs, seed):
    """Any operation order linearizes to the same partition."""
    e = _sym(pairs)
    if len(e) == 0:
        return
    rng = np.random.default_rng(seed)
    a, _ = run_components(30, e, UFSpec("uf-rem-cas", "naive", "splice"))
    b, _ = run_components(30, e[rng.permutation(len(e))], UFSpec("uf-rem-cas", "naive", "splice"))
    assert same_partition(a, b)


@given(pairs=edge_lists)
@settings(max_examples=40, deadline=None)
def test_monotone_prefix(pairs):
    """Monotonicity (Definition 3.2): applying a prefix of the operations
    yields a coarsening chain — components only ever merge."""
    e = _sym(pairs)
    if len(e) < 4:
        return
    half = len(e) // 2
    l1, _ = run_components(30, e[:half], UFSpec("uf-async", "naive"))
    l2, _ = run_components(30, e, UFSpec("uf-async", "naive"))
    # every component of l1 is contained in one component of l2
    for lab in np.unique(l1):
        members = np.flatnonzero(l1 == lab)
        assert len(np.unique(l2[members])) == 1
