"""Parents-array state, CAS primitive, and instrumentation counters."""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

# counter slots (numpy int64 array indices — cheap to bump in hot loops)
READS, WRITES, CAS_TRY, CAS_FAIL, FINDS, UNIONS, HOOKS, TPL, MPL = range(9)
N_COUNTERS = 9

_COUNTER_NAMES = [
    "parent_reads",
    "parent_writes",
    "cas_attempts",
    "cas_failures",
    "finds",
    "unions",
    "hooks",
    "total_path_length",
    "max_path_length",
]


class Counters:
    """Work metrics standing in for the paper's hardware counters (§4.1.1).

    TPL/MPL are exactly the paper's Total/Max Path Length; parent reads and
    writes proxy memory-controller traffic; CAS attempts proxy contention.
    """

    __slots__ = ("a",)

    def __init__(self) -> None:
        self.a = np.zeros(N_COUNTERS, dtype=np.int64)

    def as_dict(self) -> dict[str, int]:
        return {name: int(v) for name, v in zip(_COUNTER_NAMES, self.a)}

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"Counters({self.as_dict()})"


@dataclass(frozen=True)
class UFSpec:
    """One union-find algorithm instantiation.

    variant: uf-async | uf-hooks | uf-early | uf-rem-cas | uf-rem-lock | uf-jtb
    find:    naive | split | halve | compress | two-try (uf-jtb only)
    splice:  split-one | halve-one | splice (Rem's algorithms only)

    The invalid SpliceAtomic + FindCompress combination (paper B.2.3) is
    rejected at construction.
    """

    variant: str = "uf-rem-cas"
    find: str = "naive"
    splice: str = "split-one"

    def __post_init__(self) -> None:
        if self.variant in ("uf-rem-cas", "uf-rem-lock") and self.splice == "splice" and self.find == "compress":
            raise ValueError("SpliceAtomic + FindCompress is incorrect (paper Appendix B.2.3)")

    @property
    def key(self) -> str:
        s = f"{self.variant}/{self.find}"
        if self.variant in ("uf-rem-cas", "uf-rem-lock"):
            s += f"/{self.splice}"
        return s


class UFState:
    """Shared-memory state: parents array + hooks/priorities as needed."""

    __slots__ = ("parent", "hooks", "prio", "c", "forest")

    def __init__(self, n: int, labels: np.ndarray | None = None, seed: int = 0):
        if labels is None:
            self.parent = np.arange(n, dtype=np.int64)
        else:
            self.parent = np.asarray(labels, dtype=np.int64).copy()
        self.hooks: np.ndarray | None = None  # UF-Hooks
        self.prio: np.ndarray | None = None  # UF-JTB random priorities
        self.c = Counters()
        # spanning forest: forest[r] = index of the edge that hooked root r
        self.forest: dict[int, tuple[int, int]] = {}

    def ensure_hooks(self) -> np.ndarray:
        if self.hooks is None:
            self.hooks = np.full(len(self.parent), -1, dtype=np.int64)
        return self.hooks

    def ensure_prio(self, seed: int = 0) -> np.ndarray:
        if self.prio is None:
            g = np.random.default_rng(seed)
            self.prio = g.permutation(len(self.parent)).astype(np.int64)
        return self.prio

    # -- atomic primitives (sequentially simulated, fully counted) ---------
    def read(self, i: int) -> int:
        self.c.a[READS] += 1
        return int(self.parent[i])

    def write(self, i: int, v: int) -> None:
        self.c.a[WRITES] += 1
        self.parent[i] = v

    def cas(self, i: int, old: int, new: int) -> bool:
        self.c.a[CAS_TRY] += 1
        if self.parent[i] == old:
            self.parent[i] = new
            self.c.a[WRITES] += 1
            return True
        self.c.a[CAS_FAIL] += 1
        return False

    def finish_path(self, steps: int) -> None:
        self.c.a[TPL] += steps
        if steps > self.c.a[MPL]:
            self.c.a[MPL] = steps

    def compress_all(self) -> np.ndarray:
        """Vectorized full path compression (used after sampling / at exit).

        In place: union/find closures hold a reference to the parents array,
        so it must never be rebound mid-run.
        """
        p = self.parent
        while True:
            pp = p[p]
            if np.array_equal(pp, p):
                break
            p = pp
        self.parent[:] = p
        return self.parent


def run_components(
    n: int,
    edges: np.ndarray,
    spec: UFSpec,
    labels: np.ndarray | None = None,
    skip_label: int | None = None,
    record_forest: bool = False,
    seed: int = 0,
) -> tuple[np.ndarray, UFState]:
    """Run a union-find variant over an edge array ((k,2) int64).

    ``labels`` seeds the parents array (e.g. from a sampling phase);
    ``skip_label`` skips edges whose *source's initial label* equals the
    most-frequent sampled component (Algorithm 7's filter). Returns the fully
    compressed labeling and the state (counters + forest hooks).
    """
    from repro.unionfind.variants import make_union

    st = UFState(n, labels, seed=seed)
    union = make_union(spec, st, record_forest=record_forest)
    if len(edges):
        edges = np.asarray(edges, dtype=np.int64)
        if skip_label is not None and labels is not None:
            init = np.asarray(labels, dtype=np.int64)
            edges = edges[init[edges[:, 0]] != skip_label]
        c = st.c.a
        # tolist() once: iterating numpy rows costs ~5x more per edge
        for u, v in edges.tolist():
            c[UNIONS] += 1
            union(u, v)
    return st.compress_all(), st
