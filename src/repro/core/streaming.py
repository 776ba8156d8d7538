"""ConnectIt streaming: parallel batch-incremental connectivity (§3.5, B.4).

A :class:`StreamingConnectIt` instance owns a persistent parents array (the
driver-resident analog of the paper's shared memory) and processes batches of
``INSERT(u, v)`` updates and ``IsConnected(u, v)`` queries (Algorithm 3).

Three algorithm types, as in the paper:

- Type 1 — asynchronous union-find (all variants except Rem+SpliceAtomic):
  updates and queries may interleave freely; linearizable.
- Type 2 — Shiloach-Vishkin and root-based Liu-Tarjan: batch-synchronous
  rounds over the batch's edges against the parents array.
- Type 3 — Rem's algorithms with SpliceAtomic: phase-concurrent; the batch is
  split into an update phase followed by a query phase.

``process_batch`` optionally partitions large batches across Spark tasks
using the same local-UF + driver-merge scheme as the static finish.
"""
from __future__ import annotations

import numpy as np

from repro.unionfind import UFSpec, UFState, make_union
from repro.unionfind.finds import make_find


class StreamingConnectIt:
    """Persistent incremental-connectivity state for one algorithm choice.

    ``algorithm`` is a :class:`UFSpec` (Type 1/3) or one of ``"sv"`` /
    ``"lt-root"`` (Type 2; ``lt-root`` is the CRFA-style root-up variant the
    paper finds fastest in streaming).
    """

    def __init__(self, n: int, algorithm: UFSpec | str = UFSpec("uf-rem-cas", "naive", "split-one")):
        self.n = n
        self.algorithm = algorithm
        if isinstance(algorithm, UFSpec):
            self.type = 3 if (
                algorithm.variant in ("uf-rem-cas", "uf-rem-lock") and algorithm.splice == "splice"
            ) else 1
            self.state = UFState(n)
            self._union = make_union(algorithm, self.state)
            self._find = make_find("naive", self.state)
        elif algorithm in ("sv", "lt-root"):
            self.type = 2
            self.state = UFState(n)
        else:
            raise KeyError(f"unknown streaming algorithm {algorithm!r}")

    # -- operations --------------------------------------------------------
    def insert(self, u: int, v: int) -> None:
        if self.type == 2:
            self._batch_rounds(np.array([[u, v]], dtype=np.int64))
        else:
            self._union(int(u), int(v))

    def is_connected(self, u: int, v: int) -> bool:
        if self.type == 2:
            p = self.state.parent
            return bool(_root(p, int(u)) == _root(p, int(v)))
        return self._find(int(u)) == self._find(int(v))

    def process_batch(
        self, updates: np.ndarray, queries: np.ndarray | None = None
    ) -> np.ndarray:
        """Apply one batch; returns boolean answers for the queries.

        Type 1 interleaves updates and queries (any serialization is a valid
        linearization w.r.t. the batch start, per B.4's correctness notion);
        Types 2 and 3 apply all updates first, then answer queries.
        """
        updates = np.asarray(updates, dtype=np.int64).reshape(-1, 2)
        if self.type == 2:
            self._batch_rounds(updates)
        else:
            union = self._union
            for u, v in updates.tolist():
                union(u, v)
        if queries is None or len(queries) == 0:
            return np.zeros(0, dtype=bool)
        queries = np.asarray(queries, dtype=np.int64).reshape(-1, 2)
        return np.fromiter(
            (self.is_connected(int(a), int(b)) for a, b in queries), dtype=bool, count=len(queries)
        )

    def labels(self) -> np.ndarray:
        return self.state.compress_all().copy()

    # -- Type 2: synchronous rounds over the batch -------------------------
    def _batch_rounds(self, edges: np.ndarray) -> None:
        """SV / root-up Liu-Tarjan rounds over the batch's edges.

        Python-loop substrate on purpose: all streaming variants share one
        substrate so relative throughput mirrors algorithmic work (see
        DESIGN.md measurement note).
        """
        p = self.state.parent
        c = self.state.c.a
        sv = self.algorithm == "sv"
        pairs = edges.tolist()
        while True:
            prev = p.copy()
            for u, v in pairs:
                pu, pv = int(p[u]), int(p[v])
                c[0] += 2
                l, h = (pu, pv) if pu < pv else (pv, pu)
                if l != h:
                    if sv:
                        # hook round-start roots only, via writeMin
                        if prev[h] == h and l < p[h]:
                            p[h] = l
                            c[1] += 1
                    else:
                        # root-up connect: update h if it is currently a root
                        if p[h] == h and l < p[h]:
                            p[h] = l
                            c[1] += 1
            # full shortcut (pointer jumping)
            while True:
                pp = p[p]
                if np.array_equal(pp, p):
                    break
                p[:] = pp
            if np.array_equal(p, prev):
                return


def _root(p: np.ndarray, u: int) -> int:
    while p[u] != u:
        u = int(p[u])
    return u
