"""Splice rules for Rem's algorithms (paper Algorithm 9)."""
from __future__ import annotations

from repro.unionfind.core import CAS_FAIL, CAS_TRY, READS, WRITES, UFState


def make_splice(name: str, st: UFState):
    """Return ``splice(u, other) -> new_u`` used when the union loop sits at
    a non-root vertex (paper §3.3.1, Concurrent Rem's Algorithms)."""
    c = st.c.a

    def _cas(i: int, old: int, new: int) -> bool:
        c[CAS_TRY] += 1
        if st.parent[i] == old:
            st.parent[i] = new
            c[WRITES] += 1
            return True
        c[CAS_FAIL] += 1
        return False

    def split_one(u: int, other: int) -> int:
        P = st.parent
        c[READS] += 2
        v = int(P[u])
        w = int(P[v])
        if v != w:
            _cas(u, v, w)
        return v

    def halve_one(u: int, other: int) -> int:
        P = st.parent
        c[READS] += 2
        v = int(P[u])
        w = int(P[v])
        if v != w:
            _cas(u, v, w)
        return w

    def splice(u: int, other: int) -> int:
        P = st.parent
        c[READS] += 2
        pu = int(P[u])
        _cas(u, pu, int(P[other]))
        return pu

    table = {"split-one": split_one, "halve-one": halve_one, "splice": splice}
    if name not in table:
        raise KeyError(f"unknown splice option {name!r}; options: {sorted(table)}")
    return table[name]
