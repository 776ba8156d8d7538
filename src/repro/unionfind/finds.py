"""Find implementations (paper Algorithm 8 + UF-JTB's two-try split).

Each factory returns ``find(u) -> root`` as a closure over the state, so the
hot loop pays only local-variable lookups. All parent reads/writes and path
steps are counted (TPL/MPL instrumentation, §4.1.1).
"""
from __future__ import annotations

from repro.unionfind.core import CAS_FAIL, CAS_TRY, FINDS, MPL, READS, TPL, WRITES, UFState


def make_find(name: str, st: UFState):
    c = st.c.a

    def _account(steps: int) -> None:
        c[FINDS] += 1
        c[TPL] += steps
        if steps > c[MPL]:
            c[MPL] = steps

    def find_naive(u: int) -> int:
        P = st.parent
        steps = 0
        c[READS] += 1
        while P[u] != u:
            u = int(P[u])
            c[READS] += 1
            steps += 1
        _account(steps)
        return u

    def find_compress(u: int) -> int:
        P = st.parent
        r = u
        steps = 0
        c[READS] += 1
        while P[r] != r:
            r = int(P[r])
            c[READS] += 1
            steps += 1
        while True:
            c[READS] += 1
            j = int(P[u])
            if j <= r:
                break
            P[u] = r
            c[WRITES] += 1
            u = j
        _account(steps)
        return r

    def _split_or_halve(u: int, halve: bool) -> int:
        P = st.parent
        steps = 0
        c[READS] += 2
        v = int(P[u])
        w = int(P[v])
        while v != w:
            # CAS(&P[u], v, w) — sequentially always succeeds
            c[CAS_TRY] += 1
            if P[u] == v:
                P[u] = w
                c[WRITES] += 1
            else:
                c[CAS_FAIL] += 1
            u = int(P[u]) if halve else v
            c[READS] += 2 + (1 if halve else 0)
            v = int(P[u])
            w = int(P[v])
            steps += 1
        _account(steps)
        return v

    def find_split(u: int) -> int:
        return _split_or_halve(u, halve=False)

    def find_halve(u: int) -> int:
        return _split_or_halve(u, halve=True)

    def find_two_try(u: int) -> int:
        # UF-JTB FindTwoTrySplit: path splitting where each pointer update
        # is attempted at most twice. Sequentially the first CAS succeeds,
        # so this degenerates to path splitting — the provable-work variant.
        return _split_or_halve(u, halve=False)

    table = {
        "naive": find_naive,
        "compress": find_compress,
        "split": find_split,
        "halve": find_halve,
        "two-try": find_two_try,
    }
    if name not in table:
        raise KeyError(f"unknown find option {name!r}; options: {sorted(table)}")
    return table[name]
