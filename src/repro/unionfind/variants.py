"""The union-find variants (paper Algorithms 10–14 + UF-JTB).

All are min-based root-based algorithms: a hook links the root with the
*larger* value under the smaller one, so the final canonical root of a
component is its minimum vertex id (UF-JTB links by random priority instead
and is canonicalized afterwards). ``union(u, v)`` returns the hooked root id
on a successful hook and ``-1`` otherwise — the hook root is where the
spanning-forest edge is recorded (Definition B.2 requirement 3).
"""
from __future__ import annotations

from repro.unionfind.core import CAS_FAIL, CAS_TRY, HOOKS, READS, WRITES, UFSpec, UFState
from repro.unionfind.finds import make_find
from repro.unionfind.splices import make_splice

FINDS = ("naive", "split", "halve", "compress")
SPLICES = ("split-one", "halve-one", "splice")
VARIANTS = ("uf-async", "uf-hooks", "uf-early", "uf-rem-cas", "uf-rem-lock", "uf-jtb")


def valid_specs() -> list[UFSpec]:
    """Every valid (variant, find, splice) combination in the framework."""
    specs: list[UFSpec] = []
    for v in ("uf-async", "uf-hooks", "uf-early"):
        specs += [UFSpec(v, f) for f in FINDS]
    for v in ("uf-rem-cas", "uf-rem-lock"):
        for f in FINDS:
            for s in SPLICES:
                if s == "splice" and f == "compress":
                    continue  # incorrect combination (Appendix B.2.3)
                specs.append(UFSpec(v, f, s))
    specs += [UFSpec("uf-jtb", f) for f in ("naive", "two-try")]
    return specs


def make_union(spec: UFSpec, st: UFState, record_forest: bool = False):
    """Build ``union(u, v) -> hooked_root | -1`` for one spec."""
    c = st.c.a
    P = st.parent

    def _cas(i: int, old: int, new: int) -> bool:
        c[CAS_TRY] += 1
        if P[i] == old:
            P[i] = new
            c[WRITES] += 1
            return True
        c[CAS_FAIL] += 1
        return False

    def _hooked(r: int, u: int, v: int) -> int:
        c[HOOKS] += 1
        if record_forest:
            st.forest[r] = (u, v)
        return r

    if spec.variant == "uf-async":
        find = make_find(spec.find, st)

        def union(u: int, v: int) -> int:
            while True:
                pu, pv = find(u), find(v)
                if pu == pv:
                    return -1
                if pu < pv:
                    pu, pv = pv, pu
                c[READS] += 1
                if P[pu] == pu and _cas(pu, pu, pv):
                    return _hooked(pu, u, v)

        return union

    if spec.variant == "uf-hooks":
        find = make_find(spec.find, st)
        H = st.ensure_hooks()

        def union(u: int, v: int) -> int:
            while True:
                pu, pv = find(u), find(v)
                if pu == pv:
                    return -1
                if pu < pv:
                    pu, pv = pv, pu
                c[READS] += 1
                # CAS on the auxiliary hooks array; the parents write is
                # then uncontended (paper Algorithm 11).
                c[CAS_TRY] += 1
                if P[pu] == pu and H[pu] == -1:
                    H[pu] = pv
                    P[pu] = pv
                    c[WRITES] += 2
                    return _hooked(pu, u, v)
                c[CAS_FAIL] += 1

        return union

    if spec.variant == "uf-early":
        find = make_find(spec.find, st)
        do_compress = spec.find != "naive"

        def union(u: int, v: int) -> int:
            # Walk up from both endpoints, eagerly trying to hook whichever
            # current vertex is a root (paper Algorithm 12, adapted: the
            # published pseudocode is abbreviated; this preserves its
            # root-based min-hooking semantics).
            ru, rv = u, v
            res = -1
            while True:
                if ru == rv:
                    break
                if ru < rv:
                    ru, rv = rv, ru
                c[READS] += 1
                pu = int(P[ru])
                if pu == ru:
                    if _cas(ru, ru, rv):
                        res = _hooked(ru, u, v)
                        break
                else:
                    ru = pu
            if do_compress:
                find(u)
                find(v)
            return res

        return union

    if spec.variant in ("uf-rem-cas", "uf-rem-lock"):
        splice = make_splice(spec.splice, st)
        compress = None if spec.find == "naive" else make_find(spec.find, st)
        lock_based = spec.variant == "uf-rem-lock"

        def union(u: int, v: int) -> int:
            ru, rv = u, v
            res = -1
            while True:
                c[READS] += 2
                pu, pv = int(P[ru]), int(P[rv])
                if pu == pv:
                    break
                if pu < pv:
                    ru, rv, pu, pv = rv, ru, pv, pu
                if ru == pu:  # ru is a root with larger value: hook it
                    if lock_based:
                        # acquire L[ru]; re-check under the lock, plain write
                        c[READS] += 2
                        pv2 = int(P[rv])
                        if P[ru] == ru and ru > pv2:
                            P[ru] = pv2
                            c[WRITES] += 1
                            res = _hooked(ru, u, v)
                            break
                    else:
                        if _cas(ru, ru, pv):
                            res = _hooked(ru, u, v)
                            break
                else:
                    ru = splice(ru, rv)
            if compress is not None:
                compress(u)
                compress(v)
            return res

        return union

    if spec.variant == "uf-jtb":
        if spec.find not in ("naive", "two-try"):
            raise ValueError("UF-JTB supports FindSimple (naive) or FindTwoTrySplit (two-try)")
        find = make_find(spec.find, st)
        prio = st.ensure_prio()

        def union(u: int, v: int) -> int:
            # Randomized linking (Jayanti–Tarjan–Boix-Adserà): the root with
            # lower random priority is linked under the higher-priority root.
            while True:
                pu, pv = find(u), find(v)
                if pu == pv:
                    return -1
                if prio[pu] > prio[pv]:
                    pu, pv = pv, pu
                c[READS] += 1
                if P[pu] == pu and _cas(pu, pu, pv):
                    return _hooked(pu, u, v)

        return union

    raise KeyError(f"unknown union-find variant {spec.variant!r}; options: {VARIANTS}")
