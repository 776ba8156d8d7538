"""Simulated shared-memory concurrent union-find (paper §3.3.1, Appendix D).

The paper's algorithms are written against a shared parents array with atomic
compare-and-swap. This package reproduces them as deterministic executions of
the *same code paths* over a numpy parents array, with a CAS primitive and
full instrumentation (parent reads/writes, CAS attempts, total/max path
length). Scheduling nondeterminism is exercised in tests by permuting the
operation order — the observable effect of interleavings for these
linearizably-monotone algorithms.
"""
from repro.unionfind.core import UFSpec, UFState, Counters, run_components  # noqa: F401
from repro.unionfind.variants import make_union, VARIANTS, FINDS, SPLICES  # noqa: F401
