"""PatwaryRM [84]: the lock-based concurrent Rem's algorithm, run standalone
over all edges (no sampling) — identical to ConnectIt's UF-Rem-Lock with
SpliceAtomic, which is how the paper characterizes it."""
from __future__ import annotations

import numpy as np

from repro.graphs.generators import Graph
from repro.unionfind import UFSpec, run_components


def patwary_rm(g: Graph) -> tuple[np.ndarray, dict]:
    edges = np.stack([g.src, g.dst], axis=1)
    labels, st = run_components(g.n, edges, UFSpec("uf-rem-lock", "naive", "splice"))
    return labels, {"counters": st.c.as_dict()}
