"""M-tree-style metric tree (Ciaccia et al., §3.1).

A faithful M-tree grows bottom-up via insertions with node splits; the
paper only uses it as one more ball-shaped index for k-means batch
assignment (and finds it slow to build). We reproduce its *query-side*
shape — ball nodes chosen around two routing pivots with generalized-
hyperplane partitioning (the M-tree mM_RAD split policy) — with a
top-down builder, keeping the random-pivot character of insertion order
by sampling the routing pivots.
"""
from __future__ import annotations

import numpy as np

from .base import ArrayTree, build_tree
from .balltree import DEFAULT_CAPACITY


def build_mtree(X: np.ndarray, capacity: int = DEFAULT_CAPACITY, seed: int = 0) -> ArrayTree:
    X = np.ascontiguousarray(X, dtype=np.float64)
    rng = np.random.default_rng(seed)

    def split(idx: np.ndarray):
        pts = X[idx]
        a, b = rng.choice(len(idx), size=2, replace=False)
        pa, pb = pts[a], pts[b]
        if np.array_equal(pa, pb):
            return None
        da = np.einsum("ij,ij->i", pts - pa, pts - pa)
        db = np.einsum("ij,ij->i", pts - pb, pts - pb)
        m = da <= db
        g1, g2 = idx[m], idx[~m]
        if len(g1) == 0 or len(g2) == 0:
            return None
        return [g1, g2]

    return build_tree(X, split, capacity)
