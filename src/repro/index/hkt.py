"""Hierarchical k-means tree (Fukunaga & Narendra, §3.1).

Nodes are split by a short 2-means on the node's points; nodes are balls
(pivot = mean, radius = max distance), so the ball-based batch
assignment used for Ball-tree applies unchanged.
"""
from __future__ import annotations

import numpy as np

from .base import ArrayTree, build_tree
from .balltree import DEFAULT_CAPACITY


def build_hkt(
    X: np.ndarray,
    capacity: int = DEFAULT_CAPACITY,
    seed: int = 0,
    branch: int = 2,
    iters: int = 3,
) -> ArrayTree:
    X = np.ascontiguousarray(X, dtype=np.float64)
    rng = np.random.default_rng(seed)

    def split(idx: np.ndarray):
        pts = X[idx]
        b = min(branch, len(idx))
        seeds = pts[rng.choice(len(idx), size=b, replace=False)]
        assign = np.zeros(len(idx), dtype=np.int64)
        for _ in range(iters):
            d2 = (
                np.einsum("ij,ij->i", pts, pts)[:, None]
                + np.einsum("ij,ij->i", seeds, seeds)[None, :]
                - 2.0 * pts @ seeds.T
            )
            assign = d2.argmin(1)
            for g in range(b):
                m = assign == g
                if m.any():
                    seeds[g] = pts[m].mean(0)
        groups = [idx[assign == g] for g in range(b)]
        groups = [g for g in groups if len(g)]
        if len(groups) < 2:
            return None
        return groups

    return build_tree(X, split, capacity)
