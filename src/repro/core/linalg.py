"""Vectorized distance primitives, k-means++ init, and SSE.

Kernels must never evaluate distances the algorithm would not: use
``pair_dists`` with explicit (row, col) index vectors so wall time scales
with the number of *surviving* candidate pairs, mirroring a per-point
implementation's cost profile.
"""
from __future__ import annotations

import numpy as np

from .metrics import Counters


def full_dists(X: np.ndarray, C: np.ndarray, counters: Counters | None = None) -> np.ndarray:
    """All n×k Euclidean distances (Lloyd's assignment grid)."""
    x2 = np.einsum("ij,ij->i", X, X)
    c2 = np.einsum("ij,ij->i", C, C)
    d2 = x2[:, None] + c2[None, :] - 2.0 * (X @ C.T)
    np.maximum(d2, 0.0, out=d2)
    if counters is not None:
        counters.dist += X.shape[0] * C.shape[0]
        counters.data_access += X.shape[0] * C.shape[0]
    return np.sqrt(d2)


def pair_dists(
    X: np.ndarray,
    C: np.ndarray,
    rows: np.ndarray,
    cols: np.ndarray,
    counters: Counters | None = None,
    x2: np.ndarray | None = None,
    c2: np.ndarray | None = None,
) -> np.ndarray:
    """Distances for explicit (rows[i], cols[i]) point–centroid pairs.

    ``x2``/``c2`` are optional precomputed squared norms (kernels cache
    the point norms once; centroid norms once per iteration).
    """
    if len(rows) == 0:
        return np.empty(0)
    if x2 is None:
        xs = X[rows]
        x2r = np.einsum("ij,ij->i", xs, xs)
    else:
        xs = X[rows]
        x2r = x2[rows]
    cs = C[cols]
    if c2 is None:
        c2r = np.einsum("ij,ij->i", cs, cs)
    else:
        c2r = c2[cols]
    d2 = x2r + c2r - 2.0 * np.einsum("ij,ij->i", xs, cs)
    np.maximum(d2, 0.0, out=d2)
    if counters is not None:
        counters.dist += len(rows)
        counters.data_access += len(rows)
    return np.sqrt(d2)


def candidate_dists(
    X: np.ndarray,
    C: np.ndarray,
    r1: np.ndarray,
    rr: np.ndarray,
    cols: np.ndarray,
    counters: Counters | None = None,
    x2: np.ndarray | None = None,
    c2: np.ndarray | None = None,
    dense_threshold: float = 0.35,
) -> np.ndarray:
    """Distances for candidate pairs (r1[rr[i]], cols[i]).

    When the candidate density exceeds ``dense_threshold`` the rows are
    evaluated with one BLAS matmul and the pairs extracted (cheaper in
    memory traffic than gathering each pair); counters still charge only
    the candidate pairs — the quantity the *algorithm* computes.
    """
    if len(rr) == 0:
        return np.empty(0)
    k = C.shape[0]
    if counters is not None:
        counters.dist += len(rr)
        counters.data_access += len(rr)
    if len(rr) > dense_threshold * len(r1) * k:
        rows_x = X[r1]
        x2r = (
            np.einsum("ij,ij->i", rows_x, rows_x) if x2 is None else x2[r1]
        )
        c2r = np.einsum("ij,ij->i", C, C) if c2 is None else c2
        d2 = x2r[:, None] + c2r[None, :] - 2.0 * rows_x @ C.T
        np.maximum(d2, 0.0, out=d2)
        return np.sqrt(d2[rr, cols])
    return pair_dists(X, C, r1[rr], cols, None, x2=x2, c2=c2)


def cdist_cc(C1: np.ndarray, C2: np.ndarray) -> np.ndarray:
    """Small dense centroid↔centroid distance matrix (driver-side)."""
    d2 = (
        np.einsum("ij,ij->i", C1, C1)[:, None]
        + np.einsum("ij,ij->i", C2, C2)[None, :]
        - 2.0 * (C1 @ C2.T)
    )
    np.maximum(d2, 0.0, out=d2)
    return np.sqrt(d2)


def kmeans_pp_init(X: np.ndarray, k: int, seed: int) -> np.ndarray:
    """Standard k-means++ seeding (Arthur & Vassilvitskii), deterministic."""
    rng = np.random.default_rng(seed)
    n = X.shape[0]
    k = min(k, n)
    centers = np.empty((k, X.shape[1]), dtype=np.float64)
    idx = rng.integers(n)
    centers[0] = X[idx]
    d2 = np.einsum("ij,ij->i", X - centers[0], X - centers[0])
    for j in range(1, k):
        total = d2.sum()
        if total <= 0:
            centers[j:] = X[rng.integers(n, size=k - j)]
            break
        probs = d2 / total
        idx = rng.choice(n, p=probs)
        centers[j] = X[idx]
        nd2 = np.einsum("ij,ij->i", X - centers[j], X - centers[j])
        np.minimum(d2, nd2, out=d2)
    return centers


def random_init(X: np.ndarray, k: int, seed: int) -> np.ndarray:
    """Plain random seeding (used by the Figure-16-style initialization test)."""
    rng = np.random.default_rng(seed)
    idx = rng.choice(X.shape[0], size=min(k, X.shape[0]), replace=False)
    return X[idx].astype(np.float64, copy=True)


def sse(X: np.ndarray, C: np.ndarray, assign: np.ndarray) -> float:
    """Sum of squared errors of an assignment (Equation 1)."""
    diff = X - C[assign]
    return float(np.einsum("ij,ij->", diff, diff))
