"""INDE — pure index-based batch assignment (§3.1, Moore [51] / Kanungo [45]).

Each partition builds its tree once; every iteration traverses from the
root carrying a shrinking candidate-centroid set. For ball-shaped
nodes, centroid j is pruned when ``d(p, c_j) > d(p, c_b) + 2r`` (the
general form of Equation 2); a node whose candidate set collapses to
one centroid is assigned wholesale. kd-tree nodes use the Kanungo
corner rule on the bounding box instead.
"""
from __future__ import annotations

import numpy as np

from ...index import BALL_INDEXES, build_kdtree
from ...index.base import compute_spans
from ..ctx import IterCtx
from ..metrics import Counters
from .base import Kernel, register


def ball_node_dists(pivot: np.ndarray, C: np.ndarray, cand: np.ndarray, c2: np.ndarray | None) -> np.ndarray:
    Cc = C[cand]
    c2c = np.einsum("ij,ij->i", Cc, Cc) if c2 is None else c2[cand]
    d2 = c2c + pivot @ pivot - 2.0 * (Cc @ pivot)
    return np.sqrt(np.maximum(d2, 0.0))


@register("index")
class IndexKernel(Kernel):
    """Pluggable ball-index kernel: balltree (default), hkt, mtree, covertree."""

    needs = frozenset({"c2"})

    def __init__(self, index: str = "balltree", capacity: int = 30, seed: int = 0):
        if index not in BALL_INDEXES:
            raise KeyError(f"unknown ball index {index!r}")
        self.index = index
        self.capacity = capacity
        self.seed = seed

    def init_state(self, X: np.ndarray) -> dict:
        tree = BALL_INDEXES[self.index](X, capacity=self.capacity, seed=self.seed)
        return {
            "a": np.full(X.shape[0], -1, dtype=np.int64),
            "tree": tree,
            "spans": compute_spans(tree),
        }

    def assign(self, X: np.ndarray, st: dict, ctx: IterCtx, counters: Counters) -> None:
        tree, spans, a = st["tree"], st["spans"], st["a"]
        C = ctx.centers
        all_cand = np.arange(ctx.k)
        stack: list[tuple[int, np.ndarray]] = [(0, all_cand)]
        while stack:
            i, cand = stack.pop()
            counters.node_access += 1
            d = ball_node_dists(tree.pivot[i], C, cand, ctx.c2)
            counters.dist += len(cand)
            b = int(d.argmin())
            dmin = float(d[b])
            r = tree.radius[i]
            keep = d <= dmin + 2.0 * r
            cand2 = cand[keep]
            lo, hi = spans[i]
            if len(cand2) == 1:
                a[tree.perm[lo:hi]] = cand2[0]
            elif tree.is_leaf(i):
                pts = tree.perm[lo:hi]
                P = X[pts]
                D = (
                    np.einsum("ij,ij->i", P, P)[:, None]
                    + ctx.c2[cand2][None, :]
                    - 2.0 * P @ C[cand2].T
                )
                counters.dist += len(pts) * len(cand2)
                counters.data_access += len(pts) * len(cand2)
                a[pts] = cand2[D.argmin(1)]
            else:
                for c in tree.children(i):
                    stack.append((int(c), cand2))

    def footprint(self, st: dict) -> int:
        return st["tree"].nbytes() + st["spans"].nbytes


@register("kdindex")
class KDIndexKernel(Kernel):
    """kd-tree filtering algorithm (Kanungo et al. [45])."""

    needs = frozenset({"c2"})

    def __init__(self, capacity: int = 1, seed: int = 0):
        self.capacity = capacity
        self.seed = seed

    def init_state(self, X: np.ndarray) -> dict:
        kt = build_kdtree(X, capacity=self.capacity, seed=self.seed)
        return {
            "a": np.full(X.shape[0], -1, dtype=np.int64),
            "kt": kt,
            "spans": compute_spans(kt.tree),
        }

    def assign(self, X: np.ndarray, st: dict, ctx: IterCtx, counters: Counters) -> None:
        kt, spans, a = st["kt"], st["spans"], st["a"]
        tree = kt.tree
        C = ctx.centers
        stack: list[tuple[int, np.ndarray]] = [(0, np.arange(ctx.k))]
        while stack:
            i, cand = stack.pop()
            counters.node_access += 1
            lo_box, hi_box = kt.bb_min[i], kt.bb_max[i]
            mid = 0.5 * (lo_box + hi_box)
            Cc = C[cand]
            dmid = np.einsum("ij,ij->i", Cc - mid, Cc - mid)
            counters.dist += len(cand)
            zstar = int(dmid.argmin())
            zc = Cc[zstar]
            # Kanungo corner rule: z is dominated by z* over the whole box
            # iff the extreme corner v (towards z) is closer to z*.
            v = np.where(Cc > zc[None, :], hi_box[None, :], lo_box[None, :])
            dz = np.einsum("ij,ij->i", Cc - v, Cc - v)
            dzs = np.einsum("ij,ij->i", zc[None, :] - v, zc[None, :] - v)
            counters.dist += 2 * len(cand)
            keep = dz < dzs
            keep[zstar] = True
            cand2 = cand[keep]
            lo, hi = spans[i]
            if len(cand2) == 1:
                a[tree.perm[lo:hi]] = cand2[0]
            elif tree.is_leaf(i):
                pts = tree.perm[lo:hi]
                P = X[pts]
                D = (
                    np.einsum("ij,ij->i", P, P)[:, None]
                    + ctx.c2[cand2][None, :]
                    - 2.0 * P @ C[cand2].T
                )
                counters.dist += len(pts) * len(cand2)
                counters.data_access += len(pts) * len(cand2)
                a[pts] = cand2[D.argmin(1)]
            else:
                for c in tree.children(i):
                    stack.append((int(c), cand2))

    def footprint(self, st: dict) -> int:
        return st["kt"].nbytes() + st["spans"].nbytes
