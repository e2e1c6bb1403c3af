"""Yinyang (§4.2.3) and Regroup (Kwedlo's per-iteration regrouping).

Centroids are clustered into t = ⌈k/10⌉ groups; each point keeps one
upper bound and t group lower bounds. The cascade is the paper's
global → group → local pipeline:

* global: skip the point if ``ub ≤ min_g lbg`` (after tightening ub);
* group: only groups with ``lbg < ub`` are scanned;
* local: inside a candidate group, centre j is skipped when its
  per-centre bound ``lbg_pre − δ_j`` (the pre-drift group bound minus
  that centre's own drift) already exceeds ub.

Yinyang fixes the grouping at iteration 0 (``fixed_groups``); Regroup
recomputes it every iteration and remaps the group bounds through the
per-centre bounds, keeping them valid under the new grouping.
"""
from __future__ import annotations

import numpy as np

from ..ctx import IterCtx
from ..linalg import candidate_dists, full_dists, pair_dists
from ..metrics import Counters
from .base import Kernel, register, top2_from_full


def _group_min(M: np.ndarray, groups: np.ndarray, t: int) -> np.ndarray:
    """Column-group minima of a dense matrix → (rows × t)."""
    out = np.full((M.shape[0], t), np.inf)
    for g in range(t):
        cols = np.where(groups == g)[0]
        if len(cols):
            out[:, g] = M[:, cols].min(1)
    return out


class _YinyangBase(Kernel):
    needs = frozenset({"cc", "s", "c2", "groups"})

    def init_state(self, X: np.ndarray) -> dict:
        n = X.shape[0]
        return {
            "a": np.full(n, -1, dtype=np.int64),
            "ub": np.zeros(n),
            "lbg": None,
            "groups": None,  # grouping the stored lbg refers to
            "x2": np.einsum("ij,ij->i", X, X),
        }

    def _first(self, X, st, ctx, counters):
        D = full_dists(X, ctx.centers, counters)
        a, d1, _, _ = top2_from_full(D)
        Dm = D.copy()
        Dm[np.arange(len(a)), a] = np.inf
        st["lbg"] = _group_min(Dm, ctx.groups, ctx.n_groups)
        st["a"], st["ub"] = a, d1
        st["groups"] = ctx.groups.copy()
        counters.bound_update += st["lbg"].size + len(a)

    def assign(self, X: np.ndarray, st: dict, ctx: IterCtx, counters: Counters) -> None:
        if ctx.iter_idx == 0 or st["lbg"] is None:
            self._first(X, st, ctx, counters)
            return
        n, k, t = X.shape[0], ctx.k, ctx.n_groups
        a, ub, lbg = st["a"], st["ub"], st["lbg"]
        gold = st["groups"]
        # Per-centre bounds from the *pre-drift* group bounds: tighter
        # than group-level drift adjustment and valid under regrouping.
        ub += ctx.delta[a]
        counters.bound_update += n
        if np.array_equal(gold, ctx.groups):
            lbg_pre = lbg.copy()
            lbg -= ctx.group_delta_max[None, :]
            counters.bound_update += n * t
        else:  # Regroup: remap bounds onto the new grouping
            B = lbg[:, gold] - ctx.delta[None, :]  # per-centre bounds, n×k
            lbg = _group_min(B, ctx.groups, t)
            lbg_pre = lbg + 0.0  # already per new groups; reuse as pre
            st["lbg"] = lbg
            st["groups"] = ctx.groups.copy()
            counters.bound_update += n * k
        gmin = lbg.min(1)
        counters.bound_access += n * t + n
        cand = np.where(ub > gmin)[0]
        if len(cand) == 0:
            return
        d_a = pair_dists(X, ctx.centers, cand, a[cand], counters, x2=st["x2"], c2=ctx.c2)
        ub[cand] = d_a
        counters.bound_update += len(cand)
        fail = d_a > gmin[cand]
        R = cand[fail]
        if len(R) == 0:
            return
        m = len(R)
        ubR = ub[R]
        # Per-centre bounds for the survivors.
        Bc = lbg_pre[R][:, ctx.groups] - ctx.delta[None, :]
        counters.bound_access += m * k
        group_ok = lbg[R] < ubR[:, None]               # group filter
        mask = group_ok[:, ctx.groups] & (Bc < ubR[:, None])  # local filter
        mask[np.arange(m), a[R]] = False
        rr, cols = np.nonzero(mask)
        d = candidate_dists(X, ctx.centers, R, rr, cols, counters, x2=st["x2"], c2=ctx.c2)
        Dm = np.full((m, k), np.inf)
        Dm[np.arange(m), a[R]] = ubR
        Dm[rr, cols] = d
        jstar = Dm.argmin(1)
        dbest = Dm[np.arange(m), jstar]
        # New group bounds: exact distances where computed, per-centre
        # bounds elsewhere; the newly assigned centre is excluded.
        L = np.where(np.isfinite(Dm), Dm, Bc)
        L[np.arange(m), jstar] = np.inf
        lbg[R] = _group_min(L, ctx.groups, t)
        a[R] = jstar
        ub[R] = dbest
        counters.bound_update += m * t + 2 * m

    def footprint(self, st: dict) -> int:
        tot = st["ub"].nbytes + st["x2"].nbytes
        if st["lbg"] is not None:
            tot += st["lbg"].nbytes + st["groups"].nbytes
        return tot


@register("yinyang")
class YinyangKernel(_YinyangBase):
    fixed_groups = True


@register("regroup")
class RegroupKernel(_YinyangBase):
    fixed_groups = False
