"""Elka — Elkan's algorithm (§4.1): inter-bound + drift-bound, n×k lbs.

Keeps a lower bound lb(i,j) for every (point, centroid) pair plus one
upper bound ub(i). Per iteration lbs shrink by each centroid's drift and
ub grows by the assigned centroid's drift; the inter-centroid half
distances s(j) give the global skip, and the pairwise tests
``lb(i,j) < ub(i)`` / ``cc(a,j)/2 < ub(i)`` gate every exact distance.
"""
from __future__ import annotations

import numpy as np

from ..ctx import IterCtx
from ..linalg import candidate_dists, full_dists, pair_dists
from ..metrics import Counters
from .base import Kernel, register, rowwise_min_pairs, top2_from_full


@register("elka")
class ElkanKernel(Kernel):
    needs = frozenset({"cc", "s", "c2"})
    wants_ub_prev = False
    use_groups = False

    def init_state(self, X: np.ndarray) -> dict:
        n = X.shape[0]
        return {
            "a": np.full(n, -1, dtype=np.int64),
            "ub": np.zeros(n),
            "lb": None,  # n×k, allocated on first assign (k unknown here)
            "x2": np.einsum("ij,ij->i", X, X),
        }

    def _first(self, X, st, ctx, counters):
        D = full_dists(X, ctx.centers, counters)
        a, d1, _, _ = top2_from_full(D)
        st["a"], st["ub"], st["lb"] = a, d1, D
        counters.bound_update += D.size + len(a)

    def assign(self, X: np.ndarray, st: dict, ctx: IterCtx, counters: Counters) -> None:
        if ctx.iter_idx == 0 or st["lb"] is None:
            self._first(X, st, ctx, counters)
            return
        n, k = X.shape[0], ctx.k
        a, ub, lb = st["a"], st["ub"], st["lb"]
        if self.wants_ub_prev:
            st["_ub_prev"] = ub.copy()
        lb -= ctx.delta[None, :]
        ub += ctx.delta[a]
        counters.bound_update += n * k + n
        self._extra_lb(X, st, ctx, counters)
        if self.use_groups:
            # Full: group bounds derived as group-minima of the lb matrix
            # add a Yinyang-style global/group filter on top of Elkan's.
            lbg = np.full((n, ctx.n_groups), np.inf)
            lb_masked = lb.copy()
            lb_masked[np.arange(n), a] = np.inf
            for g in range(ctx.n_groups):
                cols_g = np.where(ctx.groups == g)[0]
                if len(cols_g):
                    lbg[:, g] = lb_masked[:, cols_g].min(1)
            gmin = lbg.min(1)
            counters.bound_access += n * k + n * ctx.n_groups
            skip = ub <= np.maximum(ctx.s[a], gmin)
        else:
            skip = ub <= ctx.s[a]
        counters.bound_access += n
        act = np.where(~skip)[0]
        if len(act) == 0:
            return
        # Candidate mask with the (possibly stale) ub.
        ub_a = ub[act, None]
        M = (lb[act] < ub_a) & (0.5 * ctx.cc[a[act]] < ub_a)
        if self.use_groups:
            M &= lbg[act][:, ctx.groups] < ub_a  # group filter per centre
        M[np.arange(len(act)), a[act]] = False
        counters.bound_access += len(act) * k
        rows_any = np.where(M.any(1))[0]
        if len(rows_any) == 0:
            return
        r1 = act[rows_any]
        d_a = pair_dists(X, ctx.centers, r1, a[r1], counters, x2=st["x2"], c2=ctx.c2)
        ub[r1] = d_a
        lb[r1, a[r1]] = d_a
        counters.bound_update += 2 * len(r1)
        ub_t = d_a[:, None]
        M2 = (lb[r1] < ub_t) & (0.5 * ctx.cc[a[r1]] < ub_t)
        M2[np.arange(len(r1)), a[r1]] = False
        counters.bound_access += len(r1) * k
        rr, cols = np.nonzero(M2)
        rr, cols = self._prefilter_pairs(X, st, ctx, counters, r1, d_a, rr, cols)
        d = candidate_dists(X, ctx.centers, r1, rr, cols, counters, x2=st["x2"], c2=ctx.c2)
        lb[r1[rr], cols] = d
        counters.bound_update += len(rr)
        best, arg = rowwise_min_pairs(len(r1), rr, cols, d)
        upd = best < d_a
        rows_u = r1[upd]
        a[rows_u] = arg[upd]
        ub[rows_u] = best[upd]
        counters.bound_update += 2 * int(upd.sum())

    def _extra_lb(self, X, st, ctx, counters) -> None:
        """Hook for Drift's tighter geometric lower bound (no-op here)."""

    def _prefilter_pairs(self, X, st, ctx, counters, r1, d_a, rr, cols):
        """Hook for Vector's block-vector pre-check (no-op here)."""
        return rr, cols

    def footprint(self, st: dict) -> int:
        tot = st["ub"].nbytes + st["x2"].nbytes
        if st["lb"] is not None:
            tot += st["lb"].nbytes
        return tot
