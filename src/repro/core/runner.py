"""Drive k-means iterations over a kernel: locally or on Spark.

Both runners share the same protocol (§5.1.2 incremental refinement):

1. Build the per-iteration :class:`IterCtx` on the driver (centroid
   drifts, cc-matrix, groups, …) and broadcast it.
2. Each partition runs ``kernel.assign`` over its cached block and
   incrementally updates its per-cluster sum vectors/counts with only
   the points that changed cluster (the paper's sum-vector refinement —
   no second pass over the data).
3. Per-cluster partials are merged — on Spark via ``reduceByKey`` — and
   the driver divides sum vectors by counts to refine the centroids.

``SparkRunner`` keeps points + bound state in a cached RDD of partition
payloads, maps the assignment step with ``mapPartitions``, and
unpersists the previous state each iteration.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from .ctx import IterCtx, make_ctx
from .kernels.base import Kernel
from .linalg import kmeans_pp_init, random_init, sse
from .metrics import Counters


@dataclass
class RunResult:
    centers: np.ndarray
    counters: Counters
    iters_run: int
    assign_times: list[float] = field(default_factory=list)
    refine_times: list[float] = field(default_factory=list)
    iter_times: list[float] = field(default_factory=list)
    assign: np.ndarray | None = None   # final assignment (local runs only)
    sse: float = float("nan")

    @property
    def total_time(self) -> float:
        return float(sum(self.iter_times))


def _init_centers(X: np.ndarray, k: int, seed: int, init: str) -> np.ndarray:
    if init == "kmeans++":
        return kmeans_pp_init(X, k, seed)
    if init == "random":
        return random_init(X, k, seed)
    raise ValueError(f"unknown init {init!r}")


def _refine_traditional(
    X: np.ndarray,
    a_new: np.ndarray,
    sv: np.ndarray,
    cnt: np.ndarray,
    counters: Counters,
) -> None:
    """Classic refinement: re-read every point and rebuild the sums."""
    sv[:] = 0.0
    cnt[:] = 0.0
    np.add.at(sv, a_new, X)
    np.add.at(cnt, a_new, 1)
    counters.data_access += len(a_new)


def _refine_increment(
    X: np.ndarray,
    a_prev: np.ndarray,
    a_new: np.ndarray,
    sv: np.ndarray,
    cnt: np.ndarray,
    counters: Counters,
) -> None:
    """Update per-cluster sum vectors with only the moved points."""
    moved = np.where(a_prev != a_new)[0]
    if len(moved) == 0:
        return
    pts = X[moved]
    old = a_prev[moved]
    valid = old >= 0
    if valid.any():
        np.subtract.at(sv, old[valid], pts[valid])
        np.subtract.at(cnt, old[valid], 1)
    np.add.at(sv, a_new[moved], pts)
    np.add.at(cnt, a_new[moved], 1)
    counters.data_access += len(moved)


class LocalRunner:
    """Single-process reference runner (used by tests and the tuner)."""

    def run(
        self,
        X: np.ndarray,
        k: int,
        kernel: Kernel,
        n_iters: int = 10,
        seed: int = 0,
        init: str = "kmeans++",
        centers0: np.ndarray | None = None,
    ) -> RunResult:
        X = np.ascontiguousarray(X, dtype=np.float64)
        centers = (
            centers0.astype(np.float64).copy()
            if centers0 is not None
            else _init_centers(X, k, seed, init)
        )
        k = centers.shape[0]
        counters = Counters()
        st = kernel.init_state(X)
        sv = np.zeros_like(centers)
        cnt = np.zeros(k)
        groups_cache = None
        prev = centers.copy()
        res = RunResult(centers=centers, counters=counters, iters_run=0)
        for t in range(n_iters):
            t_iter = time.perf_counter()
            ctx = make_ctx(
                centers, prev, t, kernel.needs,
                groups=groups_cache if kernel.fixed_groups else None,
            )
            if kernel.fixed_groups and groups_cache is None:
                groups_cache = ctx.groups
            counters.dist += ctx.driver_dist
            a_prev = st["a"].copy()
            t0 = time.perf_counter()
            kernel.assign(X, st, ctx, counters)
            t_assign = time.perf_counter() - t0
            t0 = time.perf_counter()
            if kernel.traditional_refine:
                _refine_traditional(X, st["a"], sv, cnt, counters)
            else:
                _refine_increment(X, a_prev, st["a"], sv, cnt, counters)
            nonempty = cnt > 0
            new_centers = centers.copy()
            new_centers[nonempty] = sv[nonempty] / cnt[nonempty, None]
            t_refine = time.perf_counter() - t0
            prev, centers = centers, new_centers
            res.assign_times.append(t_assign)
            res.refine_times.append(t_refine)
            res.iter_times.append(time.perf_counter() - t_iter)
            res.iters_run = t + 1
            counters.footprint_bytes = max(
                counters.footprint_bytes, kernel.footprint(st)
            )
            if t > 0 and np.array_equal(prev, centers):
                break
        counters.assign_time = sum(res.assign_times)
        counters.refine_time = sum(res.refine_times)
        res.centers = centers
        res.assign = st["a"]
        res.sse = sse(X, centers, st["a"])
        return res


def _spark_step(payload: dict, kernel: Kernel, ctx: IterCtx):
    """One partition's assignment + incremental refinement step."""
    X, st = payload["X"], payload["st"]
    c = Counters()
    a_prev = st["a"].copy()
    t0 = time.perf_counter()
    kernel.assign(X, st, ctx, c)
    c.assign_time = time.perf_counter() - t0
    t0 = time.perf_counter()
    if kernel.traditional_refine:
        _refine_traditional(X, st["a"], payload["sv"], payload["cnt"], c)
    else:
        _refine_increment(X, a_prev, st["a"], payload["sv"], payload["cnt"], c)
    c.refine_time = time.perf_counter() - t0
    c.footprint_bytes = kernel.footprint(st)
    partials = [
        (int(j), (payload["sv"][j].copy(), float(payload["cnt"][j])))
        for j in range(payload["sv"].shape[0])
        if payload["cnt"][j] > 0
    ]
    return payload, partials, c


class SparkRunner:
    """Distributed runner: cached partition-state RDD + reduceByKey refine."""

    def __init__(self, spark, n_partitions: int = 8):
        self.spark = spark
        self.n_partitions = n_partitions

    def run(
        self,
        X: np.ndarray,
        k: int,
        kernel: Kernel,
        n_iters: int = 10,
        seed: int = 0,
        init: str = "kmeans++",
        centers0: np.ndarray | None = None,
    ) -> RunResult:
        sc = self.spark.sparkContext
        X = np.ascontiguousarray(X, dtype=np.float64)
        centers = (
            centers0.astype(np.float64).copy()
            if centers0 is not None
            else _init_centers(X, k, seed, init)
        )
        k = centers.shape[0]
        d = X.shape[1]
        blocks = np.array_split(X, self.n_partitions)

        def _init_payload(block):
            return {
                "X": block,
                "st": kernel.init_state(block),
                "sv": np.zeros((k, d)),
                "cnt": np.zeros(k),
            }

        rdd = sc.parallelize(blocks, len(blocks)).mapPartitions(
            lambda it: [_init_payload(b) for b in it], preservesPartitioning=True
        ).cache()
        rdd.count()  # materialize initial state
        prev_cached = rdd

        counters = Counters()
        groups_cache = None
        prev = centers.copy()
        res = RunResult(centers=centers, counters=counters, iters_run=0)
        kernel_bc = sc.broadcast(kernel)
        ctx_bcs: list = []
        for t in range(n_iters):
            t_iter = time.perf_counter()
            ctx = make_ctx(
                centers, prev, t, kernel.needs,
                groups=groups_cache if kernel.fixed_groups else None,
            )
            if kernel.fixed_groups and groups_cache is None:
                groups_cache = ctx.groups
            counters.dist += ctx.driver_dist
            ctx_bc = sc.broadcast(ctx)
            new_rdd = rdd.mapPartitions(
                lambda it, _k=kernel_bc, _c=ctx_bc: [
                    _spark_step(p, _k.value, _c.value) for p in it
                ],
                preservesPartitioning=True,
            ).cache()
            # Truncate lineage at this iteration's state so the previous
            # iteration's ctx broadcast can be destroyed and closure
            # serialization stays O(1) in the iteration count.
            new_rdd.localCheckpoint()
            # One action per iteration: the sum-vector partials arrive
            # keyed by cluster id and are merged with reduceByKey; the
            # per-partition counters ride along under sentinel keys.
            merged_rows = (
                new_rdd.flatMap(
                    lambda r: [((0, j), sc_) for j, sc_ in r[1]]
                    + [((1, 0), r[2])]
                )
                .reduceByKey(
                    lambda u, v: (u[0] + v[0], u[1] + v[1])
                    if isinstance(u, tuple)
                    else u + v
                )
                .collect()
            )
            part_counters = Counters()
            new_centers = centers.copy()
            t0 = time.perf_counter()  # driver-side combine only
            for (kind, j), val in merged_rows:
                if kind == 0:
                    svj, cntj = val
                    if cntj > 0:
                        new_centers[j] = svj / cntj
                else:
                    part_counters = val
            counters.dist += part_counters.dist
            counters.data_access += part_counters.data_access
            counters.bound_access += part_counters.bound_access
            counters.bound_update += part_counters.bound_update
            counters.node_access += part_counters.node_access
            counters.footprint_bytes = max(
                counters.footprint_bytes, part_counters.footprint_bytes
            )
            # Partition phase times are summed by the counter merge; with
            # p equal partitions running in parallel, wall-clock ≈ sum/p.
            p = len(blocks)
            t_assign = part_counters.assign_time / p
            t_refine = part_counters.refine_time / p + (time.perf_counter() - t0)
            counters.assign_time += t_assign
            counters.refine_time += t_refine
            # The collect above materialized (and checkpointed) new_rdd;
            # the next iteration maps a lazy view of it. The previous
            # iteration's cached state can now be released.
            if prev_cached is not None:
                prev_cached.unpersist()
            prev_cached = new_rdd
            rdd = new_rdd.map(lambda r: r[0])
            # unpersist (not destroy): the cached PythonRDD's serialized
            # function still references this broadcast; destroy would
            # invalidate later task serialization. All ctx broadcasts
            # are destroyed together after the final collect.
            ctx_bc.unpersist()
            ctx_bcs.append(ctx_bc)
            prev, centers = centers, new_centers
            res.assign_times.append(t_assign)
            res.refine_times.append(t_refine)
            res.iter_times.append(time.perf_counter() - t_iter)
            res.iters_run = t + 1
            if t > 0 and np.array_equal(prev, centers):
                break
        a = np.concatenate(rdd.map(lambda p: p["st"]["a"]).collect())
        prev_cached.unpersist()
        for bc in ctx_bcs:
            bc.destroy()
        kernel_bc.destroy()
        res.centers = centers
        res.assign = a
        res.sse = sse(X, centers, a)
        return res
