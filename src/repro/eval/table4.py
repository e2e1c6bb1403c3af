"""Table 4 — derived rating summary of all methods.

The paper's Table 4 rates each algorithm (darker circle = better) on
leaderboard position, space saving, parameter-freeness, data/bound/
distance access counts. We regenerate the measurable columns from a
small grid of runs: each method is scored 1–5 by rank quintile on each
criterion (5 = best), and the markdown table records the scores.
"""
from __future__ import annotations

import numpy as np

from ..core.kernels import SEQUENTIAL, make_kernel
from ..core.runner import LocalRunner
from ..data.datasets import SPECS
from .common import render_markdown, write_result

METHODS = ["index"] + [m for m in SEQUENTIAL if m != "search"] + ["unik"]
PARAMETER_FREE = {  # §7.1: methods whose behaviour depends on a parameter
    "index": False, "elka": True, "hame": True, "drak": False, "yinyang": False,
    "regroup": False, "heap": True, "annu": True, "expo": True, "drift": True,
    "vector": False, "pami20": True, "full": False, "unik": False,
}


def _score(vals: dict[str, float], higher_better: bool = False) -> dict[str, int]:
    names = list(vals)
    order = sorted(names, key=lambda m: vals[m], reverse=higher_better)
    out = {}
    for rank, m in enumerate(order):
        out[m] = 5 - min(4, int(rank * 5 / len(order)))
    return out


def run_table4(
    datasets=("Europe", "KeggDirect", "Covtype", "Power"),
    ks=(10, 100),
    n_iters: int = 10,
    seed: int = 0,
    write: bool = True,
) -> list[dict]:
    runner = LocalRunner()
    time_ranks = {m: [] for m in METHODS}
    agg = {m: {"time": 0.0, "space": 0, "data": 0, "bound": 0, "dist": 0} for m in METHODS}
    for name in datasets:
        X = SPECS[name].load()
        for k in ks:
            cell = {}
            for m in METHODS:
                res = runner.run(X, k, make_kernel(m), n_iters=n_iters, seed=seed)
                cell[m] = res
                agg[m]["time"] += res.counters.assign_time + res.counters.refine_time
                agg[m]["space"] = max(agg[m]["space"], res.counters.footprint_bytes)
                agg[m]["data"] += res.counters.data_access
                agg[m]["bound"] += res.counters.bound_access
                agg[m]["dist"] += res.counters.dist
            order = sorted(METHODS, key=lambda m: cell[m].counters.assign_time
                           + cell[m].counters.refine_time)
            for rank, m in enumerate(order):
                time_ranks[m].append(rank + 1)
    leaderboard = _score({m: float(np.mean(time_ranks[m])) for m in METHODS})
    space = _score({m: agg[m]["space"] for m in METHODS})
    data = _score({m: agg[m]["data"] for m in METHODS})
    bound = _score({m: agg[m]["bound"] for m in METHODS})
    dist = _score({m: agg[m]["dist"] for m in METHODS})
    rows = []
    for m in METHODS:
        rows.append(
            {
                "method": m,
                "leaderboard": leaderboard[m],
                "space_saving": space[m],
                "parameter_free": 5 if PARAMETER_FREE[m] else 1,
                "fewer_data_access": data[m],
                "fewer_bound_access": bound[m],
                "fewer_distance": dist[m],
                "mean_time_rank": float(np.mean(time_ranks[m])),
            }
        )
    if write:
        headers = ["method", "leaderboard", "space", "param-free",
                   "data acc", "bound acc", "distance", "mean time rank"]
        md = [[r["method"], r["leaderboard"], r["space_saving"], r["parameter_free"],
               r["fewer_data_access"], r["fewer_bound_access"], r["fewer_distance"],
               r["mean_time_rank"]] for r in rows]
        write_result("table4.md", render_markdown(headers, md))
    return rows
