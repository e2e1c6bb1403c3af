"""Table 5 (+ Table 7) — UTune prediction accuracy (MRR) and model costs.

Generates full-running and selective-running ground truths under the
same wall-clock budget (§6.1: selective fits more tasks → more records
→ higher precision), trains every model family on the three cumulative
feature sets of Table 1, and reports Bound@MRR / Index@MRR per cell,
with the paper's numbers alongside.
"""
from __future__ import annotations

import numpy as np

from ..data.datasets import SPECS
from ..tune.utune import (
    TaskRecord,
    evaluate_mrr,
    generate_ground_truth,
    split_records,
    train_model,
)
from .common import render_markdown, write_result

MODELS = ["BDT", "DT", "RF", "SVM", "kNN", "RC"]
FEATURE_SETS = ["basic", "tree", "leaf"]

#: Paper Table 5, “+ Leaf-features” block (and BDT, which has no features).
PAPER_TABLE5 = {
    ("Bound", "full"): {"BDT": 0.41, "DT": 0.69, "RF": 0.68, "SVM": 0.63, "kNN": 0.63, "RC": 0.60},
    ("Index", "full"): {"BDT": 0.37, "DT": 0.74, "RF": 0.77, "SVM": 0.83, "kNN": 0.74, "RC": 0.74},
    ("Bound", "selective"): {"BDT": 0.42, "DT": 0.89, "RF": 0.87, "SVM": 0.88, "kNN": 0.88, "RC": 0.80},
    ("Index", "selective"): {"BDT": 0.43, "DT": 0.92, "RF": 0.92, "SVM": 0.92, "kNN": 0.86, "RC": 0.84},
}


def _task_grid(ks=(10, 50, 100), n_fracs=(1.0, 0.4)) -> list:
    """The §7.3.1 grid: all Table-2 datasets × k × n variants."""
    tasks = []
    for name, spec in SPECS.items():
        X = spec.load()
        for frac in n_fracs:
            Xf = X[: max(200, int(len(X) * frac))]
            for k in ks:
                tasks.append((f"{name}@{frac}", Xf, k))
    return tasks


def run_table5(budget_s: float = 90.0, seed: int = 0, write: bool = True) -> dict:
    tasks = _task_grid()
    rng = np.random.default_rng(seed)
    order = rng.permutation(len(tasks))
    tasks = [tasks[i] for i in order]
    recs_full = generate_ground_truth(tasks, selective=False, budget_s=budget_s, seed=seed)
    recs_sel = generate_ground_truth(tasks, selective=True, budget_s=budget_s, seed=seed)
    out = {
        "n_records_full": len(recs_full),
        "n_records_selective": len(recs_sel),
        "cells": {},      # (which, mode, model, feature_set) -> mrr
        "times": {},      # (mode, model, feature_set) -> (train_s, predict_s)
    }
    for mode, recs in (("full", recs_full), ("selective", recs_sel)):
        train, test = split_records(recs, seed=seed)
        for which in ("bound", "index"):
            for model in MODELS:
                for fs in FEATURE_SETS:
                    tm = train_model(train, which, model, feature_set=fs)
                    m = evaluate_mrr(test, tm, which)
                    out["cells"][(which, mode, model, fs)] = m
                    out["times"][(mode, model, fs)] = (
                        tm.train_time,
                        tm.predict_time / max(1, len(test)),
                    )
    if write:
        _write(out)
    return out


def _write(out: dict) -> None:
    rows = []
    for which in ("bound", "index"):
        for mode in ("full", "selective"):
            prefix = "S-" if mode == "selective" else ""
            label = f"{prefix}{which.capitalize()}@MRR"
            paper = PAPER_TABLE5[(which.capitalize(), mode)]
            for fs in FEATURE_SETS:
                row = [label, fs]
                for model in MODELS:
                    row.append(out["cells"][(which, mode, model, fs)])
                row.append(paper["BDT"])
                row.append(paper["DT"])
                rows.append(row)
    headers = ["metric", "features"] + MODELS + ["paper BDT", "paper DT(leaf)"]
    text = (
        f"records: full={out['n_records_full']} "
        f"selective={out['n_records_selective']}\n\n"
        + render_markdown(headers, rows)
    )
    # Table 7: training / prediction time.
    t7 = [
        [mode, model, fs, tr * 1e3, pr * 1e6]
        for (mode, model, fs), (tr, pr) in sorted(out["times"].items())
    ]
    text += "\n\n## Table 7 — training (ms) / prediction (µs per record)\n\n"
    text += render_markdown(["mode", "model", "features", "train_ms", "predict_us"], t7)
    write_result("table5.md", text)
