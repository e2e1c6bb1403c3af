"""Table 6 — overall speedup over Lloyd (+ Tables 8/9 phase splits).

For every dataset and k, measures Lloyd / SEQU(Yinyang) / INDE(Ball-
tree) / UniK / UTune, reporting the ×speedup in algorithm time and the
pruned-distance percentage, side by side with the paper's numbers
(k = 10 and k = 100; the paper's k = 1000 column is out of scaled-n
range — DESIGN.md §3). Assignment and refinement speedups (paper
Tables 8 and 9) fall out of the same runs.
"""
from __future__ import annotations

import numpy as np

from ..core.kernels import make_kernel
from ..data.datasets import ALL_SPECS, SPECS
from ..tune.utune import UTune, generate_ground_truth
from .common import Measured, get_runner, measure, render_markdown, write_result

# (dataset, k) -> {method: (paper speedup, paper pruned fraction)}
PAPER_TABLE6 = {
    ("BigCross", 10): {"SEQU": (1.64, .71), "INDE": (1.76, .67), "UniK": (1.36, .78), "UTune": (1.76, .84)},
    ("BigCross", 100): {"SEQU": (2.83, .86), "INDE": (2.16, .59), "UniK": (3.24, .90), "UTune": (4.70, .90)},
    ("Conflong", 10): {"SEQU": (1.32, .68), "INDE": (1.30, .61), "UniK": (1.30, .74), "UTune": (1.32, .68)},
    ("Conflong", 100): {"SEQU": (1.53, .90), "INDE": (1.63, .25), "UniK": (2.22, .90), "UTune": (2.50, .90)},
    ("Covtype", 10): {"SEQU": (1.89, .74), "INDE": (2.18, .72), "UniK": (1.68, .87), "UTune": (2.18, .72)},
    ("Covtype", 100): {"SEQU": (5.62, .90), "INDE": (1.43, .23), "UniK": (5.61, .94), "UTune": (5.67, .93)},
    ("Europe", 10): {"SEQU": (1.38, .75), "INDE": (1.42, .67), "UniK": (1.39, .84), "UTune": (1.48, .35)},
    ("Europe", 100): {"SEQU": (3.24, .92), "INDE": (2.53, .45), "UniK": (3.79, .90), "UTune": (4.03, .95)},
    ("KeggDirect", 10): {"SEQU": (2.93, .83), "INDE": (3.59, .79), "UniK": (4.22, .84), "UTune": (4.30, .95)},
    ("KeggDirect", 100): {"SEQU": (2.61, .92), "INDE": (1.21, .11), "UniK": (4.00, .71), "UTune": (5.80, .95)},
    ("KeggUndirect", 10): {"SEQU": (1.98, .78), "INDE": (2.83, .83), "UniK": (2.40, .94), "UTune": (2.83, .83)},
    ("KeggUndirect", 100): {"SEQU": (4.69, .93), "INDE": (1.79, .31), "UniK": (5.87, .95), "UTune": (6.15, .96)},
    ("NYC", 10): {"SEQU": (1.39, .84), "INDE": (389.0, .99), "UniK": (31.4, .99), "UTune": (389.0, .99)},
    ("NYC", 100): {"SEQU": (4.19, .94), "INDE": (153.0, .99), "UniK": (55.6, .99), "UTune": (153.0, .99)},
    ("Skin", 10): {"SEQU": (1.30, .79), "INDE": (2.54, .87), "UniK": (2.40, .88), "UTune": (2.54, .87)},
    ("Skin", 100): {"SEQU": (2.35, .92), "INDE": (2.60, .56), "UniK": (4.09, .96), "UTune": (4.13, .96)},
    ("Power", 10): {"SEQU": (1.43, .78), "INDE": (0.77, .53), "UniK": (0.87, .82), "UTune": (1.43, .78)},
    ("Power", 100): {"SEQU": (2.39, .91), "INDE": (1.02, .18), "UniK": (2.53, .93), "UTune": (2.60, .91)},
    ("Road", 10): {"SEQU": (1.36, .84), "INDE": (8.64, .96), "UniK": (8.19, .98), "UTune": (8.64, .96)},
    ("Road", 100): {"SEQU": (2.57, .93), "INDE": (3.68, .69), "UniK": (4.60, .93), "UTune": (4.93, .97)},
    ("Census", 10): {"SEQU": (1.31, .62), "INDE": (0.82, .26), "UniK": (1.14, .67), "UTune": (1.55, .69)},
    ("Census", 100): {"SEQU": (3.65, .84), "INDE": (1.14, .15), "UniK": (3.51, .85), "UTune": (3.67, .84)},
    ("Mnist", 10): {"SEQU": (1.13, .01), "INDE": (0.91, .00), "UniK": (0.98, .01), "UTune": (1.36, .27)},
    ("Mnist", 100): {"SEQU": (1.21, .17), "INDE": (0.98, .15), "UniK": (1.22, .18), "UTune": (3.94, .77)},
    ("Spam", 10): {"SEQU": (1.13, .79), "INDE": (1.42, .22), "UniK": (1.15, .78), "UTune": (1.62, .80)},
    ("Spam", 100): {"SEQU": (5.80, .91), "INDE": (2.12, .29), "UniK": (12.59, .94), "UTune": (12.59, .94)},
    ("Shuttle", 10): {"SEQU": (3.65, .71), "INDE": (0.72, .00), "UniK": (0.57, .71), "UTune": (3.65, .71)},
    ("Shuttle", 100): {"SEQU": (5.62, .91), "INDE": (3.67, .09), "UniK": (5.47, .91), "UTune": (6.53, .90)},
    ("MSD", 10): {"SEQU": (1.17, .41), "INDE": (0.72, .00), "UniK": (0.92, .56), "UTune": (1.17, .31)},
    ("MSD", 100): {"SEQU": (2.04, .58), "INDE": (1.21, .08), "UniK": (2.17, .71), "UTune": (2.17, .71)},
}


def train_utune(train_ks=(10, 50, 100), seed: int = 0) -> UTune:
    """Train UTune's models on the Table-2 dataset grid (selective running)."""
    tasks = []
    for name, spec in SPECS.items():
        X = spec.load()
        for k in train_ks:
            tasks.append((name, X, k))
        # n-variant: a subsampled half-size task broadens the grid (§7.3.1).
        tasks.append((name + "-half", X[: len(X) // 2], train_ks[1]))
    records = generate_ground_truth(tasks, selective=True, seed=seed)
    return UTune(records)


def run_table6(
    spark=None,
    datasets: list[str] | None = None,
    ks=(10, 100),
    seeds=(0,),
    n_iters: int = 10,
    utune: UTune | None = None,
    n_partitions: int = 4,
    write: bool = True,
) -> list[dict]:
    datasets = datasets or list(ALL_SPECS)
    runner = get_runner(spark, n_partitions=n_partitions)
    if utune is None:
        utune = train_utune()
    rows = []
    for name in datasets:
        X = ALL_SPECS[name].load()
        for k in ks:
            cells: dict[str, Measured] = {}
            cells["Lloyd"] = measure(X, k, lambda: make_kernel("lloyd"), runner, seeds, n_iters)
            cells["SEQU"] = measure(X, k, lambda: make_kernel("yinyang"), runner, seeds, n_iters)
            cells["INDE"] = measure(X, k, lambda: make_kernel("index"), runner, seeds, n_iters)
            cells["UniK"] = measure(X, k, lambda: make_kernel("unik"), runner, seeds, n_iters)
            bound, mode = utune.predict_config(X, k)
            cells["UTune"] = measure(
                X, k, lambda: utune.make_kernel(X, k), runner, seeds, n_iters
            )
            d = X.shape[1]
            base_work = cells["Lloyd"].counters.work_units(d)
            base_time = cells["Lloyd"].algo_time
            paper = PAPER_TABLE6.get((name, k), {})
            row = {
                "dataset": name, "k": k, "lloyd_s": base_time,
                "utune_config": f"{bound}/{mode}",
            }
            for m in ("SEQU", "INDE", "UniK", "UTune"):
                # Primary speedup: the scalar-execution cost model
                # (EXPERIMENTS.md § Timing); wall-clock kept alongside.
                row[f"{m}_speedup"] = base_work / max(
                    cells[m].counters.work_units(d), 1e-12
                )
                row[f"{m}_wall_speedup"] = base_time / max(cells[m].algo_time, 1e-12)
                row[f"{m}_pruned"] = cells[m].pruned
                row[f"{m}_assign_speedup"] = cells["Lloyd"].assign_time / max(
                    cells[m].assign_time, 1e-12
                )
                row[f"{m}_refine_speedup"] = cells["Lloyd"].refine_time / max(
                    cells[m].refine_time, 1e-12
                )
                if m in paper:
                    row[f"{m}_paper_speedup"] = paper[m][0]
                    row[f"{m}_paper_pruned"] = paper[m][1]
            rows.append(row)
    if write:
        _write_tables(rows)
    return rows


def _write_tables(rows: list[dict]) -> None:
    headers = ["dataset", "k", "Lloyd s"]
    for m in ("SEQU", "INDE", "UniK", "UTune"):
        headers += [f"{m} ×", f"{m} paper ×", f"{m} ×wall",
                    f"{m} pruned", f"{m} paper pruned"]
    headers.append("UTune config")
    md = []
    for r in rows:
        line = [r["dataset"], r["k"], r["lloyd_s"]]
        for m in ("SEQU", "INDE", "UniK", "UTune"):
            line += [
                r[f"{m}_speedup"], r.get(f"{m}_paper_speedup", float("nan")),
                r[f"{m}_wall_speedup"],
                100 * r[f"{m}_pruned"],
                100 * r.get(f"{m}_paper_pruned", float("nan")),
            ]
        line.append(r["utune_config"])
        md.append(line)
    write_result("table6.md", render_markdown(headers, md))
    # Tables 8/9: assignment and refinement phase speedups.
    for phase, fname in (("assign", "table8.md"), ("refine", "table9.md")):
        h = ["dataset", "k"] + [f"{m} ×{phase}" for m in ("SEQU", "INDE", "UniK", "UTune")]
        body = [
            [r["dataset"], r["k"]]
            + [r[f"{m}_{phase}_speedup"] for m in ("SEQU", "INDE", "UniK", "UTune")]
            for r in rows
        ]
        write_result(fname, render_markdown(h, body))
