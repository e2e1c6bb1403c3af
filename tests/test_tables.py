"""Smoke-level integration tests for the table harnesses (small configs —
the full runs live in benchmarks/)."""
import numpy as np
import pytest

from repro.eval.table2 import PAPER_TABLE2, run_table2
from repro.eval.table3 import run_table3
from repro.eval.table4 import run_table4
from repro.eval.table5 import run_table5
from repro.eval.table6 import PAPER_TABLE6, run_table6, train_utune
from repro.tune.utune import UTune, generate_ground_truth
from repro.synth_data import gaussian_mixture


def test_table2_rows_cover_paper():
    rows = run_table2(write=False)
    assert {r["dataset"] for r in rows} == set(PAPER_TABLE2)
    for r in rows:
        assert r["nodes"] > 0 and r["build_s"] > 0
        # Ball-tree with capacity 30 ⇒ nodes/point well below 1
        assert r["nodes_per_point"] < 0.5


def test_table3_structure():
    rows = run_table3(k=20, write=False)
    by = {r["method"]: r for r in rows}
    assert by["Lloyd"]["pruned"] == pytest.approx(0.0, abs=1e-9)
    assert by["Lloyd"]["bound_access"] == 0
    assert by["SEQU"]["pruned"] > 0.3
    assert by["INDE"]["node_access"] > 0
    assert by["UniK"]["point_access"] < by["Lloyd"]["point_access"]


def test_table4_scores():
    rows = run_table4(datasets=("KeggDirect",), ks=(10,), n_iters=4, write=False)
    assert len(rows) >= 10
    for r in rows:
        for col in ("leaderboard", "space_saving", "fewer_distance"):
            assert 1 <= r[col] <= 5


def test_table5_small_budget():
    out = run_table5(budget_s=8.0, write=False)
    assert out["n_records_selective"] >= out["n_records_full"]
    for key, v in out["cells"].items():
        assert 0.0 <= v <= 1.0
    assert len(out["cells"]) == 2 * 2 * 6 * 3  # which × mode × model × features


@pytest.fixture(scope="module")
def mini_utune():
    tasks = []
    for i, d in enumerate((2, 20)):
        X = gaussian_mixture(n=600, d=d, n_centers=6, cluster_std=0.5, seed=i)
        tasks.append((f"t{i}", X, 8))
    return UTune(generate_ground_truth(tasks, selective=True))


def test_table6_subset(mini_utune):
    rows = run_table6(
        datasets=["KeggDirect"], ks=(10,), seeds=(0,), n_iters=5,
        utune=mini_utune, write=False,
    )
    assert len(rows) == 1
    r = rows[0]
    for m in ("SEQU", "INDE", "UniK", "UTune"):
        assert r[f"{m}_speedup"] > 0
        assert 0.0 <= r[f"{m}_pruned"] <= 1.0
    assert ("KeggDirect", 10) in PAPER_TABLE6


def test_paper_table6_constants_complete():
    datasets = {d for d, _ in PAPER_TABLE6}
    assert len(datasets) == 15
    for key, cell in PAPER_TABLE6.items():
        assert set(cell) == {"SEQU", "INDE", "UniK", "UTune"}
