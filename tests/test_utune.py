"""UTune: features, ground-truth generation, MRR, end-to-end prediction."""
import numpy as np
import pytest

from repro.index.balltree import build_balltree
from repro.synth_data import gaussian_mixture
from repro.tune.features import FEATURE_NAMES, FEATURE_SETS, extract_features
from repro.tune.utune import (
    BOUND_POOL_SELECTIVE,
    INDEX_MODES,
    UTune,
    generate_ground_truth,
    mrr,
    run_task,
    split_records,
    train_model,
    evaluate_mrr,
)


@pytest.fixture(scope="module")
def tiny_records():
    tasks = []
    for i, d in enumerate((2, 12, 30)):
        X = gaussian_mixture(n=700, d=d, n_centers=8, cluster_std=0.5, seed=i)
        for k in (5, 15):
            tasks.append((f"ds{i}", X, k))
    return generate_ground_truth(tasks, selective=True)


def test_feature_vector_layout():
    X = gaussian_mixture(n=500, d=4, n_centers=5, seed=0)
    f = extract_features(X, 7)
    assert f.shape == (len(FEATURE_NAMES),)
    assert f[0] == 500 and f[1] == 7 and f[2] == 4
    assert np.isfinite(f).all()


def test_feature_sets_nested():
    assert FEATURE_SETS["basic"].stop < FEATURE_SETS["tree"].stop < FEATURE_SETS["leaf"].stop


def test_feature_normalization_bounded():
    X = gaussian_mixture(n=2000, d=6, n_centers=10, seed=1)
    f = extract_features(X, 10)
    # leaf radius / root radius and ψ / root radius are ≲ O(1)
    assert 0 <= f[8] <= 2.0
    assert 0 <= f[10] <= 2.0


def test_run_task_rankings(tiny_records):
    r = tiny_records[0]
    assert sorted(r.bound_ranking) == sorted(BOUND_POOL_SELECTIVE)
    assert sorted(r.index_ranking) == sorted(INDEX_MODES)
    # ranking is consistent with measured times
    ts = [r.times[m] for m in r.bound_ranking]
    assert ts == sorted(ts)


def test_run_task_full_mode():
    X = gaussian_mixture(n=500, d=5, n_centers=6, seed=9)
    rec = run_task(X, 6, selective=False)
    assert len(rec.bound_ranking) >= 10  # all sequential methods ranked


def test_budget_limits_records():
    X = gaussian_mixture(n=600, d=4, n_centers=5, seed=2)
    tasks = [("a", X, 5)] * 500
    recs = generate_ground_truth(tasks, selective=True, budget_s=0.05)
    assert 0 < len(recs) < 500


def test_mrr_math():
    assert mrr(["a"], [["a", "b"]]) == 1.0
    assert mrr(["b"], [["a", "b"]]) == 0.5
    assert mrr(["z"], [["a", "b"]]) == pytest.approx(1 / 3)
    assert mrr(["a", "b"], [["a"], ["a", "b"]]) == pytest.approx(0.75)


def test_split_disjoint(tiny_records):
    train, test = split_records(tiny_records, test_frac=0.3, seed=1)
    assert len(train) + len(test) == len(tiny_records)
    assert len(test) >= 1


@pytest.mark.parametrize("model", ["BDT", "DT", "RF", "kNN", "RC", "SVM"])
@pytest.mark.parametrize("which", ["bound", "index"])
def test_train_and_score_all_models(tiny_records, model, which):
    train, test = split_records(tiny_records)
    tm = train_model(train, which, model, feature_set="leaf")
    score = evaluate_mrr(test, tm, which)
    assert 0.0 < score <= 1.0


def test_utune_end_to_end(tiny_records):
    ut = UTune(tiny_records)
    X = gaussian_mixture(n=700, d=12, n_centers=8, cluster_std=0.5, seed=42)
    bound, mode = ut.predict_config(X, 10)
    assert bound in set(BOUND_POOL_SELECTIVE) | {"elka", "annu", "expo", "drift",
                                                "vector", "pami20", "full"}
    assert mode in INDEX_MODES
    kern = ut.make_kernel(X, 10)
    # the predicted kernel must still be exact
    from repro.core.kernels import make_kernel
    from repro.core.runner import LocalRunner

    r = LocalRunner()
    ref = r.run(X, 10, make_kernel("lloyd"), n_iters=5, seed=0)
    res = r.run(X, 10, kern, n_iters=5, seed=0)
    assert np.allclose(ref.centers, res.centers)


def test_selective_faster_than_full():
    """§6.1's premise: the selective pool costs less per task."""
    X = gaussian_mixture(n=800, d=6, n_centers=6, seed=3)
    sel = run_task(X, 8, selective=True)
    full = run_task(X, 8, selective=False)
    assert sel.gen_time < full.gen_time
