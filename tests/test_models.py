"""From-scratch classifier substrate for UTune."""
import numpy as np
import pytest

from repro.tune.models import (
    BDT,
    DecisionTree,
    KNN,
    LinearSVM,
    MODEL_FACTORIES,
    RandomForest,
    RidgeClassifier,
)


@pytest.fixture(scope="module")
def separable():
    rng = np.random.default_rng(0)
    X0 = rng.normal(loc=[-3, 0, 1], scale=0.5, size=(80, 3))
    X1 = rng.normal(loc=[3, 2, -1], scale=0.5, size=(80, 3))
    X2 = rng.normal(loc=[0, -4, 3], scale=0.5, size=(80, 3))
    X = np.vstack([X0, X1, X2])
    y = np.repeat([0, 1, 2], 80)
    idx = rng.permutation(len(y))
    return X[idx], y[idx]


@pytest.mark.parametrize("name", list(MODEL_FACTORIES))
def test_model_learns_separable(separable, name):
    X, y = separable
    model = MODEL_FACTORIES[name]()
    model.fit(X[:180], y[:180])
    acc = (model.predict(X[180:]) == y[180:]).mean()
    assert acc >= 0.9, f"{name} accuracy {acc:.2f}"


def test_decision_tree_pure_leaf():
    X = np.array([[0.0], [1.0], [2.0], [3.0]])
    y = np.array([0, 0, 1, 1])
    t = DecisionTree(max_depth=3).fit(X, y)
    assert (t.predict(X) == y).all()


def test_decision_tree_respects_depth():
    rng = np.random.default_rng(1)
    X = rng.random((100, 2))
    y = (X[:, 0] > 0.5).astype(int)
    t = DecisionTree(max_depth=1).fit(X, y)
    assert (t.predict(X) == y).mean() > 0.9


def test_random_forest_deterministic(separable):
    X, y = separable
    a = RandomForest(n_trees=5, seed=7).fit(X, y).predict(X[:20])
    b = RandomForest(n_trees=5, seed=7).fit(X, y).predict(X[:20])
    assert (a == b).all()


def test_knn_exact_on_train(separable):
    X, y = separable
    m = KNN(k=1).fit(X, y)
    assert (m.predict(X) == y).all()


def test_ridge_closed_form_small():
    X = np.array([[0.0], [1.0], [2.0], [3.0]])
    y = np.array([0, 0, 1, 1])
    m = RidgeClassifier(alpha=1e-6).fit(X, y)
    assert (m.predict(X) == y).all()


def test_svm_margin_sign():
    X = np.array([[-2.0], [-1.5], [1.5], [2.0]])
    y = np.array([0, 0, 1, 1])
    m = LinearSVM(epochs=200).fit(X, y)
    assert (m.predict(X) == y).all()


def test_bdt_rules_bound():
    label_of = {"yinyang": 0, "hame": 1}
    m = BDT("bound", label_of)
    # rows: [n, k, d]
    X = np.array([[1000, 100, 30], [1000, 10, 30]])
    out = m.predict(X)
    assert out[0] == 0  # big k → yinyang
    assert out[1] == 1  # small k → hame


def test_bdt_rules_index():
    label_of = {"pure": 0, "none": 1}
    m = BDT("index", label_of)
    X = np.array([[1000, 10, 2], [1000, 10, 50]])
    out = m.predict(X)
    assert out[0] == 0  # low-d → index
    assert out[1] == 1  # high-d → no index
