"""The backbone invariant: every accelerated kernel is *exact* —
identical centroid trajectory and assignment to plain Lloyd (§2.2,
"Exact Lloyd's Algorithm")."""
import numpy as np
import pytest

from repro.core.kernels import INDEX_BASED, SEQUENTIAL, make_kernel
from repro.core.runner import LocalRunner
from repro.synth_data import gaussian_mixture

ALL_METHODS = SEQUENTIAL + INDEX_BASED + ["unik"]

DATASETS = {
    "lowd": dict(n=2500, d=2, n_centers=20, cluster_std=0.4, seed=1),
    "midd": dict(n=2000, d=12, n_centers=8, cluster_std=1.0, seed=2),
    "highd": dict(n=1200, d=50, n_centers=10, cluster_std=2.0, uniform_frac=0.3, seed=3),
}


@pytest.fixture(scope="module")
def data():
    return {name: gaussian_mixture(**cfg) for name, cfg in DATASETS.items()}


@pytest.fixture(scope="module")
def references(data):
    r = LocalRunner()
    refs = {}
    for name, X in data.items():
        for k in (8, 40):
            for seed in (0, 4):
                refs[(name, k, seed)] = r.run(
                    X, k, make_kernel("lloyd"), n_iters=8, seed=seed
                )
    return refs


@pytest.mark.parametrize("method", ALL_METHODS)
@pytest.mark.parametrize("ds", list(DATASETS))
@pytest.mark.parametrize("k", [8, 40])
@pytest.mark.parametrize("seed", [0, 4])
def test_exactness(data, references, method, ds, k, seed):
    X = data[ds]
    ref = references[(ds, k, seed)]
    res = LocalRunner().run(X, k, make_kernel(method), n_iters=8, seed=seed)
    assert res.iters_run == ref.iters_run
    assert np.allclose(ref.centers, res.centers, atol=1e-8), (
        f"{method} centroids diverged on {ds} k={k}"
    )
    assert (ref.assign == res.assign).all()
    assert np.isclose(ref.sse, res.sse)


@pytest.mark.parametrize("method", ["elka", "hame", "yinyang", "index", "unik"])
def test_exactness_random_init(data, method):
    X = data["midd"]
    r = LocalRunner()
    ref = r.run(X, 15, make_kernel("lloyd"), n_iters=6, seed=2, init="random")
    res = r.run(X, 15, make_kernel(method), n_iters=6, seed=2, init="random")
    assert np.allclose(ref.centers, res.centers)


@pytest.mark.parametrize("traversal", ["adaptive", "index-single", "index-multiple"])
def test_unik_traversals_exact(data, traversal):
    X = data["lowd"]
    r = LocalRunner()
    ref = r.run(X, 25, make_kernel("lloyd"), n_iters=8, seed=1)
    res = r.run(X, 25, make_kernel("unik", traversal=traversal), n_iters=8, seed=1)
    assert np.allclose(ref.centers, res.centers)
    assert (ref.assign == res.assign).all()


@pytest.mark.parametrize("index", ["balltree", "hkt", "mtree", "covertree"])
def test_index_kernel_all_trees_exact(data, index):
    X = data["midd"]
    r = LocalRunner()
    ref = r.run(X, 12, make_kernel("lloyd"), n_iters=6, seed=0)
    res = r.run(X, 12, make_kernel("index", index=index), n_iters=6, seed=0)
    assert np.allclose(ref.centers, res.centers)


@pytest.mark.parametrize("method", ["hame", "yinyang", "drak", "index", "unik"])
def test_exactness_k_exceeding_structure(data, method):
    """k close to n/10 — many tiny clusters stress the bound updates."""
    X = data["lowd"][:800]
    r = LocalRunner()
    ref = r.run(X, 79, make_kernel("lloyd"), n_iters=6, seed=3)
    res = r.run(X, 79, make_kernel(method), n_iters=6, seed=3)
    assert np.allclose(ref.centers, res.centers)


@pytest.mark.parametrize("method", ["hame", "elka", "index", "unik", "pami20"])
def test_k_equals_one(data, method):
    X = data["midd"][:200]
    r = LocalRunner()
    ref = r.run(X, 1, make_kernel("lloyd"), n_iters=3, seed=0)
    res = r.run(X, 1, make_kernel(method), n_iters=3, seed=0)
    assert np.allclose(ref.centers, res.centers)


@pytest.mark.parametrize("method", ["hame", "yinyang", "vector", "index"])
def test_one_dimensional_data(method):
    rng = np.random.default_rng(0)
    X = np.sort(rng.normal(size=(500, 1)), axis=0)
    r = LocalRunner()
    ref = r.run(X, 6, make_kernel("lloyd"), n_iters=6, seed=1)
    res = r.run(X, 6, make_kernel(method), n_iters=6, seed=1)
    assert np.allclose(ref.centers, res.centers)
