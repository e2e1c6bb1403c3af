"""Dataset stand-in registry (Table 2 substitutions)."""
import numpy as np
import pytest

from repro.data.datasets import ALL_SPECS, HOLDOUT_SPECS, SPECS, load
from repro.synth_data import gaussian_mixture


def test_twelve_table2_datasets():
    assert len(SPECS) == 12
    assert len(HOLDOUT_SPECS) == 3


@pytest.mark.parametrize("name", list(ALL_SPECS))
def test_shapes_match_spec(name):
    spec = ALL_SPECS[name]
    X = spec.load()
    assert X.shape == (spec.n, spec.d)
    assert np.isfinite(X).all()


@pytest.mark.parametrize("name", ["NYC", "Mnist", "Power"])
def test_deterministic(name):
    assert np.array_equal(load(name), load(name))


def test_dimensionalities_match_paper():
    assert SPECS["NYC"].d == 2
    assert SPECS["Mnist"].d == 784
    assert SPECS["BigCross"].d == 57
    assert SPECS["Census"].d == 68


def test_nyc_assembles_better_than_power():
    """The qualitative knob the reproduction leans on: NYC's stand-in is
    tightly clustered, Power's is noise-heavy."""
    from repro.index.balltree import build_balltree

    nyc = load("NYC")
    power = load("Power")
    t_nyc = build_balltree(nyc)
    t_pow = build_balltree(power)
    leaves_n = t_nyc.leaf_mask()
    leaves_p = t_pow.leaf_mask()
    rel_n = (t_nyc.radius[leaves_n] / t_nyc.radius[0]).mean()
    rel_p = (t_pow.radius[leaves_p] / t_pow.radius[0]).mean()
    assert rel_n < rel_p


def test_mixture_skew_and_noise():
    X = gaussian_mixture(n=1000, d=4, n_centers=5, skew=1.5, uniform_frac=0.2, seed=0)
    assert X.shape == (1000, 4)


def test_mixture_seed_changes_data():
    a = gaussian_mixture(n=300, d=3, n_centers=4, seed=0)
    b = gaussian_mixture(n=300, d=3, n_centers=4, seed=1)
    assert not np.allclose(a, b)
