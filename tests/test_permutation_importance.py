"""Unit tests for permutation feature importance (§5.7 substrate)."""
import numpy as np

from repro.ml.forest import RandomForestRegressor
from repro.ml.permutation_importance import permutation_importance


def test_informative_feature_ranks_first():
    rng = np.random.default_rng(0)
    X = rng.random((150, 4))
    y = 10 * X[:, 2] + 0.01 * rng.standard_normal(150)  # only feature 2 matters
    f = RandomForestRegressor(n_estimators=30, random_state=0).fit(X, y)
    res = permutation_importance(f, X, y, n_repeats=10, random_state=0)
    assert int(np.argmax(res["importances_mean"])) == 2


def test_noise_features_near_zero():
    rng = np.random.default_rng(1)
    X = rng.random((150, 3))
    y = 5 * X[:, 0]
    f = RandomForestRegressor(n_estimators=30, random_state=0).fit(X, y)
    res = permutation_importance(f, X, y, n_repeats=10, random_state=0)
    top = res["importances_mean"][0]
    assert res["importances_mean"][1] < 0.2 * top
    assert res["importances_mean"][2] < 0.2 * top


def test_shapes():
    rng = np.random.default_rng(2)
    X = rng.random((40, 5))
    y = X[:, 0]
    f = RandomForestRegressor(n_estimators=5, random_state=0).fit(X, y)
    res = permutation_importance(f, X, y, n_repeats=7, random_state=0)
    assert res["importances"].shape == (5, 7)
    assert res["importances_mean"].shape == (5,)
    assert res["importances_std"].shape == (5,)


def test_deterministic_given_seed():
    rng = np.random.default_rng(3)
    X = rng.random((50, 3))
    y = X[:, 1] * 2
    f = RandomForestRegressor(n_estimators=5, random_state=0).fit(X, y)
    a = permutation_importance(f, X, y, n_repeats=5, random_state=9)
    b = permutation_importance(f, X, y, n_repeats=5, random_state=9)
    assert np.allclose(a["importances"], b["importances"])


def test_multi_output_supported():
    rng = np.random.default_rng(4)
    X = rng.random((80, 3))
    y = np.stack([X[:, 0], X[:, 0] * 2], axis=1)
    f = RandomForestRegressor(n_estimators=10, random_state=0).fit(X, y)
    res = permutation_importance(f, X, y, n_repeats=5, random_state=0)
    assert int(np.argmax(res["importances_mean"])) == 0
