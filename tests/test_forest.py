"""Unit tests for the Random-Forest substrate."""
import numpy as np
import pytest

from repro.ml.forest import RandomForestRegressor


@pytest.fixture(scope="module")
def regression_data():
    rng = np.random.default_rng(0)
    X = rng.random((120, 5))
    y = 4 * X[:, 0] + 2 * X[:, 1] ** 2 + 0.05 * rng.standard_normal(120)
    return X, y


class TestRandomForest:
    def test_fits_and_predicts(self, regression_data):
        X, y = regression_data
        f = RandomForestRegressor(n_estimators=20, random_state=0).fit(X, y)
        pred = f.predict(X)
        assert pred.shape == (120,)
        # in-sample bagged fit should be decent
        assert np.mean(np.abs(pred - y)) < 0.5

    def test_multi_output_shape(self):
        rng = np.random.default_rng(1)
        X = rng.random((40, 3))
        y = np.stack([X[:, 0], X[:, 1], X.sum(axis=1)], axis=1)
        f = RandomForestRegressor(n_estimators=10, random_state=0).fit(X, y)
        assert f.predict(X).shape == (40, 3)
        assert f.n_outputs_ == 3

    def test_default_is_100_estimators(self):
        assert RandomForestRegressor().n_estimators == 100  # sklearn default (§5.6)

    def test_deterministic_given_seed(self, regression_data):
        X, y = regression_data
        a = RandomForestRegressor(n_estimators=10, random_state=5).fit(X, y).predict(X)
        b = RandomForestRegressor(n_estimators=10, random_state=5).fit(X, y).predict(X)
        assert np.allclose(a, b)

    def test_different_seeds_differ(self, regression_data):
        X, y = regression_data
        a = RandomForestRegressor(n_estimators=5, random_state=1).fit(X, y).predict(X)
        b = RandomForestRegressor(n_estimators=5, random_state=2).fit(X, y).predict(X)
        assert not np.allclose(a, b)

    def test_parallel_matches_serial(self, regression_data):
        X, y = regression_data
        a = RandomForestRegressor(n_estimators=8, random_state=3, n_jobs=1).fit(X, y)
        b = RandomForestRegressor(n_estimators=8, random_state=3, n_jobs=4).fit(X, y)
        assert np.allclose(a.predict(X), b.predict(X))

    def test_unfitted_raises(self):
        with pytest.raises(RuntimeError):
            RandomForestRegressor().predict(np.zeros((1, 2)))

    def test_serialization_roundtrip(self, regression_data):
        X, y = regression_data
        f = RandomForestRegressor(n_estimators=10, random_state=0).fit(X, y)
        f2 = RandomForestRegressor.from_dict(f.to_dict())
        assert np.allclose(f.predict(X), f2.predict(X))

    def test_bagging_smooths_vs_single_tree(self, regression_data):
        """Forest generalizes better than one deep tree on held-out data."""
        X, y = regression_data
        Xtr, ytr, Xte, yte = X[:90], y[:90], X[90:], y[90:]
        forest = RandomForestRegressor(n_estimators=50, random_state=0).fit(Xtr, ytr)
        from repro.ml.tree import DecisionTreeRegressor

        tree = DecisionTreeRegressor().fit(Xtr, ytr)
        err_f = np.mean((forest.predict(Xte) - yte) ** 2)
        err_t = np.mean((tree.predict(Xte).ravel() - yte) ** 2)
        assert err_f <= err_t * 1.1
