"""Unit tests for the CART regression-tree substrate."""
import numpy as np
import pytest

from repro.ml.tree import DecisionTreeRegressor


@pytest.fixture
def xor_like():
    X = np.array([[0.0, 0.0], [0.0, 1.0], [1.0, 0.0], [1.0, 1.0]] * 5)
    y = X[:, 0] * 10 + X[:, 1]
    return X, y


class TestDecisionTree:
    def test_memorizes_training_data(self, xor_like):
        X, y = xor_like
        t = DecisionTreeRegressor().fit(X, y)
        assert np.allclose(t.predict(X).ravel(), y)

    def test_single_sample(self):
        t = DecisionTreeRegressor().fit(np.array([[1.0]]), np.array([5.0]))
        assert t.predict(np.array([[99.0]]))[0, 0] == pytest.approx(5.0)

    def test_constant_target_is_leaf(self):
        X = np.arange(10, dtype=float)[:, None]
        t = DecisionTreeRegressor().fit(X, np.full(10, 3.0))
        assert t.root_.feature == -1
        assert np.allclose(t.predict(X), 3.0)

    def test_max_depth_limits_tree(self):
        rng = np.random.default_rng(0)
        X = rng.random((100, 3))
        y = rng.random(100)
        t = DecisionTreeRegressor(max_depth=1).fit(X, y)

        def depth(node):
            if node is None or node.feature < 0:
                return 0
            return 1 + max(depth(node.left), depth(node.right))

        assert depth(t.root_) <= 1

    def test_multi_output(self):
        X = np.array([[0.0], [1.0], [2.0], [3.0]])
        y = np.stack([X[:, 0], 2 * X[:, 0]], axis=1)
        t = DecisionTreeRegressor().fit(X, y)
        pred = t.predict(X)
        assert pred.shape == (4, 2)
        assert np.allclose(pred, y)

    def test_threshold_splits_cleanly(self):
        # y steps at x = 5; the first split must be near there
        X = np.arange(10, dtype=float)[:, None]
        y = (X[:, 0] >= 5).astype(float) * 100
        t = DecisionTreeRegressor().fit(X, y)
        assert t.root_.feature == 0
        assert 4.0 <= t.root_.threshold <= 5.0

    def test_prediction_on_unseen_is_leaf_mean(self):
        X = np.array([[0.0], [10.0]])
        y = np.array([1.0, 9.0])
        t = DecisionTreeRegressor().fit(X, y)
        assert t.predict(np.array([[-100.0]]))[0, 0] == pytest.approx(1.0)
        assert t.predict(np.array([[100.0]]))[0, 0] == pytest.approx(9.0)

    def test_unfitted_raises(self):
        with pytest.raises(RuntimeError):
            DecisionTreeRegressor().predict(np.zeros((1, 1)))

    def test_serialization_roundtrip(self, xor_like):
        X, y = xor_like
        t = DecisionTreeRegressor().fit(X, y)
        t2 = DecisionTreeRegressor.from_dict(t.to_dict())
        assert np.allclose(t.predict(X), t2.predict(X))

    def test_deterministic_given_seed(self):
        rng = np.random.default_rng(3)
        X = rng.random((50, 4))
        y = rng.random(50)
        p1 = DecisionTreeRegressor(max_features=0.5, random_state=7).fit(X, y).predict(X)
        p2 = DecisionTreeRegressor(max_features=0.5, random_state=7).fit(X, y).predict(X)
        assert np.allclose(p1, p2)

    def test_min_samples_leaf_respected(self):
        X = np.arange(6, dtype=float)[:, None]
        y = np.array([0.0, 0, 0, 1, 1, 1])
        t = DecisionTreeRegressor(min_samples_leaf=3).fit(X, y)

        def leaf_sizes(node, X, idx):
            if node.feature < 0:
                return [len(idx)]
            mask = X[idx, node.feature] <= node.threshold
            return leaf_sizes(node.left, X, idx[mask]) + leaf_sizes(
                node.right, X, idx[~mask]
            )

        sizes = leaf_sizes(t.root_, X, np.arange(6))
        assert all(s >= 3 for s in sizes)
