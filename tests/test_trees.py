"""CART and Newton trees."""
import numpy as np
import pytest

from repro.baselines.trees import (
    DecisionTree,
    NewtonTree,
    _best_split_impurity,
    _best_split_newton,
)


class TestSplitSearch:
    def test_perfect_split_found(self):
        x = np.array([0.0, 1.0, 2.0, 10.0, 11.0, 12.0])
        y = np.array([0, 0, 0, 1, 1, 1], dtype=float)
        w = np.ones(6)
        gain, t = _best_split_impurity(x, y, w, "gini")
        assert 2.0 < t < 10.0
        assert gain > 0

    def test_constant_feature_no_split(self):
        x = np.ones(5)
        y = np.array([0, 1, 0, 1, 0], dtype=float)
        assert _best_split_impurity(x, y, np.ones(5), "gini") is None

    def test_pure_labels_no_split(self):
        x = np.arange(5.0)
        y = np.ones(5)
        assert _best_split_impurity(x, y, np.ones(5), "gini") is None

    def test_mse_split_on_regression(self):
        x = np.arange(6.0)
        y = np.array([0.0, 0.1, 0.0, 5.0, 5.1, 5.2])
        gain, t = _best_split_impurity(x, y, np.ones(6), "mse")
        assert 2.0 < t < 3.0

    def test_weights_shift_split(self):
        """Putting all weight on a subset makes the split fit that subset."""
        x = np.array([0.0, 1.0, 2.0, 3.0])
        y = np.array([0.0, 1.0, 0.0, 1.0])
        w = np.array([1.0, 1.0, 1e-9, 1e-9])
        gain, t = _best_split_impurity(x, y, w, "gini")
        assert 0.0 < t < 1.0

    def test_newton_gain_matches_formula(self):
        x = np.array([0.0, 1.0, 2.0, 3.0])
        g = np.array([1.0, 1.0, -1.0, -1.0])
        h = np.ones(4)
        lam = 1.0
        gain, t = _best_split_newton(x, g, h, lam, 0.0)
        # best split between 1 and 2: GL=2,HL=2,GR=-2,HR=2,G=0,H=4
        expect = 0.5 * (4 / 3 + 4 / 3 - 0)
        assert gain == pytest.approx(expect)
        assert 1.0 < t < 2.0


class TestDecisionTree:
    def test_fits_threshold_function(self):
        rng = np.random.default_rng(0)
        X = rng.random((200, 3))
        y = (X[:, 1] > 0.5).astype(float)
        t = DecisionTree(max_depth=2).fit(X, y)
        assert (t.predict(X) == y).mean() > 0.97

    def test_fits_xor_with_depth2(self):
        rng = np.random.default_rng(0)
        X = rng.random((400, 2))
        y = ((X[:, 0] > 0.5) ^ (X[:, 1] > 0.5)).astype(float)
        t = DecisionTree(max_depth=2).fit(X, y)
        assert (t.predict(X) == y).mean() > 0.95

    def test_depth_zero_is_prior(self):
        X = np.random.default_rng(0).random((50, 2))
        y = np.array([1.0] * 30 + [0.0] * 20)
        t = DecisionTree(max_depth=0).fit(X, y)
        assert np.allclose(t.predict_value(X), 0.6)

    def test_predict_proba_shape_and_range(self):
        rng = np.random.default_rng(0)
        X = rng.random((50, 2))
        y = (X[:, 0] > 0.5).astype(float)
        p = DecisionTree(max_depth=3).fit(X, y).predict_proba(X)
        assert p.shape == (50, 2)
        assert np.allclose(p.sum(axis=1), 1.0)

    def test_regression_reduces_mse(self):
        rng = np.random.default_rng(1)
        X = rng.random((300, 2))
        y = 3 * X[:, 0] + rng.normal(0, 0.05, 300)
        t = DecisionTree(max_depth=4, task="reg").fit(X, y)
        mse = ((t.predict_value(X) - y) ** 2).mean()
        assert mse < np.var(y) * 0.2


class TestNewtonTree:
    def test_leaf_value_formula(self):
        X = np.zeros((4, 1))
        g = np.array([1.0, 2.0, 3.0, 4.0])
        h = np.ones(4)
        t = NewtonTree(max_depth=0, lam=1.0).fit(X, g, h)
        assert t.predict_value(X)[0] == pytest.approx(-10.0 / 5.0)

    def test_splits_by_gradient_sign(self):
        X = np.arange(8.0).reshape(-1, 1)
        g = np.array([1.0] * 4 + [-1.0] * 4)
        h = np.ones(8)
        t = NewtonTree(max_depth=1, lam=0.0).fit(X, g, h)
        v = t.predict_value(X)
        assert np.allclose(v[:4], -1.0)
        assert np.allclose(v[4:], 1.0)

    def test_gamma_blocks_weak_splits(self):
        X = np.arange(8.0).reshape(-1, 1)
        g = np.array([0.01] * 4 + [-0.01] * 4)
        h = np.ones(8)
        t = NewtonTree(max_depth=3, lam=1.0, gamma=10.0).fit(X, g, h)
        assert t._root.is_leaf
