"""Tree ensembles from scratch: RF, AdaBoost, GBDT, XGBoost-lite.

The four supervised baselines of Table III, re-implemented on the CART /
Newton trees in ``baselines.trees`` (no sklearn/xgboost offline). All
expose ``fit(X, y)`` / ``predict(X)`` / ``predict_proba(X)`` for binary y.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.trees import DecisionTree, NewtonTree


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -500, 500)))


class RandomForest:
    """Bagged Gini trees with per-split feature subsampling."""

    def __init__(self, *, n_estimators: int = 50, max_depth: int = 8,
                 max_features: str | int = "sqrt", seed: int = 0) -> None:
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.max_features = max_features
        self.seed = seed
        self.trees: list[DecisionTree] = []

    def fit(self, X: np.ndarray, y: np.ndarray):
        X, y = np.asarray(X, float), np.asarray(y, float)
        rng = np.random.default_rng(self.seed)
        mf = (
            max(1, int(np.sqrt(X.shape[1])))
            if self.max_features == "sqrt"
            else int(self.max_features)
        )
        self.trees = []
        for i in range(self.n_estimators):
            idx = rng.integers(0, len(X), len(X))
            t = DecisionTree(
                max_depth=self.max_depth, max_features=mf, task="clf",
                seed=self.seed + i + 1,
            )
            t.fit(X[idx], y[idx])
            self.trees.append(t)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = np.mean([t.predict_value(X) for t in self.trees], axis=0)
        return np.stack([1 - p, p], axis=1)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X)[:, 1] >= 0.5).astype(int)


class AdaBoost:
    """Discrete AdaBoost (SAMME) with shallow CART stumps."""

    def __init__(self, *, n_estimators: int = 80, max_depth: int = 2, seed: int = 0) -> None:
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.seed = seed
        self.stages: list[tuple[float, DecisionTree]] = []

    def fit(self, X: np.ndarray, y: np.ndarray):
        X, y = np.asarray(X, float), np.asarray(y, float)
        w = np.full(len(y), 1.0 / len(y))
        ypm = 2 * y - 1
        self.stages = []
        for i in range(self.n_estimators):
            t = DecisionTree(max_depth=self.max_depth, task="clf", seed=self.seed + i)
            t.fit(X, y, sample_weight=w)
            pred = t.predict(X)
            err = float(w[pred != y].sum() / w.sum())
            if err >= 0.5:
                break
            err = max(err, 1e-10)
            alpha = 0.5 * np.log((1 - err) / err)
            self.stages.append((alpha, t))
            w = w * np.exp(-alpha * ypm * (2 * pred - 1))
            w /= w.sum()
            if err < 1e-9:
                break
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        if not self.stages:
            return np.zeros(len(X))
        return np.sum(
            [a * (2 * t.predict(X) - 1) for a, t in self.stages], axis=0
        )

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(int)

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = _sigmoid(2 * self.decision_function(X))
        return np.stack([1 - p, p], axis=1)


class GradientBoosting:
    """GBDT with logistic loss: MSE trees fit to residuals, Newton-rescaled
    leaf values (Friedman's classic algorithm)."""

    def __init__(self, *, n_estimators: int = 100, learning_rate: float = 0.1,
                 max_depth: int = 3, seed: int = 0) -> None:
        self.n_estimators = n_estimators
        self.learning_rate = learning_rate
        self.max_depth = max_depth
        self.seed = seed
        self.f0 = 0.0
        self.trees: list[DecisionTree] = []

    def fit(self, X: np.ndarray, y: np.ndarray):
        X, y = np.asarray(X, float), np.asarray(y, float)
        p = np.clip(y.mean(), 1e-6, 1 - 1e-6)
        self.f0 = float(np.log(p / (1 - p)))
        F = np.full(len(y), self.f0)
        self.trees = []
        for i in range(self.n_estimators):
            prob = _sigmoid(F)
            resid = y - prob
            t = DecisionTree(max_depth=self.max_depth, task="reg", seed=self.seed + i)
            t.fit(X, resid)
            # Newton leaf rescale: replace each leaf mean(r) with
            # sum(r)/sum(p(1-p)) over the leaf.
            self._newton_rescale(t._root, X, resid, prob * (1 - prob))
            F = F + self.learning_rate * t.predict_value(X)
            self.trees.append(t)
        return self

    def _newton_rescale(self, node, X, r, h, idx=None):
        if idx is None:
            idx = np.arange(len(X))
        if node.is_leaf:
            hs = h[idx].sum()
            node.value = float(r[idx].sum() / hs) if hs > 1e-12 else 0.0
            return
        mask = X[idx, node.feature] <= node.thresh
        self._newton_rescale(node.left, X, r, h, idx[mask])
        self._newton_rescale(node.right, X, r, h, idx[~mask])

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        F = np.full(len(X), self.f0)
        for t in self.trees:
            F = F + self.learning_rate * t.predict_value(X)
        return F

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = _sigmoid(self.decision_function(X))
        return np.stack([1 - p, p], axis=1)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(int)


class XGBoostLite:
    """Second-order boosting with L2-regularised Newton trees (the core of
    XGBoost: exact greedy split on structure gain, shrinkage, λ/γ)."""

    def __init__(self, *, n_estimators: int = 100, learning_rate: float = 0.1,
                 max_depth: int = 3, lam: float = 1.0, gamma: float = 0.0,
                 base_score: float = 0.5) -> None:
        self.n_estimators = n_estimators
        self.learning_rate = learning_rate
        self.max_depth = max_depth
        self.lam = lam
        self.gamma = gamma
        self.base_score = base_score
        self.trees: list[NewtonTree] = []

    def fit(self, X: np.ndarray, y: np.ndarray):
        X, y = np.asarray(X, float), np.asarray(y, float)
        F = np.full(len(y), float(np.log(self.base_score / (1 - self.base_score))))
        self.trees = []
        for _ in range(self.n_estimators):
            p = _sigmoid(F)
            g = p - y
            h = np.maximum(p * (1 - p), 1e-12)
            t = NewtonTree(max_depth=self.max_depth, lam=self.lam, gamma=self.gamma)
            t.fit(X, g, h)
            F = F + self.learning_rate * t.predict_value(X)
            self.trees.append(t)
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        F = np.full(len(X), float(np.log(self.base_score / (1 - self.base_score))))
        for t in self.trees:
            F = F + self.learning_rate * t.predict_value(X)
        return F

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = _sigmoid(self.decision_function(X))
        return np.stack([1 - p, p], axis=1)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(int)
