"""Random forest and gradient boosting learners (scikit-learn substitute).

Both are binary classifiers built on :class:`repro.ml.tree.DecisionTree`:

- :class:`RandomForest`: bootstrap rows + per-node ``sqrt(d)`` feature
  subsets; prediction averages per-tree class-probability vectors
  (scikit-learn's soft voting).
- :class:`GradientBoosting`: logistic-loss gradient boosting; each stage
  fits an mse regression tree to the residual ``y - sigmoid(F)`` and leaf
  values take a Newton step, matching sklearn/LightGBM-style boosting. The
  learned ensemble is a list of margin trees plus ``base_score`` (log-odds).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.ir.tree import Tree
from repro.ml.tree import DecisionTree


def sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -60, 60)))


@dataclass
class RandomForest:
    """Bagged CART ensemble with soft-vote aggregation."""

    n_estimators: int = 100
    max_depth: int | None = None
    min_samples_leaf: int = 1
    random_state: int = 0

    trees_: list[Tree] = field(default_factory=list, repr=False)
    n_classes_: int = 2

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        X = np.asarray(X, dtype=np.float32)
        y = np.asarray(y, dtype=np.int64)
        n = X.shape[0]
        rng = np.random.default_rng(self.random_state)
        self.n_classes_ = max(2, int(y.max()) + 1)
        self.trees_ = []
        for m in range(self.n_estimators):
            rows = rng.integers(0, n, size=n)
            dt = DecisionTree(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                criterion="gini",
                max_features="sqrt",
                random_state=int(rng.integers(0, 2**31 - 1)),
            ).fit(X[rows], y[rows])
            # Bootstrap may miss a class entirely; pad the payload width so
            # every tree agrees on n_out.
            t = dt.tree_
            if t.n_out < self.n_classes_:
                pad = np.zeros((t.n_nodes, self.n_classes_ - t.n_out))
                t = Tree(t.feature, t.threshold, t.left, t.right,
                         np.hstack([t.value, pad]))
            self.trees_.append(t)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float32)
        acc = np.zeros((X.shape[0], self.n_classes_))
        for t in self.trees_:
            acc += t.predict_value(X)
        return acc / len(self.trees_)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return np.argmax(self.predict_proba(X), axis=1)


@dataclass
class GradientBoosting:
    """Binary logistic gradient boosting over mse regression trees."""

    n_estimators: int = 100
    max_depth: int = 3
    learning_rate: float = 0.1
    min_samples_leaf: int = 1
    max_features: int | str | None = None
    random_state: int = 0

    trees_: list[Tree] = field(default_factory=list, repr=False)
    base_score_: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GradientBoosting":
        X = np.asarray(X, dtype=np.float32)
        y = np.asarray(y, dtype=np.float64)
        p0 = float(np.clip(y.mean(), 1e-6, 1 - 1e-6))
        self.base_score_ = float(np.log(p0 / (1 - p0)))
        F = np.full(X.shape[0], self.base_score_)
        self.trees_ = []
        for m in range(self.n_estimators):
            p = sigmoid(F)
            residual = y - p
            dt = DecisionTree(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                criterion="mse",
                max_features=self.max_features,
                random_state=self.random_state + m,
            ).fit(X, residual)
            t = dt.tree_
            # Newton leaf values: sum(residual) / sum(p*(1-p)) per leaf.
            leaf = t.decision_path_leaf(X)
            num = np.bincount(leaf, weights=residual, minlength=t.n_nodes)
            den = np.bincount(leaf, weights=p * (1 - p), minlength=t.n_nodes)
            gamma = np.where(den > 1e-12, num / np.maximum(den, 1e-12), 0.0)
            value = t.value.copy()
            is_leaf = t.left == -1
            value[is_leaf, 0] = gamma[is_leaf]
            t = Tree(t.feature, t.threshold, t.left, t.right, value)
            self.trees_.append(t)
            F = F + self.learning_rate * t.predict_value(X)[:, 0]
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float32)
        F = np.full(X.shape[0], self.base_score_)
        for t in self.trees_:
            F += self.learning_rate * t.predict_value(X)[:, 0]
        return F

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p1 = sigmoid(self.decision_function(X))
        return np.column_stack([1 - p1, p1])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) > 0).astype(np.int64)
