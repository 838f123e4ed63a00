"""Random forest: bagged CART trees with sqrt-feature subsampling.

Substitute for sklearn's RandomForestClassifier. 30 trees instead of
sklearn's 100 (runtime budget — documented in DESIGN.md); otherwise the
same estimator: bootstrap resampling, per-split random sqrt(p) feature
subset, soft-vote aggregation of leaf class distributions.
"""
from __future__ import annotations

import numpy as np

from .tree import DecisionTreeClassifier

__all__ = ["RandomForestClassifier"]


class RandomForestClassifier:
    def __init__(self, n_estimators: int = 30, max_depth: int | None = None, seed: int = 0):
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.seed = seed
        self._trees: list[DecisionTreeClassifier] = []
        self._classes: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForestClassifier":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y)
        if len(X) == 0:
            raise ValueError("empty training set")
        self._classes = np.unique(y)
        rng = np.random.default_rng(self.seed)
        m = max(1, int(np.sqrt(X.shape[1])))
        self._trees = []
        for t in range(self.n_estimators):
            idx = rng.integers(0, len(X), len(X))
            tree = DecisionTreeClassifier(
                max_depth=self.max_depth, max_features=m, seed=self.seed * 1000 + t
            )
            tree.fit(X[idx], y[idx])
            self._trees.append(tree)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if not self._trees:
            raise RuntimeError("fit before predict")
        X = np.asarray(X, dtype=np.float64)
        # Trees may have seen a bootstrap without some rare class: align
        # each tree's class axis onto the forest's.
        agg = np.zeros((len(X), len(self._classes)))
        pos = {c: i for i, c in enumerate(self._classes)}
        for tree in self._trees:
            proba = tree.predict_proba(X)
            cols = [pos[c] for c in tree._classes]
            agg[:, cols] += proba
        return agg / len(self._trees)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return self._classes[np.argmax(self.predict_proba(X), axis=1)]
