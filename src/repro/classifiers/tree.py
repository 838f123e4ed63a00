"""CART decision tree (gini impurity, exact threshold search).

Substitute for sklearn's DecisionTreeClassifier (see DESIGN.md): same
algorithm — recursive binary splits minimising weighted gini, grown to
purity by default — implemented with vectorised prefix-sum split scans so
a 2000-sample tree fits the experiment grid's time budget.
"""
from __future__ import annotations

import numpy as np

__all__ = ["DecisionTreeClassifier"]


class _Node:
    __slots__ = ("feature", "threshold", "left", "right", "proba")

    def __init__(self):
        self.feature = -1
        self.threshold = 0.0
        self.left = None
        self.right = None
        self.proba = None  # class distribution at leaf


def _best_split_gini(
    X: np.ndarray,
    Y: np.ndarray,  # one-hot (n, q) float64
    feat_ids: np.ndarray,
) -> tuple[int, float, float]:
    """Return (feature, threshold, gain). gain < 0 means no valid split.

    For each feature: sort values, prefix-sum one-hot labels, and score
    every boundary between distinct adjacent values with the gini
    decrease. All candidate positions for one feature are scored in one
    vectorised pass.
    """
    n, q = Y.shape
    total = Y.sum(axis=0)
    gini_parent = 1.0 - ((total / n) ** 2).sum()
    best = (-1, 0.0, -1.0)
    for j in feat_ids:
        order = np.argsort(X[:, j], kind="stable")
        xs = X[order, j]
        ys = Y[order]
        # split after position i (1..n-1), only where value changes
        valid = np.nonzero(xs[1:] > xs[:-1])[0] + 1
        if len(valid) == 0:
            continue
        left_counts = np.cumsum(ys, axis=0)[valid - 1]  # (m, q)
        nl = valid.astype(np.float64)
        nr = n - nl
        right_counts = total[None, :] - left_counts
        gini_l = 1.0 - ((left_counts / nl[:, None]) ** 2).sum(1)
        gini_r = 1.0 - ((right_counts / nr[:, None]) ** 2).sum(1)
        weighted = (nl * gini_l + nr * gini_r) / n
        i = int(np.argmin(weighted))
        gain = gini_parent - weighted[i]
        if gain > best[2] + 1e-12:
            pos = valid[i]
            thr = 0.5 * (xs[pos - 1] + xs[pos])
            best = (int(j), float(thr), float(gain))
    return best


class DecisionTreeClassifier:
    """CART with gini; ``max_depth=None`` grows to purity like sklearn."""

    def __init__(
        self,
        max_depth: int | None = None,
        min_samples_split: int = 2,
        max_features: int | None = None,
        seed: int = 0,
    ):
        self.max_depth = max_depth if max_depth is not None else 10**9
        self.min_samples_split = min_samples_split
        self.max_features = max_features
        self.seed = seed
        self._root: _Node | None = None
        self._classes: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTreeClassifier":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y)
        if len(X) == 0:
            raise ValueError("empty training set")
        self._classes, y_enc = np.unique(y, return_inverse=True)
        q = len(self._classes)
        Y = np.zeros((len(y), q))
        Y[np.arange(len(y)), y_enc] = 1.0
        rng = np.random.default_rng(self.seed)
        self._root = self._grow(X, Y, depth=0, rng=rng)
        return self

    def _grow(self, X: np.ndarray, Y: np.ndarray, depth: int, rng) -> _Node:
        node = _Node()
        counts = Y.sum(axis=0)
        node.proba = counts / counts.sum()
        if (
            depth >= self.max_depth
            or len(X) < self.min_samples_split
            or (counts > 0).sum() == 1
        ):
            return node
        p = X.shape[1]
        if self.max_features is not None and self.max_features < p:
            feat_ids = rng.choice(p, size=self.max_features, replace=False)
        else:
            feat_ids = np.arange(p)
        j, thr, gain = _best_split_gini(X, Y, feat_ids)
        if gain <= 0:
            return node
        mask = X[:, j] <= thr
        node.feature, node.threshold = j, thr
        node.left = self._grow(X[mask], Y[mask], depth + 1, rng)
        node.right = self._grow(X[~mask], Y[~mask], depth + 1, rng)
        return node

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if self._root is None:
            raise RuntimeError("fit before predict")
        X = np.asarray(X, dtype=np.float64)
        out = np.empty((len(X), len(self._classes)))
        # Iterative routing: partition index sets down the tree.
        stack = [(self._root, np.arange(len(X)))]
        while stack:
            node, idx = stack.pop()
            if node.left is None:
                out[idx] = node.proba
                continue
            mask = X[idx, node.feature] <= node.threshold
            stack.append((node.left, idx[mask]))
            stack.append((node.right, idx[~mask]))
        return out

    def predict(self, X: np.ndarray) -> np.ndarray:
        return self._classes[np.argmax(self.predict_proba(X), axis=1)]
