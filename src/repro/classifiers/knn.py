"""k-nearest-neighbour classifier (vectorised, Euclidean, majority vote).

Mirrors sklearn's KNeighborsClassifier defaults (k=5, uniform weights).
Ties are broken toward the class of the nearest neighbour among the tied
classes, matching the deterministic behaviour sklearn gets from its
argmax over bincounts ordered by class id — we document the rule rather
than matching sklearn bit-for-bit.
"""
from __future__ import annotations

import numpy as np

__all__ = ["KNNClassifier"]


class KNNClassifier:
    """Brute-force kNN. Memory-bounded by chunking the test distance matrix."""

    def __init__(self, k: int = 5):
        if k < 1:
            raise ValueError("k must be >= 1")
        self.k = k
        self._X: np.ndarray | None = None
        self._y: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "KNNClassifier":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y)
        if len(X) == 0:
            raise ValueError("empty training set")
        self._X, self._y = X, y
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self._X is None:
            raise RuntimeError("fit before predict")
        X = np.asarray(X, dtype=np.float64)
        k = min(self.k, len(self._X))
        out = np.empty(len(X), dtype=self._y.dtype)
        for lo in range(0, len(X), 512):
            chunk = X[lo : lo + 512]
            d2 = ((chunk[:, None, :] - self._X[None, :, :]) ** 2).sum(-1)
            nn = np.argpartition(d2, k - 1, axis=1)[:, :k]
            # Order the k neighbours by distance so the tie-break below is
            # "nearest first".
            rows = np.arange(len(chunk))[:, None]
            order = np.argsort(d2[rows, nn], axis=1, kind="stable")
            nn = nn[rows, order]
            labels = self._y[nn]
            for i in range(len(chunk)):
                vals, counts = np.unique(labels[i], return_counts=True)
                best = counts.max()
                tied = set(vals[counts == best].tolist())
                # nearest neighbour whose label is among the tied classes
                out[lo + i] = next(l for l in labels[i] if l in tied)
        return out
