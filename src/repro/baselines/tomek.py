"""Tomek-links undersampling (Tomek 1976; imbalanced-learn substitute).

A Tomek link is a pair of mutually nearest neighbours with different
labels. Following imbalanced-learn's default, only the majority-class
member of each link is removed (minority members stay).
"""
from __future__ import annotations

import numpy as np

from ..core.granular_ball import pairwise_sq_dists

__all__ = ["tomek_links", "tomek"]


def tomek_links(X: np.ndarray, y: np.ndarray) -> list[tuple[int, int]]:
    """All Tomek links as ``(i, j)`` with ``i < j``."""
    X = np.asarray(X, dtype=np.float64)
    d2 = pairwise_sq_dists(X, X)
    np.fill_diagonal(d2, np.inf)
    nn = np.argmin(d2, axis=1)
    links = []
    for i in range(len(X)):
        j = nn[i]
        if i < j and nn[j] == i and y[i] != y[j]:
            links.append((i, int(j)))
    return links


def tomek(X: np.ndarray, y: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Remove the majority-class member of every Tomek link."""
    y = np.asarray(y)
    classes, counts = np.unique(y, return_counts=True)
    count_of = dict(zip(classes.tolist(), counts.tolist()))
    drop = set()
    for i, j in tomek_links(X, y):
        # the member of the larger class is removed; equal sizes drop both
        ci, cj = count_of[y[i].item()], count_of[y[j].item()]
        if ci >= cj:
            drop.add(i)
        if cj >= ci:
            drop.add(j)
    keep = np.array([i for i in range(len(y)) if i not in drop], dtype=np.int64)
    return np.asarray(X)[keep], y[keep]
