"""Evaluation metrics used in the paper: Accuracy and G-mean."""
from __future__ import annotations

import numpy as np

__all__ = ["accuracy", "g_mean"]


def accuracy(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Fraction of correct predictions."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    if len(y_true) == 0:
        raise ValueError("empty evaluation set")
    return float(np.mean(y_true == y_pred))


def g_mean(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Geometric mean of per-class recall over classes present in y_true.

    The multi-class generalisation the imbalanced-learning literature uses;
    a class with zero recall drives the G-mean to 0, penalising classifiers
    that ignore the minority.
    """
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    classes = np.unique(y_true)
    recalls = np.array(
        [np.mean(y_pred[y_true == c] == c) for c in classes], dtype=float
    )
    return float(np.exp(np.mean(np.log(np.maximum(recalls, 1e-300))))) if recalls.all() else 0.0
