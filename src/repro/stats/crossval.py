"""Stratified k-fold cross-validation (sklearn StratifiedKFold substitute).

The paper uses five-fold CV repeated five times; folds here are
deterministic in ``seed`` so every sampling method sees identical splits.
"""
from __future__ import annotations

import numpy as np

__all__ = ["stratified_kfold"]


def stratified_kfold(
    y: np.ndarray, n_splits: int = 5, seed: int = 0
) -> list[tuple[np.ndarray, np.ndarray]]:
    """Return ``[(train_idx, test_idx), ...]`` with per-class proportions kept.

    Classes with fewer members than ``n_splits`` contribute to only some
    folds (their test slice is empty elsewhere) — same behaviour sklearn
    warns about; the harness's min-class floor avoids hitting it.
    """
    y = np.asarray(y)
    rng = np.random.default_rng(seed)
    folds: list[list[int]] = [[] for _ in range(n_splits)]
    for cls in np.unique(y):
        idx = np.flatnonzero(y == cls)
        rng.shuffle(idx)
        for f, part in enumerate(np.array_split(idx, n_splits)):
            folds[f].extend(part.tolist())
    out = []
    all_idx = np.arange(len(y))
    for f in range(n_splits):
        test = np.array(sorted(folds[f]), dtype=np.int64)
        mask = np.ones(len(y), dtype=bool)
        mask[test] = False
        out.append((all_idx[mask], test))
    return out
