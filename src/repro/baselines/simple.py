"""Simple random sampling (SRS) — the unbiased general baseline.

The paper matches SRS's sampling ratio to GBABS's on every dataset; the
harness passes that ratio in.
"""
from __future__ import annotations

import numpy as np

__all__ = ["srs"]


def srs(
    X: np.ndarray, y: np.ndarray, ratio: float, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Uniform sampling without replacement of ``ratio`` of the rows."""
    if not 0.0 < ratio <= 1.0:
        raise ValueError("ratio must be in (0, 1]")
    rng = np.random.default_rng(seed)
    n = len(X)
    m = max(1, int(round(ratio * n)))
    idx = np.sort(rng.choice(n, size=m, replace=False))
    return X[idx], y[idx]
