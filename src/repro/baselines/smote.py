"""SMOTE-family oversamplers (imbalanced-learn substitutes).

* ``smote`` — classic SMOTE (Chawla et al. 2002): every non-majority
  class is oversampled to the majority count by interpolating between a
  class member and one of its k=5 within-class nearest neighbours.
* ``borderline_smote`` — Borderline-SMOTE1 (Han et al. 2005): only
  DANGER members (more than half but not all of the k whole-set
  neighbours heterogeneous) seed synthesis.
* ``smotenc`` — SMOTE for mixed numeric/categorical columns: categorical
  distance contribution is the median std of the continuous features;
  synthetic categorical values take the neighbourhood mode.
"""
from __future__ import annotations

import numpy as np

from ..core.granular_ball import pairwise_sq_dists

__all__ = ["smote", "borderline_smote", "smotenc"]

_K = 5


def _within_class_nn(Xc: np.ndarray, k: int) -> np.ndarray:
    """(n_c, k) neighbour indices within one class (self excluded)."""
    d2 = pairwise_sq_dists(Xc, Xc)
    np.fill_diagonal(d2, np.inf)
    k = min(k, len(Xc) - 1)
    return np.argsort(d2, axis=1, kind="stable")[:, :k]


def _interpolate(Xc, seeds, nn, n_new, rng):
    """SMOTE interpolation: seed rows, random neighbour, random fraction."""
    pick = rng.integers(0, len(seeds), n_new)
    base = seeds[pick]
    nbr = nn[base][np.arange(n_new), rng.integers(0, nn.shape[1], n_new)]
    u = rng.random((n_new, 1))
    return Xc[base] + u * (Xc[nbr] - Xc[base])


def smote(
    X: np.ndarray, y: np.ndarray, k: int = _K, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Oversample every minority class up to the majority class count."""
    X = np.asarray(X, dtype=np.float64)
    y = np.asarray(y)
    rng = np.random.default_rng(seed)
    classes, counts = np.unique(y, return_counts=True)
    n_max = counts.max()
    outX, outy = [X], [y]
    for c, n_c in zip(classes, counts):
        if n_c >= n_max or n_c < 2:
            continue
        Xc = X[y == c]
        nn = _within_class_nn(Xc, k)
        synth = _interpolate(Xc, np.arange(len(Xc)), nn, int(n_max - n_c), rng)
        outX.append(synth)
        outy.append(np.full(len(synth), c, dtype=y.dtype))
    return np.vstack(outX), np.concatenate(outy)


def borderline_smote(
    X: np.ndarray, y: np.ndarray, k: int = _K, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Borderline-SMOTE1: synthesise only from DANGER minority members."""
    X = np.asarray(X, dtype=np.float64)
    y = np.asarray(y)
    rng = np.random.default_rng(seed)
    classes, counts = np.unique(y, return_counts=True)
    n_max = counts.max()
    d2_all = pairwise_sq_dists(X, X)
    np.fill_diagonal(d2_all, np.inf)
    outX, outy = [X], [y]
    for c, n_c in zip(classes, counts):
        if n_c >= n_max or n_c < 2:
            continue
        rows = np.flatnonzero(y == c)
        kk = min(k, len(X) - 1)
        nn_all = np.argsort(d2_all[rows], axis=1, kind="stable")[:, :kk]
        m_prime = (y[nn_all] != c).sum(axis=1)
        danger = np.flatnonzero((m_prime >= kk / 2) & (m_prime < kk))
        Xc = X[rows]
        nn_within = _within_class_nn(Xc, k)
        seeds = danger if len(danger) else np.arange(len(Xc))  # fallback: SMOTE
        synth = _interpolate(Xc, seeds, nn_within, int(n_max - n_c), rng)
        outX.append(synth)
        outy.append(np.full(len(synth), c, dtype=y.dtype))
    return np.vstack(outX), np.concatenate(outy)


def smotenc(
    X: np.ndarray,
    y: np.ndarray,
    cat_dims: tuple[int, ...],
    k: int = _K,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """SMOTE with categorical columns handled by neighbourhood mode."""
    X = np.asarray(X, dtype=np.float64)
    y = np.asarray(y)
    if not cat_dims:
        return smote(X, y, k=k, seed=seed)
    rng = np.random.default_rng(seed)
    cont = np.array([j for j in range(X.shape[1]) if j not in cat_dims])
    cat = np.array(sorted(cat_dims))
    # imblearn's trick: a differing category contributes (median std)^2.
    med_std = float(np.median(X[:, cont].std(axis=0))) if len(cont) else 1.0
    classes, counts = np.unique(y, return_counts=True)
    n_max = counts.max()
    outX, outy = [X], [y]
    for c, n_c in zip(classes, counts):
        if n_c >= n_max or n_c < 2:
            continue
        Xc = X[y == c]
        d2 = (
            pairwise_sq_dists(Xc[:, cont], Xc[:, cont])
            if len(cont)
            else np.zeros((len(Xc), len(Xc)))
        )
        for j in cat:
            d2 = d2 + (Xc[:, j][:, None] != Xc[:, j][None, :]) * med_std**2
        np.fill_diagonal(d2, np.inf)
        kk = min(k, len(Xc) - 1)
        nn = np.argsort(d2, axis=1, kind="stable")[:, :kk]
        n_new = int(n_max - n_c)
        pick = rng.integers(0, len(Xc), n_new)
        nbr = nn[pick][np.arange(n_new), rng.integers(0, kk, n_new)]
        u = rng.random((n_new, 1))
        synth = Xc[pick] + u * (Xc[nbr] - Xc[pick])
        # categorical columns: mode over the seed's neighbourhood (+ seed)
        for j in cat:
            hood = np.column_stack([Xc[pick, j], Xc[nn[pick], j].reshape(n_new, -1).T.T])
            modes = np.empty(n_new)
            for i in range(n_new):
                vals, cnts = np.unique(hood[i], return_counts=True)
                modes[i] = vals[np.argmax(cnts)]
            synth[:, j] = modes
        outX.append(synth)
        outy.append(np.full(n_new, c, dtype=y.dtype))
    return np.vstack(outX), np.concatenate(outy)
