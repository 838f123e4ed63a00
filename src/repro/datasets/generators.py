"""Synthetic classification dataset generator (make_classification analog).

The paper evaluates on 13 public tabular datasets; with no network access
we synthesise analogs as per-class Gaussian mixtures with controllable
sample count, dimensionality, class count, imbalance ratio, cluster
multiplicity, and class separation. The sampling methods under test act
only on the *geometry* of a labelled point cloud, so matched N/p/q/IR
mixtures exercise identical code paths (see DESIGN.md).
"""
from __future__ import annotations

import numpy as np

__all__ = ["class_weights_for_ir", "make_blobs_classification", "inject_class_noise"]


def class_weights_for_ir(q: int, ir: float) -> np.ndarray:
    """Class prior vector of length ``q`` whose max/min ratio is ``ir``.

    Weights are geometrically interpolated between the majority and the
    minority so intermediate classes fall in between, mirroring the
    long-tailed class distributions of the paper's multi-class datasets.
    """
    if q < 1:
        raise ValueError("q must be >= 1")
    if ir < 1:
        raise ValueError("imbalance ratio must be >= 1")
    if q == 1:
        return np.array([1.0])
    w = np.geomspace(ir, 1.0, q)
    return w / w.sum()


def make_blobs_classification(
    *,
    n_samples: int,
    n_features: int,
    n_classes: int,
    imbalance_ratio: float = 1.0,
    clusters_per_class: int = 2,
    class_sep: float = 1.6,
    noise_dims: int = 0,
    min_class_count: int = 8,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Generate ``(X, y)``: per-class Gaussian mixture with overlap.

    Each class gets ``clusters_per_class`` unit-covariance Gaussian
    clusters whose means are drawn on a sphere of radius ``class_sep`` *
    sqrt(informative dims); overlapping tails create genuine borderline
    structure for the samplers to find. ``noise_dims`` trailing features
    are pure N(0,1) noise (uninformative), modelling datasets like
    coil2000 where most features carry little signal. Class sizes follow
    ``class_weights_for_ir`` with every class clipped to at least
    ``min_class_count`` samples so stratified 5-fold CV stays viable even
    for an S11-like IR (documented substitution in DESIGN.md).
    """
    if n_features <= noise_dims:
        raise ValueError("need at least one informative dimension")
    rng = np.random.default_rng(seed)
    inf = n_features - noise_dims
    weights = class_weights_for_ir(n_classes, imbalance_ratio)
    counts = np.maximum(np.round(weights * n_samples).astype(int), min_class_count)
    # Re-fit to n_samples by adjusting the majority class only.
    counts[np.argmax(counts)] -= counts.sum() - n_samples
    if counts.min() < min_class_count:
        raise ValueError("n_samples too small for min_class_count constraint")

    X_parts, y_parts = [], []
    scale = class_sep * np.sqrt(inf) / 2.0
    for cls in range(n_classes):
        n_c = counts[cls]
        centers = rng.normal(0.0, 1.0, size=(clusters_per_class, inf))
        centers /= np.maximum(np.linalg.norm(centers, axis=1, keepdims=True), 1e-12)
        centers *= scale * rng.uniform(0.6, 1.4, size=(clusters_per_class, 1))
        assign = rng.integers(0, clusters_per_class, n_c)
        pts = centers[assign] + rng.normal(0.0, 1.0, size=(n_c, inf))
        if noise_dims:
            pts = np.hstack([pts, rng.normal(0.0, 1.0, size=(n_c, noise_dims))])
        X_parts.append(pts)
        y_parts.append(np.full(n_c, cls, dtype=np.int64))
    X = np.vstack(X_parts)
    y = np.concatenate(y_parts)
    perm = rng.permutation(len(y))
    return X[perm].astype(np.float64), y[perm]


def inject_class_noise(
    y: np.ndarray, noise_ratio: float, n_classes: int, seed: int = 0
) -> np.ndarray:
    """Flip ``noise_ratio`` of the labels to a different uniformly random class.

    Matches the paper's protocol: "randomly selecting samples and altering
    their labels". Returns a new label array; the input is untouched.
    """
    if not 0.0 <= noise_ratio < 1.0:
        raise ValueError("noise_ratio must be in [0, 1)")
    if noise_ratio == 0.0:
        return y.copy()
    rng = np.random.default_rng(seed)
    y_noisy = y.copy()
    n_flip = int(round(noise_ratio * len(y)))
    idx = rng.choice(len(y), size=n_flip, replace=False)
    # Draw a strictly different label: shift by 1..q-1 modulo q.
    shift = rng.integers(1, n_classes, size=n_flip)
    y_noisy[idx] = (y_noisy[idx] + shift) % n_classes
    return y_noisy
