"""GBABS: GB-based approximate borderline sampling (Alg. 2).

Given the ball set from RD-GBG, ball *centers* stand in for ball
positions. Along every feature dimension the centers are sorted; an
adjacent pair with different labels marks both balls as **borderline**
(heterogeneous-nearest-neighbour idea, §IV-C). From each such pair the
two facing extreme samples are taken: the arg-max of that feature in the
lower ball and the arg-min in the upper ball — the samples closest to
the class boundary along that axis. The union over all dimensions (no
duplicates) is the sampled dataset.
"""
from __future__ import annotations

import numpy as np

from .granular_ball import GBSet
from .rdgbg import rd_gbg

__all__ = ["borderline_pairs", "gbabs_from_balls", "gbabs_sample"]


def borderline_pairs(
    centers: np.ndarray, labels: np.ndarray
) -> list[tuple[int, int, int]]:
    """All ``(dim, lower_ball, upper_ball)`` adjacent heterogeneous pairs.

    Adjacency is in the sorted order of center coordinates per dimension;
    ties are broken by ball index so the result is deterministic.
    """
    out: list[tuple[int, int, int]] = []
    m, p = centers.shape
    if m < 2:
        return out
    for dim in range(p):
        order = np.lexsort((np.arange(m), centers[:, dim]))
        lo, hi = order[:-1], order[1:]
        het = labels[lo] != labels[hi]
        out.extend((dim, int(a), int(b)) for a, b in zip(lo[het], hi[het]))
    return out


def gbabs_from_balls(X: np.ndarray, gbset: GBSet) -> np.ndarray:
    """Borderline sample rows (sorted, unique) for a pre-built ball set."""
    if len(gbset) == 0:
        return np.array([], dtype=np.int64)
    centers = gbset.centers()
    labels = gbset.labels()
    picked: set[int] = set()
    for dim, a, b in borderline_pairs(centers, labels):
        ia = gbset.balls[a].idx
        ib = gbset.balls[b].idx
        picked.add(int(ia[np.argmax(X[ia, dim])]))  # lower ball, facing up
        picked.add(int(ib[np.argmin(X[ib, dim])]))  # upper ball, facing down
    if not picked:
        # Degenerate single-class input: no boundary exists. Keep one
        # representative (the center) per ball so downstream training has
        # data; documented deviation for a case the paper never hits.
        picked = {int(b.idx[0]) for b in gbset.balls}
    return np.array(sorted(picked), dtype=np.int64)


def gbabs_sample(
    X: np.ndarray, y: np.ndarray, rho: int = 5, seed: int = 0
) -> tuple[np.ndarray, GBSet]:
    """Full Algorithm 2: RD-GBG then borderline extraction.

    Returns ``(sampled_row_indices, ball_set)``; the sampled dataset is
    ``X[idx], y[idx]`` and the sampling ratio ``len(idx) / len(X)``.
    """
    gbset = rd_gbg(X, y, rho=rho, seed=seed)
    return gbabs_from_balls(np.asarray(X, dtype=np.float64), gbset), gbset
