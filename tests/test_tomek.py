"""Tests for Tomek-links undersampling."""
import numpy as np

from repro.baselines.tomek import tomek, tomek_links
from repro.datasets.generators import make_blobs_classification


def test_crafted_link_detected():
    # two close heterogeneous points far from everything else
    X = np.array([[0.0, 0.0], [0.1, 0.0], [5.0, 5.0], [5.1, 5.0], [9.0, 0.0]])
    y = np.array([0, 1, 0, 0, 1])
    links = tomek_links(X, y)
    assert (0, 1) in links
    assert (2, 3) not in links  # homogeneous pair is not a link


def test_non_mutual_nn_is_not_a_link():
    # b's nearest is a, but a's nearest is c → no link (a,b)
    X = np.array([[0.0], [1.0], [0.2]])
    y = np.array([0, 1, 0])
    assert tomek_links(X, y) == []


def test_majority_member_removed():
    X = np.array([[0.0, 0.0], [0.1, 0.0], [5.0, 5.0], [5.2, 5.0], [5.4, 5.0]])
    y = np.array([1, 0, 0, 0, 0])  # class 0 is majority; link is (0, 1)
    Xs, ys = tomek(X, y)
    kept = {tuple(r) for r in Xs}
    assert (0.0, 0.0) in kept       # minority member stays
    assert (0.1, 0.0) not in kept   # majority member removed


def test_clean_separation_removes_nothing():
    X, y = make_blobs_classification(
        n_samples=200, n_features=2, n_classes=2, class_sep=10.0,
        clusters_per_class=1, seed=0,
    )
    Xs, ys = tomek(X, y)
    assert len(Xs) >= len(X) - 4  # essentially no links across a wide gap


def test_overlapping_classes_lose_samples():
    X, y = make_blobs_classification(
        n_samples=300, n_features=2, n_classes=2, class_sep=0.5, seed=1
    )
    Xs, _ = tomek(X, y)
    assert len(Xs) < len(X)


def test_output_is_subset():
    X, y = make_blobs_classification(
        n_samples=150, n_features=3, n_classes=2, class_sep=1.0, seed=2
    )
    Xs, ys = tomek(X, y)
    orig = {tuple(r) for r in np.round(X, 9)}
    assert all(tuple(r) in orig for r in np.round(Xs, 9))
