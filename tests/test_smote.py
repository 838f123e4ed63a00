"""Tests for the SMOTE-family oversamplers."""
import numpy as np
import pytest

from repro.baselines.smote import borderline_smote, smote, smotenc
from repro.datasets.generators import make_blobs_classification


def _imb(n=400, p=3, ir=4.0, seed=0, q=2):
    return make_blobs_classification(
        n_samples=n, n_features=p, n_classes=q, imbalance_ratio=ir,
        class_sep=3.0, seed=seed,
    )


class TestSmote:
    @pytest.mark.parametrize("ir", [2.0, 4.0, 8.0])
    def test_balances_classes(self, ir):
        X, y = _imb(ir=ir)
        Xs, ys = smote(X, y, seed=0)
        _, counts = np.unique(ys, return_counts=True)
        assert counts.max() == counts.min()

    def test_originals_retained(self):
        X, y = _imb()
        Xs, ys = smote(X, y, seed=0)
        assert np.array_equal(Xs[: len(X)], X)
        assert np.array_equal(ys[: len(y)], y)

    def test_synthetics_in_minority_bbox(self):
        """Interpolants must lie in the minority class's bounding box."""
        X, y = _imb(seed=1)
        classes, counts = np.unique(y, return_counts=True)
        minority = classes[np.argmin(counts)]
        Xs, ys = smote(X, y, seed=1)
        synth = Xs[len(X):]
        Xmin = X[y == minority]
        assert (synth >= Xmin.min(0) - 1e-9).all()
        assert (synth <= Xmin.max(0) + 1e-9).all()

    def test_multiclass_balances_all(self):
        X, y = _imb(q=3, ir=5.0, seed=2)
        _, counts = np.unique(smote(X, y, seed=2)[1], return_counts=True)
        assert counts.max() == counts.min()

    def test_deterministic(self):
        X, y = _imb(seed=3)
        a = smote(X, y, seed=9)[0]
        b = smote(X, y, seed=9)[0]
        assert np.array_equal(a, b)

    def test_balanced_input_unchanged(self):
        X, y = _imb(ir=1.0, seed=4)
        _, counts = np.unique(y, return_counts=True)
        if counts.max() == counts.min():
            Xs, _ = smote(X, y, seed=4)
            assert len(Xs) == len(X)


class TestBorderlineSmote:
    def test_balances_classes(self):
        X, y = _imb(ir=4.0, seed=5)
        _, counts = np.unique(borderline_smote(X, y, seed=5)[1], return_counts=True)
        assert counts.max() == counts.min()

    def test_seeds_are_danger_members(self):
        """Synthetics concentrate near the boundary, not deep inside."""
        rng = np.random.default_rng(0)
        X0 = rng.normal(0, 1, (200, 2))
        X1 = rng.normal(3, 1, (50, 2))
        X = np.vstack([X0, X1]); y = np.array([0] * 200 + [1] * 50)
        Xs, ys = borderline_smote(X, y, seed=0)
        synth = Xs[len(X):]
        # danger zone is toward class 0: synthetic mean x should be pulled
        # below the minority mean
        assert synth[:, 0].mean() < X1[:, 0].mean() + 0.5

    def test_originals_retained(self):
        X, y = _imb(seed=6)
        Xs, _ = borderline_smote(X, y, seed=6)
        assert np.array_equal(Xs[: len(X)], X)


class TestSmoteNC:
    def test_reduces_to_smote_without_categories(self):
        X, y = _imb(seed=7)
        a = smotenc(X, y, cat_dims=(), seed=7)[0]
        b = smote(X, y, seed=7)[0]
        assert np.array_equal(a, b)

    def test_categorical_values_from_existing_alphabet(self):
        X, y = _imb(seed=8)
        X[:, 1] = np.round(X[:, 1]) % 3  # fake categorical column
        Xs, ys = smotenc(X, y, cat_dims=(1,), seed=8)
        synth = Xs[len(X):]
        assert set(np.unique(synth[:, 1])) <= set(np.unique(X[:, 1]))

    def test_balances_classes(self):
        X, y = _imb(ir=4.0, seed=9)
        X[:, 0] = np.round(X[:, 0]) % 4
        _, counts = np.unique(smotenc(X, y, cat_dims=(0,), seed=9)[1], return_counts=True)
        assert counts.max() == counts.min()
