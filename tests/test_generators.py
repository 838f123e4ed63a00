"""Unit tests for the synthetic classification dataset generator."""
import numpy as np
import pytest

from repro.datasets.generators import (
    class_weights_for_ir,
    inject_class_noise,
    make_blobs_classification,
)


class TestClassWeights:
    @pytest.mark.parametrize("q", [1, 2, 3, 5, 7, 10])
    def test_sum_to_one(self, q):
        assert np.isclose(class_weights_for_ir(q, 3.0).sum(), 1.0)

    @pytest.mark.parametrize("ir", [1.0, 1.5, 2.0, 10.0, 100.0, 4558.6])
    def test_max_min_ratio_matches_ir(self, ir):
        w = class_weights_for_ir(4, ir)
        assert np.isclose(w.max() / w.min(), ir)

    def test_balanced_when_ir_one(self):
        w = class_weights_for_ir(5, 1.0)
        assert np.allclose(w, 0.2)

    def test_monotone_decreasing(self):
        w = class_weights_for_ir(6, 8.0)
        assert (np.diff(w) <= 1e-12).all()

    def test_rejects_bad_args(self):
        with pytest.raises(ValueError):
            class_weights_for_ir(0, 2.0)
        with pytest.raises(ValueError):
            class_weights_for_ir(3, 0.5)


class TestMakeBlobs:
    @pytest.mark.parametrize("q", [2, 3, 7])
    @pytest.mark.parametrize("p", [2, 8, 32])
    def test_shapes_and_classes(self, q, p):
        X, y = make_blobs_classification(
            n_samples=300, n_features=p, n_classes=q, seed=1
        )
        assert X.shape == (len(y), p)
        assert set(np.unique(y)) == set(range(q))

    def test_sample_count_exact(self):
        X, y = make_blobs_classification(n_samples=500, n_features=4, n_classes=3, seed=2)
        assert len(y) == 500

    @pytest.mark.parametrize("ir", [1.0, 2.0, 10.0])
    def test_imbalance_direction(self, ir):
        X, y = make_blobs_classification(
            n_samples=1000, n_features=4, n_classes=2, imbalance_ratio=ir, seed=3
        )
        _, counts = np.unique(y, return_counts=True)
        if ir == 1.0:
            assert abs(counts[0] - counts[1]) <= 1
        else:
            assert counts.max() / counts.min() > ir / 2

    def test_min_class_count_respected(self):
        X, y = make_blobs_classification(
            n_samples=1000, n_features=4, n_classes=5,
            imbalance_ratio=1000.0, min_class_count=8, seed=4,
        )
        _, counts = np.unique(y, return_counts=True)
        assert counts.min() >= 8

    def test_deterministic_in_seed(self):
        a = make_blobs_classification(n_samples=200, n_features=3, n_classes=2, seed=7)
        b = make_blobs_classification(n_samples=200, n_features=3, n_classes=2, seed=7)
        assert np.array_equal(a[0], b[0]) and np.array_equal(a[1], b[1])

    def test_different_seed_different_data(self):
        a = make_blobs_classification(n_samples=200, n_features=3, n_classes=2, seed=7)
        b = make_blobs_classification(n_samples=200, n_features=3, n_classes=2, seed=8)
        assert not np.array_equal(a[0], b[0])

    def test_noise_dims_are_uninformative(self):
        # trailing noise dims should have near-zero class-mean separation
        X, y = make_blobs_classification(
            n_samples=2000, n_features=6, n_classes=2, noise_dims=2,
            class_sep=5.0, seed=9,
        )
        m0 = X[y == 0].mean(axis=0)
        m1 = X[y == 1].mean(axis=0)
        gap = np.abs(m0 - m1)
        assert gap[:4].max() > 5 * gap[4:].max()

    def test_higher_sep_is_more_separable(self):
        def overlap_proxy(sep):
            X, y = make_blobs_classification(
                n_samples=600, n_features=2, n_classes=2, class_sep=sep,
                clusters_per_class=1, seed=11,
            )
            m0, m1 = X[y == 0].mean(0), X[y == 1].mean(0)
            return np.linalg.norm(m0 - m1)

        assert overlap_proxy(6.0) > overlap_proxy(1.0)

    def test_rejects_all_noise_dims(self):
        with pytest.raises(ValueError):
            make_blobs_classification(
                n_samples=100, n_features=3, n_classes=2, noise_dims=3
            )

    def test_rejects_too_small_n(self):
        with pytest.raises(ValueError):
            make_blobs_classification(
                n_samples=10, n_features=2, n_classes=5, min_class_count=8
            )


class TestInjectNoise:
    @pytest.mark.parametrize("ratio", [0.05, 0.1, 0.2, 0.3, 0.4])
    def test_flip_fraction(self, ratio):
        y = np.zeros(1000, dtype=np.int64)
        y[500:] = 1
        noisy = inject_class_noise(y, ratio, 2, seed=1)
        assert (noisy != y).sum() == int(round(ratio * 1000))

    def test_zero_ratio_is_copy(self):
        y = np.array([0, 1, 2, 1, 0])
        out = inject_class_noise(y, 0.0, 3)
        assert np.array_equal(out, y)
        assert out is not y

    def test_flipped_labels_differ(self):
        y = np.random.default_rng(0).integers(0, 4, 500)
        noisy = inject_class_noise(y, 0.3, 4, seed=2)
        flipped = noisy != y
        # every flip landed on a *different* class and a valid one
        assert (noisy[flipped] != y[flipped]).all()
        assert noisy.min() >= 0 and noisy.max() < 4

    def test_deterministic(self):
        y = np.random.default_rng(1).integers(0, 3, 300)
        a = inject_class_noise(y, 0.2, 3, seed=5)
        b = inject_class_noise(y, 0.2, 3, seed=5)
        assert np.array_equal(a, b)

    def test_rejects_bad_ratio(self):
        y = np.zeros(10, dtype=int)
        with pytest.raises(ValueError):
            inject_class_noise(y, 1.0, 2)
        with pytest.raises(ValueError):
            inject_class_noise(y, -0.1, 2)
