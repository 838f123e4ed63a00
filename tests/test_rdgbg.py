"""Tests for RD-GBG (Algorithm 1): purity, non-overlap, completeness."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.rdgbg import rd_gbg
from repro.datasets.generators import make_blobs_classification
from repro.datasets.registry import load_dataset


def _blobs(n=300, p=3, q=3, sep=3.0, seed=0):
    return make_blobs_classification(
        n_samples=n, n_features=p, n_classes=q, class_sep=sep, seed=seed
    )


class TestInvariants:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_balls_are_pure(self, seed):
        X, y = _blobs(seed=seed)
        gbset = rd_gbg(X, y, rho=5, seed=seed)
        for b in gbset.balls:
            assert (y[b.idx] == b.label).all()

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_no_overlap(self, seed):
        X, y = _blobs(seed=seed)
        gbset = rd_gbg(X, y, rho=5, seed=seed)
        C, R = gbset.centers(), gbset.radii()
        d = np.linalg.norm(C[:, None, :] - C[None, :, :], axis=-1)
        lim = R[:, None] + R[None, :]
        np.fill_diagonal(d, np.inf)
        assert (d >= lim - 1e-9).all()

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_completeness_partition(self, seed):
        """Every row is in exactly one ball or flagged as noise."""
        X, y = _blobs(seed=seed)
        gbset = rd_gbg(X, y, rho=5, seed=seed)
        counts = np.zeros(len(X), dtype=int)
        for b in gbset.balls:
            counts[b.idx] += 1
        counts[gbset.noise_idx] += 1
        assert (counts == 1).all()

    def test_members_within_radius(self):
        X, y = _blobs(seed=3)
        gbset = rd_gbg(X, y, rho=5, seed=3)
        for b in gbset.balls:
            d = np.linalg.norm(X[b.idx] - b.center, axis=1)
            assert (d <= b.radius + 1e-9).all()

    def test_center_is_a_real_sample(self):
        X, y = _blobs(seed=4)
        gbset = rd_gbg(X, y, rho=5, seed=4)
        for b in gbset.balls:
            assert np.allclose(X[b.idx[0]], b.center)

    def test_deterministic_in_seed(self):
        X, y = _blobs(seed=5)
        a = rd_gbg(X, y, rho=5, seed=9)
        b = rd_gbg(X, y, rho=5, seed=9)
        assert len(a) == len(b)
        for ba, bb in zip(a.balls, b.balls):
            assert np.array_equal(ba.idx, bb.idx)
            assert ba.radius == bb.radius

    def test_orphan_balls_have_zero_radius_and_one_sample(self):
        X, y = _blobs(n=100, sep=0.5, seed=6)  # heavy overlap → orphans
        gbset = rd_gbg(X, y, rho=5, seed=6)
        orphans = [b for b in gbset.balls if b.radius == 0.0]
        assert orphans, "low-separation data should produce orphan balls"
        for b in orphans:
            assert b.n_samples == 1


class TestNoiseDetection:
    def test_isolated_flipped_label_removed_as_noise(self):
        """A single flipped label deep inside the other class is eliminated."""
        rng = np.random.default_rng(0)
        X0 = rng.normal(0, 0.3, (60, 2))
        X1 = rng.normal(5, 0.3, (60, 2))
        X = np.vstack([X0, X1])
        y = np.array([0] * 60 + [1] * 60)
        y[0] = 1  # class noise inside cluster 0
        found = False
        for seed in range(10):
            gbset = rd_gbg(X, y, rho=5, seed=seed)
            if 0 in gbset.noise_idx:
                found = True
                break
        assert found, "flipped sample should be detected as noise for some seed"

    @pytest.mark.parametrize("noise_ratio", [0.1, 0.3])
    def test_more_noise_more_eliminations(self, noise_ratio):
        X, y, _ = load_dataset("S5", noise_ratio=noise_ratio, noise_seed=1)
        gbset = rd_gbg(X, y, rho=5, seed=0)
        clean = rd_gbg(*load_dataset("S5")[:2], rho=5, seed=0)
        assert len(gbset.noise_idx) > len(clean.noise_idx)

    def test_clean_well_separated_data_keeps_everything(self):
        X, y = _blobs(n=200, sep=8.0, seed=7)
        gbset = rd_gbg(X, y, rho=5, seed=7)
        assert len(gbset.noise_idx) <= 2  # essentially nothing flagged


class TestEdgesAndValidation:
    def test_empty_input(self):
        gbset = rd_gbg(np.empty((0, 2)), np.empty(0, dtype=int))
        assert len(gbset) == 0

    def test_single_class(self):
        X = np.random.default_rng(0).normal(0, 1, (50, 2))
        y = np.zeros(50, dtype=int)
        gbset = rd_gbg(X, y, rho=5, seed=0)
        assert gbset.covered_idx().tolist() == list(range(50))
        # one diffusion ball should swallow (nearly) everything
        assert len(gbset) < 50

    def test_two_samples(self):
        X = np.array([[0.0, 0.0], [1.0, 1.0]])
        gbset = rd_gbg(X, np.array([0, 1]), rho=5, seed=0)
        assert gbset.covered_idx().tolist() == [0, 1]

    def test_rho_validation(self):
        X, y = _blobs(n=50)
        with pytest.raises(ValueError):
            rd_gbg(X, y, rho=1)

    @pytest.mark.parametrize("rho", [3, 5, 9, 15])
    def test_any_rho_keeps_invariants(self, rho):
        X, y = _blobs(n=200, seed=8)
        gbset = rd_gbg(X, y, rho=rho, seed=8)
        for b in gbset.balls:
            assert (y[b.idx] == b.label).all()
        counts = np.zeros(len(X), dtype=int)
        for b in gbset.balls:
            counts[b.idx] += 1
        counts[gbset.noise_idx] += 1
        assert (counts == 1).all()


@settings(max_examples=25, deadline=None)
@given(
    n=st.integers(min_value=5, max_value=80),
    p=st.integers(min_value=1, max_value=4),
    q=st.integers(min_value=1, max_value=3),
    seed=st.integers(min_value=0, max_value=10_000),
)
def test_property_invariants_random_data(n, p, q, seed):
    """Purity + partition + non-overlap on arbitrary random datasets."""
    rng = np.random.default_rng(seed)
    X = rng.random((n, p))
    y = rng.integers(0, q, n)
    gbset = rd_gbg(X, y, rho=5, seed=seed)
    counts = np.zeros(n, dtype=int)
    for b in gbset.balls:
        assert (y[b.idx] == b.label).all()
        counts[b.idx] += 1
    counts[gbset.noise_idx] += 1
    assert (counts == 1).all()
    C, R = gbset.centers(), gbset.radii()
    d = np.linalg.norm(C[:, None, :] - C[None, :, :], axis=-1)
    np.fill_diagonal(d, np.inf)
    assert (d >= (R[:, None] + R[None, :]) - 1e-9).all()
