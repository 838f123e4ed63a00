"""Tests for the S1–S13 dataset registry (Table I analogs)."""
import numpy as np
import pytest

from repro.datasets.registry import REGISTRY, dataset_names, load_dataset

ALL = dataset_names()


def test_thirteen_datasets_in_order():
    assert ALL == [f"S{i}" for i in range(1, 14)]


@pytest.mark.parametrize("name", ALL)
def test_shapes_match_spec(name):
    X, y, spec = load_dataset(name)
    assert X.shape == (spec.n_samples, spec.n_features)
    assert len(y) == spec.n_samples


@pytest.mark.parametrize("name", ALL)
def test_class_count_matches_paper(name):
    _, y, spec = load_dataset(name)
    assert len(np.unique(y)) == spec.paper_classes


@pytest.mark.parametrize("name", ALL)
def test_features_scaled_unit_interval(name):
    X, _, _ = load_dataset(name)
    assert X.min() >= 0.0 and X.max() <= 1.0 + 1e-12


@pytest.mark.parametrize("name", ALL)
def test_scaling_caps(name):
    spec = REGISTRY[name]
    assert spec.n_samples <= 2000 or spec.paper_samples <= 2000
    assert spec.n_features <= 32


@pytest.mark.parametrize("name", ALL)
def test_deterministic(name):
    X1, y1, _ = load_dataset(name)
    X2, y2, _ = load_dataset(name)
    assert np.array_equal(X1, X2) and np.array_equal(y1, y2)


@pytest.mark.parametrize("name", ["S1", "S3"])
def test_categorical_columns_are_small_alphabet(name):
    X, _, spec = load_dataset(name)
    assert spec.cat_dims
    for d in spec.cat_dims:
        # scaled to [0,1] but still at most 5 distinct levels
        assert len(np.unique(X[:, d])) <= 5


@pytest.mark.parametrize("name", ["S3", "S6", "S7", "S9", "S11"])
def test_imbalanced_datasets_are_skewed(name):
    _, y, spec = load_dataset(name)
    _, counts = np.unique(y, return_counts=True)
    assert counts.max() / counts.min() > 3.0  # skew survives the scaling


@pytest.mark.parametrize("name", ["S1", "S2", "S4", "S10"])
def test_near_balanced_datasets(name):
    _, y, _ = load_dataset(name)
    _, counts = np.unique(y, return_counts=True)
    assert counts.max() / counts.min() < 3.0


@pytest.mark.parametrize("name", ALL)
def test_every_class_survives_five_folds(name):
    # min class count must allow stratified 5-fold with non-empty training
    _, y, _ = load_dataset(name)
    _, counts = np.unique(y, return_counts=True)
    assert counts.min() >= 5


@pytest.mark.parametrize("ratio", [0.05, 0.2, 0.4])
def test_noise_injection_through_loader(ratio):
    _, y0, _ = load_dataset("S2")
    _, y1, spec = load_dataset("S2", noise_ratio=ratio, noise_seed=3)
    assert (y0 != y1).sum() == int(round(ratio * spec.n_samples))


def test_noise_seed_changes_flips():
    _, y1, _ = load_dataset("S2", noise_ratio=0.2, noise_seed=1)
    _, y2, _ = load_dataset("S2", noise_ratio=0.2, noise_seed=2)
    assert not np.array_equal(y1, y2)


def test_paper_metadata_recorded():
    s11 = REGISTRY["S11"]
    assert s11.source_name == "shuttle"
    assert s11.paper_samples == 58000
    assert s11.paper_ir == pytest.approx(4558.6)
