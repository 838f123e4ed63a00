"""Tests for stratified k-fold CV."""
import numpy as np
import pytest

from repro.stats.crossval import stratified_kfold


@pytest.mark.parametrize("k", [2, 5, 10])
def test_folds_partition_dataset(k):
    y = np.random.default_rng(0).integers(0, 3, 200)
    folds = stratified_kfold(y, n_splits=k, seed=0)
    assert len(folds) == k
    all_test = np.concatenate([te for _, te in folds])
    assert sorted(all_test.tolist()) == list(range(200))


def test_train_test_disjoint_and_complete():
    y = np.random.default_rng(1).integers(0, 2, 100)
    for tr, te in stratified_kfold(y, 5, seed=1):
        assert not set(tr) & set(te)
        assert len(tr) + len(te) == 100


def test_stratification_preserved():
    y = np.array([0] * 80 + [1] * 20)
    for tr, te in stratified_kfold(y, 5, seed=2):
        frac = (y[te] == 1).mean()
        assert 0.1 <= frac <= 0.3  # ~0.2 per fold


def test_deterministic():
    y = np.random.default_rng(3).integers(0, 4, 150)
    a = stratified_kfold(y, 5, seed=7)
    b = stratified_kfold(y, 5, seed=7)
    for (tra, tea), (trb, teb) in zip(a, b):
        assert np.array_equal(tra, trb) and np.array_equal(tea, teb)


def test_seed_changes_assignment():
    y = np.random.default_rng(4).integers(0, 2, 100)
    a = stratified_kfold(y, 5, seed=1)[0][1]
    b = stratified_kfold(y, 5, seed=2)[0][1]
    assert not np.array_equal(a, b)


def test_tiny_class_spread():
    y = np.array([0] * 95 + [1] * 5)
    folds = stratified_kfold(y, 5, seed=0)
    ones_per_fold = [int((y[te] == 1).sum()) for _, te in folds]
    assert sum(ones_per_fold) == 5
    assert max(ones_per_fold) <= 2
