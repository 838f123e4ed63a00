"""Tests for accuracy and G-mean."""
import numpy as np
import pytest

from repro.classifiers.metrics import accuracy, g_mean


def test_accuracy_perfect():
    y = np.array([0, 1, 2])
    assert accuracy(y, y) == 1.0


def test_accuracy_fraction():
    assert accuracy(np.array([0, 0, 1, 1]), np.array([0, 1, 1, 1])) == 0.75


def test_accuracy_empty_raises():
    with pytest.raises(ValueError):
        accuracy(np.array([]), np.array([]))


def test_gmean_perfect():
    y = np.array([0, 0, 1, 1])
    assert g_mean(y, y) == 1.0


def test_gmean_zero_when_class_missed():
    y_true = np.array([0, 0, 1, 1])
    y_pred = np.array([0, 0, 0, 0])  # class 1 recall = 0
    assert g_mean(y_true, y_pred) == 0.0


def test_gmean_geometric_mean_of_recalls():
    y_true = np.array([0, 0, 0, 0, 1, 1])
    y_pred = np.array([0, 0, 1, 1, 1, 1])  # recalls: 0.5 and 1.0
    assert g_mean(y_true, y_pred) == pytest.approx(np.sqrt(0.5))


def test_gmean_multiclass():
    y_true = np.array([0, 0, 1, 1, 2, 2])
    y_pred = np.array([0, 0, 1, 0, 2, 2])  # recalls 1, .5, 1
    assert g_mean(y_true, y_pred) == pytest.approx((0.5) ** (1 / 3))


def test_gmean_ignores_classes_absent_from_truth():
    y_true = np.array([0, 0, 1, 1])
    y_pred = np.array([0, 2, 1, 1])  # predicted class 2 never in y_true
    assert g_mean(y_true, y_pred) == pytest.approx(np.sqrt(0.5))


def test_accuracy_symmetric_relabel():
    y_true = np.array([5, 5, 9])
    y_pred = np.array([5, 9, 9])
    assert accuracy(y_true, y_pred) == pytest.approx(2 / 3)
