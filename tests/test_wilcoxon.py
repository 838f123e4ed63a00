"""Tests for the Wilcoxon signed-rank implementation (Table III substrate)."""
import numpy as np
import pytest

from repro.stats.wilcoxon import _exact_sf_counts, wilcoxon_signed_rank


def test_all_positive_n13_matches_paper_minimum_p():
    """Paper Table III: p=0.000244 == 2/2^13 — every one of 13 diffs wins."""
    x = np.arange(1.0, 14.0)
    y = x - np.linspace(0.5, 0.1, 13)  # x > y everywhere, distinct |d|
    res = wilcoxon_signed_rank(x, y)
    assert res.method == "exact"
    assert res.p_value == pytest.approx(2 / 2**13)  # 0.000244...


def test_all_positive_n12_gives_000488():
    x = np.arange(1.0, 13.0)
    y = x - np.linspace(0.6, 0.1, 12)
    res = wilcoxon_signed_rank(x, y)
    assert res.p_value == pytest.approx(2 / 2**12)  # 0.000488...


def test_statistic_is_min_of_wplus_wminus():
    x = np.array([1.0, 2.0, 3.0, 4.0])
    y = np.array([0.0, 3.0, 1.0, 2.0])  # d = 1,-1? no: 1,-1,2,2 → ties ok
    res = wilcoxon_signed_rank(x, y)
    assert res.statistic >= 0


def test_scipy_reference_exact_case():
    """Known value: scipy.stats.wilcoxon([1,2,3,4,5],[0,0,0,0,0]) → p=0.0625."""
    res = wilcoxon_signed_rank(np.array([1.0, 2, 3, 4, 5]), np.zeros(5))
    assert res.method == "exact"
    assert res.p_value == pytest.approx(2 / 2**5)  # 0.0625


def test_scipy_reference_mixed_signs():
    """scipy exact: x-y = [1,-2,3,-4,5] → W=6, two-sided p=0.8125."""
    d = np.array([1.0, -2.0, 3.0, -4.0, 5.0])
    res = wilcoxon_signed_rank(d, np.zeros(5))
    assert res.statistic == 6.0
    assert res.p_value == pytest.approx(0.8125)


def test_zero_diffs_dropped():
    x = np.array([1.0, 2.0, 3.0, 3.0])
    y = np.array([1.0, 2.0, 1.0, 1.0])
    res = wilcoxon_signed_rank(x, y)
    assert res.n_used == 2


def test_identical_inputs_p_one():
    x = np.ones(6)
    res = wilcoxon_signed_rank(x, x)
    assert res.p_value == 1.0 and res.n_used == 0


def test_ties_use_normal_approx():
    x = np.array([2.0, 2.0, 2.0, 2.0, 2.0, 2.0])
    y = np.zeros(6)  # all |d| equal → ties
    res = wilcoxon_signed_rank(x, y)
    assert res.method == "approx"
    assert 0.0 < res.p_value < 0.1


def test_large_n_uses_approx():
    rng = np.random.default_rng(0)
    x = rng.random(40) + 0.3
    y = rng.random(40)
    res = wilcoxon_signed_rank(x, y)
    assert res.method == "approx"
    assert res.p_value < 0.05  # strong systematic shift


def test_symmetry_two_sided():
    x = np.arange(1.0, 9.0)
    y = x + np.linspace(0.1, 0.8, 8)
    a = wilcoxon_signed_rank(x, y)
    b = wilcoxon_signed_rank(y, x)
    assert a.p_value == pytest.approx(b.p_value)


def test_exact_counts_sum_to_2n():
    for n in [3, 8, 13]:
        assert _exact_sf_counts(n).sum() == 2**n


def test_significance_helper():
    x = np.arange(1.0, 14.0)
    y = x - 0.5 - np.arange(13) * 0.01
    assert wilcoxon_signed_rank(x, y).significant(0.05)


def test_shape_mismatch_raises():
    with pytest.raises(ValueError):
        wilcoxon_signed_rank(np.ones(3), np.ones(4))
