"""Benchmark for Table III's statistical substrate (exact Wilcoxon, n=13)."""
import numpy as np

from repro.stats.wilcoxon import wilcoxon_signed_rank


def test_bench_wilcoxon_exact_n13(benchmark):
    """The exact-DP signed-rank test at the paper's n=13."""
    rng = np.random.default_rng(0)
    x = rng.random(13) + 0.05
    y = rng.random(13)
    res = benchmark(wilcoxon_signed_rank, x, y)
    assert 0 <= res.p_value <= 1
