"""Tests for the handwritten Wilcoxon rank-sum test (paper Section 3.3)."""
import math

import numpy as np
import pytest

from repro.core.significance import rank_sum_test, resampled_rank_sum_test


def _reference_ranksum(left: np.ndarray, right: np.ndarray) -> float:
    """Independent normal-approximation implementation using explicit
    midranks over the concatenated sample."""
    both = np.concatenate([left, right])
    order = np.argsort(both, kind="stable")
    ranks = np.empty(len(both))
    sorted_vals = both[order]
    i = 0
    while i < len(both):
        j = i
        while j + 1 < len(both) and sorted_vals[j + 1] == sorted_vals[i]:
            j += 1
        ranks[order[i:j + 1]] = (i + j) / 2 + 1
        i = j + 1
    w = ranks[:len(left)].sum()
    nl, nr, n = len(left), len(right), len(both)
    mean = nl * (n + 1) / 2
    _, counts = np.unique(both, return_counts=True)
    tie = np.sum(counts**3 - counts) / (n * (n - 1))
    var = nl * nr / 12 * ((n + 1) - tie)
    if var <= 0:
        return 1.0
    z = (w - mean) / math.sqrt(var)
    return math.erfc(abs(z) / math.sqrt(2))


@pytest.mark.parametrize("l0,l1,r0,r1", [
    (10, 5, 4, 11), (50, 50, 50, 50), (30, 1, 2, 40),
    (1, 9, 9, 1), (100, 3, 5, 200), (7, 0, 3, 12),
])
def test_matches_reference_on_counts(l0, l1, r0, r1):
    left = np.array([0] * l0 + [1] * l1, dtype=float)
    right = np.array([0] * r0 + [1] * r1, dtype=float)
    got = rank_sum_test(l0, l1, r0, r1)
    ref = _reference_ranksum(left, right)
    assert np.isclose(got, ref, rtol=1e-10)


def test_identical_distributions_not_significant():
    assert rank_sum_test(50, 50, 50, 50) > 0.9


def test_extreme_separation_is_tiny():
    p = rank_sum_test(500, 0, 0, 500)
    assert p < 1e-100


def test_reaches_1e50_regime():
    """math.erfc must resolve the paper's 1e-50 threshold region."""
    p = rank_sum_test(200, 5, 5, 200)
    assert 0.0 < p < 1e-50


def test_symmetry_left_right():
    a = rank_sum_test(30, 5, 10, 40)
    b = rank_sum_test(10, 40, 30, 5)
    assert np.isclose(a, b, rtol=1e-12)


def test_degenerate_inputs_return_one():
    assert rank_sum_test(0, 0, 5, 5) == 1.0
    assert rank_sum_test(5, 0, 5, 0) == 1.0   # all labels equal
    assert rank_sum_test(0, 5, 0, 5) == 1.0


def test_monotone_in_separation():
    ps = [rank_sum_test(50, x, x, 50) for x in (40, 25, 10, 2)]
    assert all(ps[i] > ps[i + 1] for i in range(len(ps) - 1))


def test_resampled_deterministic_and_bounded():
    rng1 = np.random.default_rng(0)
    rng2 = np.random.default_rng(0)
    p1 = resampled_rank_sum_test(800, 100, 50, 900, 1000, rng1)
    p2 = resampled_rank_sum_test(800, 100, 50, 900, 1000, rng2)
    assert p1 == p2
    assert 0.0 <= p1 <= 1.0


def test_resampled_falls_back_for_small_samples():
    # n < sample_size -> exact test, no randomness consumed
    exact = rank_sum_test(10, 5, 4, 11)
    got = resampled_rank_sum_test(10, 5, 4, 11, 1000,
                                  np.random.default_rng(3))
    assert got == exact


def test_resampled_controls_large_sample_bias():
    """At equal proportions the resampled p for a huge sample should not
    be (much) smaller than for the 1k-sample equivalent."""
    rng = np.random.default_rng(5)
    p_big = resampled_rank_sum_test(40_000, 10_000, 25_000, 25_000, 1000, rng)
    p_exact_big = rank_sum_test(40_000, 10_000, 25_000, 25_000)
    assert p_exact_big < p_big  # the raw test is (far) more extreme
