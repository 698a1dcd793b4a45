"""Tests for Appendix-D rank metrics (Eqs. 21-22)."""
import numpy as np
import pytest

from repro.eval.measures import ad_diff, k_avg, kendall_tau_distance


def test_identical_lists_zero():
    assert kendall_tau_distance([1, 2, 3, 4], [1, 2, 3, 4]) == 0.0


def test_reversed_lists_one():
    assert kendall_tau_distance([1, 2, 3, 4], [4, 3, 2, 1]) == 1.0


def test_single_swap():
    # one discordant pair out of 3
    assert kendall_tau_distance([1, 2, 3], [2, 1, 3]) == pytest.approx(1 / 3)


@pytest.mark.parametrize("n", [2, 5, 9])
def test_range_and_symmetry(n):
    rng = np.random.default_rng(n)
    a = list(rng.permutation(n))
    b = list(rng.permutation(n))
    d1 = kendall_tau_distance(a, b)
    d2 = kendall_tau_distance(b, a)
    assert 0.0 <= d1 <= 1.0
    assert d1 == pytest.approx(d2)


def test_mismatched_elements_raise():
    with pytest.raises(ValueError):
        kendall_tau_distance([1, 2], [1, 3])


def test_singleton_zero():
    assert kendall_tau_distance([1], [1]) == 0.0


def test_k_avg_identical_zero():
    assert k_avg([5, 2, 9], [5, 2, 9]) == 0.0


def test_k_avg_disjoint_positive():
    # Completely disjoint top-k lists are maximally discordant in the
    # extension: each list ranks its own elements above the other's.
    assert k_avg([1, 2], [3, 4]) > 0.4


def test_k_avg_partial_overlap():
    d = k_avg([1, 2, 3], [1, 3, 2])
    assert 0.0 < d < 1.0


def test_k_avg_subset_order_preserved():
    # q contains p's items in the same relative order plus one extra.
    assert k_avg([1, 2], [1, 2]) == 0.0


def test_ad_diff_basic():
    assert ad_diff([0.5, 0.4], [0.5, 0.2]) == pytest.approx(0.1)


def test_ad_diff_zero_and_empty():
    assert ad_diff([], []) == 0.0
    assert ad_diff([0.3], [0.3]) == 0.0


def test_ad_diff_length_mismatch():
    with pytest.raises(ValueError):
        ad_diff([0.1], [0.1, 0.2])
