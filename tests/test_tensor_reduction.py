"""Unit tests: reductions, histograms, uniques."""
import numpy as np
from hypothesis import given, strategies as st

from repro.tensor import reduction as rd


def test_simple_reductions():
    a = np.array([3.0, 1.0, 2.0])
    assert rd.sum_(a) == 6.0
    assert rd.min_(a) == 1.0
    assert rd.max_(a) == 3.0
    assert rd.mean(a) == 2.0
    assert rd.any_(np.array([False, True]))
    assert not rd.all_(np.array([False, True]))


def test_cumsum():
    np.testing.assert_array_equal(rd.cumsum(np.array([1, 2, 3])), [1, 3, 6])


def test_bincount():
    np.testing.assert_array_equal(
        rd.bincount(np.array([0, 1, 1, 3]), minlength=5), [1, 2, 0, 1, 0]
    )


def test_bincount_weights():
    out = rd.bincount(np.array([0, 1, 1]), weights=np.array([2.0, 3.0, 4.0]))
    np.testing.assert_array_equal(out, [2.0, 7.0])


def test_unique_sorted():
    np.testing.assert_array_equal(rd.unique(np.array([3, 1, 3, 2])), [1, 2, 3])


def test_unique_inverse():
    vals, inv = rd.unique(np.array([3, 1, 3]), return_inverse=True)
    np.testing.assert_array_equal(vals[inv], [3, 1, 3])


def test_unique_consecutive():
    a = np.array([1, 1, 2, 2, 2, 1])
    np.testing.assert_array_equal(rd.unique_consecutive(a), [1, 2, 1])


def test_unique_consecutive_inverse():
    a = np.array([5, 5, 7, 9, 9])
    vals, inv = rd.unique_consecutive(a, return_inverse=True)
    np.testing.assert_array_equal(vals, [5, 7, 9])
    np.testing.assert_array_equal(inv, [0, 0, 1, 2, 2])


def test_unique_consecutive_empty():
    out, inv = rd.unique_consecutive(np.zeros(0, np.int64), return_inverse=True)
    assert out.size == 0 and inv.size == 0


def test_group_starts():
    a = np.array([1, 1, 2, 3, 3, 3])
    np.testing.assert_array_equal(rd.group_starts(a), [0, 2, 3])
    assert rd.group_starts(np.zeros(0, np.int64)).size == 0


@given(st.lists(st.integers(0, 20), min_size=1, max_size=80))
def test_unique_consecutive_on_sorted_equals_unique(xs):
    a = np.sort(np.array(xs, dtype=np.int64))
    np.testing.assert_array_equal(rd.unique_consecutive(a), np.unique(a))


@given(st.lists(st.integers(0, 30), min_size=1, max_size=80))
def test_bincount_sums_to_n(xs):
    a = np.array(xs, dtype=np.int64)
    assert rd.bincount(a).sum() == a.size
