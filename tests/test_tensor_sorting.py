"""Unit tests: sort ops."""
import numpy as np
from hypothesis import given, strategies as st

from repro.tensor import sorting


def test_sort_returns_values_and_indexes():
    vals, idx = sorting.sort(np.array([3, 1, 2]))
    np.testing.assert_array_equal(vals, [1, 2, 3])
    np.testing.assert_array_equal(idx, [1, 2, 0])


def test_sort_stable():
    a = np.array([2, 1, 2, 1])
    _, idx = sorting.sort(a)
    np.testing.assert_array_equal(idx, [1, 3, 0, 2])


def test_argsort():
    np.testing.assert_array_equal(sorting.argsort(np.array([5, 0, 3])), [1, 2, 0])


def test_lexsort_last_key_primary():
    primary = np.array([1, 0, 1, 0])
    secondary = np.array([9, 8, 7, 6])
    idx = sorting.lexsort([secondary, primary])
    np.testing.assert_array_equal(primary[idx], [0, 0, 1, 1])
    np.testing.assert_array_equal(secondary[idx], [6, 8, 7, 9])


@given(st.lists(st.integers(-1000, 1000), min_size=1, max_size=100))
def test_sort_property(xs):
    a = np.array(xs)
    vals, idx = sorting.sort(a)
    np.testing.assert_array_equal(vals, np.sort(a))
    np.testing.assert_array_equal(a[idx], vals)
