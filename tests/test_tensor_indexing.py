"""Unit tests: indexing/slicing/reorganization ops."""
import numpy as np
import pytest
from hypothesis import given, strategies as st

from repro.tensor import creation, indexing as ix


def test_masked_select_1d():
    a = np.array([1, 2, 3, 4])
    m = np.array([True, False, True, False])
    np.testing.assert_array_equal(ix.masked_select(a, m), [1, 3])


def test_masked_select_2d_selects_rows():
    a = np.arange(12).reshape(4, 3)
    m = np.array([True, False, False, True])
    np.testing.assert_array_equal(ix.masked_select(a, m), a[[0, 3]])


def test_index_select():
    a = np.array([10, 20, 30])
    np.testing.assert_array_equal(ix.index_select(a, np.array([2, 0, 0])), [30, 10, 10])


def test_nonzero():
    np.testing.assert_array_equal(
        ix.nonzero(np.array([0, 1, 0, 2, 3])), [1, 3, 4]
    )


def test_scatter_last_write_wins():
    dest = np.full(4, -1, dtype=np.int64)
    ix.scatter_(dest, np.array([0, 1, 0]), np.array([5, 6, 7]))
    assert dest[1] == 6
    assert dest[0] == 7  # last write wins (Algorithm 2 relies on this)
    assert dest[2] == -1


@pytest.mark.parametrize(
    "v,exp",
    [(0, 0), (1, 1), (3, 1), (4, 2), (10, 3)],
)
def test_bucketize_right(v, exp):
    # boundaries are cumulative sums [1, 4, 9]; side='right'
    b = np.array([1, 4, 9])
    assert ix.bucketize(np.array([v]), b, right=True)[0] == exp


def test_narrow():
    np.testing.assert_array_equal(ix.narrow(np.arange(10), 2, 3), [2, 3, 4])


def test_cat_stack():
    a, b = np.array([1, 2]), np.array([3])
    np.testing.assert_array_equal(ix.cat([a, b]), [1, 2, 3])
    np.testing.assert_array_equal(
        ix.stack([np.array([1, 2]), np.array([3, 4])]), [[1, 2], [3, 4]]
    )


def test_creation_ops():
    np.testing.assert_array_equal(creation.arange(4), [0, 1, 2, 3])
    assert creation.zeros((2, 2)).sum() == 0
    assert creation.ones(3).sum() == 3
    assert creation.full((2,), 7)[0] == 7
    assert creation.zeros_like(np.ones(5)).shape == (5,)
    assert creation.ones_like(np.zeros(5)).sum() == 5
    assert creation.empty((3,)).shape == (3,)
    src = np.array([1, 2])
    assert creation.from_numpy(src) is src  # zero-copy


@given(st.lists(st.integers(0, 100), min_size=1, max_size=60))
def test_masked_then_nonzero_equivalence(xs):
    """Bitmap vs selection-vector filter representations agree (§3.1)."""
    a = np.array(xs)
    m = a < 50
    bitmap = ix.masked_select(a, m)
    selvec = ix.index_select(a, ix.nonzero(m))
    np.testing.assert_array_equal(bitmap, selvec)
