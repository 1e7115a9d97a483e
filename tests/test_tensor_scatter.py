"""Unit tests: torch-scatter-style grouped aggregates."""
import numpy as np
from hypothesis import given, strategies as st

from repro.tensor import scatter_ops as sc

_SRC = np.array([1.0, 2.0, 3.0, 4.0, 5.0])
_IDX = np.array([0, 1, 0, 2, 1])


def test_scatter_add():
    np.testing.assert_array_equal(sc.scatter_add(_SRC, _IDX, 3), [4.0, 7.0, 4.0])


def test_scatter_count():
    np.testing.assert_array_equal(sc.scatter_count(_IDX, 3), [2, 2, 1])


def test_scatter_mean():
    np.testing.assert_array_equal(sc.scatter_mean(_SRC, _IDX, 3), [2.0, 3.5, 4.0])


def test_scatter_min_max():
    np.testing.assert_array_equal(sc.scatter_min(_SRC, _IDX, 3), [1.0, 2.0, 4.0])
    np.testing.assert_array_equal(sc.scatter_max(_SRC, _IDX, 3), [3.0, 5.0, 4.0])


def test_scatter_add_int_dtype():
    out = sc.scatter_add(np.array([1, 2, 3]), np.array([0, 0, 1]), 2)
    assert out.dtype == np.int64
    np.testing.assert_array_equal(out, [3, 3])


def test_segment_ops():
    src = np.array([1.0, 2.0, 5.0, 1.0, 9.0])
    starts = np.array([0, 2, 4])
    np.testing.assert_array_equal(sc.segment_sum(src, starts), [3.0, 6.0, 9.0])
    np.testing.assert_array_equal(sc.segment_min(src, starts), [1.0, 1.0, 9.0])
    np.testing.assert_array_equal(sc.segment_max(src, starts), [2.0, 5.0, 9.0])


def test_segment_empty():
    assert sc.segment_sum(np.zeros(0), np.zeros(0, np.int64)).size == 0


@given(
    st.lists(
        st.tuples(st.integers(0, 5), st.floats(-100, 100)),
        min_size=1,
        max_size=60,
    )
)
def test_scatter_add_matches_python(pairs):
    idx = np.array([p[0] for p in pairs], dtype=np.int64)
    src = np.array([p[1] for p in pairs])
    out = sc.scatter_add(src, idx, 6)
    expected = np.zeros(6)
    for i, v in pairs:
        expected[i] += v
    np.testing.assert_allclose(out, expected, rtol=1e-9, atol=1e-9)


@given(
    st.lists(
        st.tuples(st.integers(0, 4), st.floats(-100, 100)),
        min_size=1,
        max_size=60,
    )
)
def test_segment_equals_scatter_after_sort(pairs):
    """Algorithm 3 equivalence: sorted segment-reduce == scatter-reduce."""
    idx = np.array([p[0] for p in pairs], dtype=np.int64)
    src = np.array([p[1] for p in pairs])
    order = np.argsort(idx, kind="stable")
    sidx, ssrc = idx[order], src[order]
    starts = np.flatnonzero(np.r_[True, sidx[1:] != sidx[:-1]])
    seg = sc.segment_sum(ssrc, starts)
    scat = sc.scatter_add(src, idx, 5)
    present = np.unique(idx)
    np.testing.assert_allclose(seg, scat[present], rtol=1e-9, atol=1e-9)
