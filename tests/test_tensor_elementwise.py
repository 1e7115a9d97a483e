"""Unit tests: elementwise tensor ops vs numpy ground truth."""
import numpy as np
import pytest
from hypothesis import given, strategies as st

from repro.tensor import elementwise as ew

_A = np.array([1.0, 2.5, -3.0, 0.0, 7.5])
_B = np.array([2.0, 2.5, 1.0, -1.0, 3.0])

BINOPS = {
    "add": (ew.add, np.add),
    "sub": (ew.sub, np.subtract),
    "mul": (ew.mul, np.multiply),
    "div": (ew.div, np.divide),
    "fmod": (ew.fmod, np.fmod),
    "remainder": (ew.remainder, np.remainder),
    "minimum": (ew.minimum, np.minimum),
    "maximum": (ew.maximum, np.maximum),
    "eq": (ew.eq, np.equal),
    "ne": (ew.ne, np.not_equal),
    "lt": (ew.lt, np.less),
    "le": (ew.le, np.less_equal),
    "gt": (ew.gt, np.greater),
    "ge": (ew.ge, np.greater_equal),
}


@pytest.mark.parametrize("name", sorted(BINOPS))
def test_binop_matches_numpy(name):
    ours, ref = BINOPS[name]
    np.testing.assert_array_equal(ours(_A, _B), ref(_A, _B))


@pytest.mark.parametrize("name", sorted(BINOPS))
def test_binop_scalar_broadcast(name):
    ours, ref = BINOPS[name]
    np.testing.assert_array_equal(ours(_A, 2.0), ref(_A, 2.0))


def test_neg_abs():
    np.testing.assert_array_equal(ew.neg(_A), -_A)
    np.testing.assert_array_equal(ew.abs_(_A), np.abs(_A))


def test_isnan():
    x = np.array([1.0, np.nan, 3.0])
    np.testing.assert_array_equal(ew.isnan(x), [False, True, False])


def test_logical_ops():
    a = np.array([True, True, False, False])
    b = np.array([True, False, True, False])
    np.testing.assert_array_equal(ew.logical_and(a, b), a & b)
    np.testing.assert_array_equal(ew.logical_or(a, b), a | b)
    np.testing.assert_array_equal(ew.logical_not(a), ~a)


def test_where():
    cond = np.array([True, False, True])
    np.testing.assert_array_equal(
        ew.where(cond, np.array([1, 2, 3]), np.array([9, 9, 9])), [1, 9, 3]
    )


def test_floor_div_matches_algorithm1_semantics():
    a = np.array([7, 8, 9], dtype=np.int64)
    np.testing.assert_array_equal(ew.floor_div(a, 3), [2, 2, 3])


@given(
    st.lists(st.floats(-1e6, 1e6), min_size=1, max_size=50),
    st.floats(-1e6, 1e6),
)
def test_lt_property(xs, t):
    a = np.array(xs)
    np.testing.assert_array_equal(ew.lt(a, t), a < t)


@given(st.lists(st.integers(-1000, 1000), min_size=1, max_size=50))
def test_add_sub_roundtrip(xs):
    a = np.array(xs, dtype=np.int64)
    np.testing.assert_array_equal(ew.sub(ew.add(a, 7), 7), a)
