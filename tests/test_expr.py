"""Unit tests: expression compilation (§5.1), both execution modes."""
import numpy as np
import pandas as pd
import pytest

from repro.core import convert
from repro.core.expr import Agg, Case, case, col, date, lit
from repro.core.schema import Column


def _table():
    return convert.pandas_to_table(
        pd.DataFrame(
            {
                "x": [1.0, 2.0, 3.0, 4.0],
                "y": [10.0, 20.0, 30.0, 40.0],
                "s": ["MAIL", "SHIP", "RAIL", "MAIL"],
                "d": pd.to_datetime(
                    ["1994-01-01", "1994-06-01", "1995-01-01", "1996-02-02"]
                ),
            }
        )
    )


def _eval(e, t, mode):
    return (e.build()(t, None) if mode == "jit" else e.eval(t, None)).values


MODES = ["torch", "jit"]


@pytest.mark.parametrize("mode", MODES)
def test_arith(mode):
    t = _table()
    np.testing.assert_array_equal(
        _eval(col("x") + col("y"), t, mode), [11, 22, 33, 44]
    )
    np.testing.assert_array_equal(
        _eval(col("y") * (lit(1.0) - lit(0.5)), t, mode), [5, 10, 15, 20]
    )
    np.testing.assert_array_equal(_eval(col("y") / col("x"), t, mode), [10] * 4)
    np.testing.assert_array_equal(_eval(col("x") - lit(1), t, mode), [0, 1, 2, 3])


@pytest.mark.parametrize("mode", MODES)
def test_compare_numeric(mode):
    t = _table()
    np.testing.assert_array_equal(
        _eval(col("x") > 2, t, mode), [False, False, True, True]
    )
    np.testing.assert_array_equal(
        _eval(col("x").between(2, 3), t, mode), [False, True, True, False]
    )


@pytest.mark.parametrize("mode", MODES)
def test_compare_string_const(mode):
    t = _table()
    np.testing.assert_array_equal(
        _eval(col("s") == "MAIL", t, mode), [True, False, False, True]
    )
    np.testing.assert_array_equal(
        _eval(col("s") != "MAIL", t, mode), [False, True, True, False]
    )


@pytest.mark.parametrize("mode", MODES)
def test_compare_dates(mode):
    t = _table()
    np.testing.assert_array_equal(
        _eval(col("d") < date("1995-01-01"), t, mode), [True, True, False, False]
    )
    np.testing.assert_array_equal(
        _eval(col("d") >= date("1994-06-01"), t, mode),
        [False, True, True, True],
    )


@pytest.mark.parametrize("mode", MODES)
def test_bool_ops(mode):
    t = _table()
    e = (col("x") > 1) & (col("x") < 4) | (col("s") == "RAIL")
    np.testing.assert_array_equal(_eval(e, t, mode), [False, True, True, False])
    np.testing.assert_array_equal(
        _eval(~(col("x") > 2), t, mode), [True, True, False, False]
    )


@pytest.mark.parametrize("mode", MODES)
def test_isin_like_substr_year(mode):
    t = _table()
    np.testing.assert_array_equal(
        _eval(col("s").isin(["MAIL", "RAIL"]), t, mode), [True, False, True, True]
    )
    np.testing.assert_array_equal(
        _eval(col("s").like("%AIL"), t, mode), [True, False, True, True]
    )
    np.testing.assert_array_equal(
        _eval(col("s").not_like("MA%"), t, mode), [False, True, True, False]
    )
    sub = col("s").substr(1, 2)
    out = sub.eval(t, None) if mode == "torch" else sub.build()(t, None)
    from repro.tensor import strings

    assert strings.decode(out.values).tolist() == ["MA", "SH", "RA", "MA"]
    np.testing.assert_array_equal(
        _eval(col("d").year(), t, mode), [1994, 1994, 1995, 1996]
    )


@pytest.mark.parametrize("mode", MODES)
def test_case(mode):
    t = _table()
    e = case([(col("s") == "MAIL", col("x"))], lit(0.0))
    np.testing.assert_array_equal(_eval(e, t, mode), [1.0, 0.0, 0.0, 4.0])
    e2 = Case([(col("x") < 2, lit(1)), (col("x") < 4, lit(2))], lit(3))
    np.testing.assert_array_equal(_eval(e2, t, mode), [1, 2, 2, 3])


@pytest.mark.parametrize("mode", MODES)
def test_isnull(mode):
    t = _table()
    t.cols["x"] = Column(t["x"].values, "num", np.array([True, False, True, True]))
    np.testing.assert_array_equal(
        _eval(col("x").is_null(), t, mode), [False, True, False, False]
    )
    np.testing.assert_array_equal(
        _eval(col("x").is_not_null(), t, mode), [True, False, True, True]
    )


def test_mask_propagation():
    t = _table()
    t.cols["x"] = Column(t["x"].values, "num", np.array([True, False, True, True]))
    out = (col("x") + col("y")).eval(t, None)
    np.testing.assert_array_equal(out.mask, [True, False, True, True])


def test_columns_collection():
    e = (col("a") + col("b")) > col("c").substr(1, 2).isin(["x"])
    assert e.columns() == {"a", "b", "c"}


def test_agg_columns():
    assert Agg("sum", col("x") * col("y")).columns() == {"x", "y"}
    assert Agg("count_star").columns() == set()
    assert Agg("count_distinct", col("k")).distinct
