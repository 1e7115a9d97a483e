"""Unit tests: columnar tensor tables and pandas conversion (§4.1)."""
import numpy as np
import pandas as pd
from hypothesis import given, strategies as st

from repro.core import convert
from repro.core.schema import Column, Table


def _pdf():
    return pd.DataFrame(
        {
            "i": np.array([1, 2, 3], dtype=np.int64),
            "f": np.array([1.5, 2.5, 3.5]),
            "s": ["aa", "b", "ccc"],
            "d": pd.to_datetime(["1994-01-01", "1995-06-15", "1996-12-31"]),
        }
    )


def test_roundtrip():
    pdf = _pdf()
    out = convert.table_to_pandas(convert.pandas_to_table(pdf))
    pd.testing.assert_frame_equal(out, pdf, check_dtype=False)


def test_kinds():
    t = convert.pandas_to_table(_pdf())
    assert t["i"].kind == "num"
    assert t["f"].kind == "num"
    assert t["s"].kind == "str"
    assert t["d"].kind == "date"
    assert t["d"].values.dtype == np.int64  # ns since epoch (§4.1)


def test_string_column_is_char_matrix():
    t = convert.pandas_to_table(_pdf())
    assert t["s"].values.shape == (3, 3)  # (n, max_len)
    assert t["s"].values.dtype == np.uint8


def test_projected_conversion():
    t = convert.pandas_to_table(_pdf(), columns=["i", "s"])
    assert t.order == ["i", "s"]
    assert "f" not in t.cols


def test_table_take_and_mask():
    t = convert.pandas_to_table(_pdf())
    taken = t.take(np.array([2, 0]))
    assert convert.table_to_pandas(taken)["i"].tolist() == [3, 1]
    masked = t.mask_rows(np.array([True, False, True]))
    assert convert.table_to_pandas(masked)["s"].tolist() == ["aa", "ccc"]


def test_null_mask_roundtrip():
    col = Column(np.array([1.0, 2.0]), "num", np.array([True, False]))
    s = convert.column_to_series(col)
    assert s.tolist()[0] == 1.0 and np.isnan(s.tolist()[1])


def test_null_like():
    t = convert.pandas_to_table(_pdf())
    nl = t["s"].null_like(2)
    assert nl.n == 2 and not nl.mask.any()
    nd = t["d"].null_like(1)
    s = convert.column_to_series(nd)
    assert s.isna().all()


def test_column_concat_mixed_width_strings():
    a = convert.series_to_column(pd.Series(["aa"]))
    b = convert.series_to_column(pd.Series(["bbbb"]))
    c = Column.concat(a, b)
    from repro.tensor import strings

    assert strings.decode(c.values).tolist() == ["aa", "bbbb"]


def test_table_merge_rejects_duplicates():
    t = convert.pandas_to_table(_pdf())
    try:
        Table.merge(t, t)
        raised = False
    except AssertionError:
        raised = True
    assert raised


def test_int_codes_float_and_str():
    t = convert.pandas_to_table(_pdf())
    fc = t["f"].int_codes()
    assert fc.dtype == np.int64
    np.testing.assert_array_equal(np.argsort(fc), np.argsort(t["f"].values))
    sc = t["s"].int_codes()
    assert sc.dtype == np.int64


@given(
    st.lists(
        st.tuples(
            st.integers(-10**6, 10**6),
            st.floats(-1e6, 1e6, allow_nan=False),
            st.text(alphabet="abcXYZ ", max_size=6),
        ),
        min_size=1,
        max_size=30,
    )
)
def test_roundtrip_property(rows):
    pdf = pd.DataFrame(rows, columns=["i", "f", "s"])
    out = convert.table_to_pandas(convert.pandas_to_table(pdf))
    pd.testing.assert_frame_equal(out, pdf, check_dtype=False)
