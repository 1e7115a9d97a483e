"""pandas ⇄ columnar tensor table conversion (§4.1, §4.3 step 1).

Numeric columns convert zero-copy where dtypes allow; dates become
int64 nanoseconds since epoch; strings become ``(n, m)`` uint8 char
matrices right-padded with 0s.  The reverse direction re-materializes
dates/strings and maps validity masks to NaN/NaT/None.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.schema import DATE, NUM, STR, Column, Table
from repro.tensor import strings


def series_to_column(s: pd.Series) -> Column:
    if pd.api.types.is_datetime64_any_dtype(s.dtype):
        values = s.to_numpy().astype("datetime64[ns]").view(np.int64)
        return Column(values, DATE)
    if pd.api.types.is_numeric_dtype(s.dtype) or pd.api.types.is_bool_dtype(s.dtype):
        return Column(np.ascontiguousarray(s.to_numpy()), NUM)
    return Column(strings.encode(s.astype(str).to_numpy()), STR)


def pandas_to_table(pdf: pd.DataFrame, columns=None) -> Table:
    """Convert a pandas frame (optionally a projected subset) to tensors.

    TQP pushes projections into data conversion (§6 footnote 5):
    ``columns`` restricts conversion to what the query plan needs.
    """
    names = list(columns) if columns is not None else list(pdf.columns)
    return Table({c: series_to_column(pdf[c]) for c in names}, names)


def column_to_series(col: Column) -> pd.Series:
    if col.kind == DATE:
        vals = col.values.view("datetime64[ns]")
        s = pd.Series(vals)
        if col.mask is not None:
            s = s.mask(~col.mask, pd.NaT)
        return s
    if col.kind == STR:
        s = pd.Series(strings.decode(col.values), dtype=object)
        if col.mask is not None:
            s = s.mask(~col.mask, None)
        return s
    s = pd.Series(col.values)
    if col.mask is not None:
        s = s.astype("float64").mask(~col.mask, np.nan)
    return s


def table_to_pandas(table: Table) -> pd.DataFrame:
    return pd.DataFrame(
        {name: column_to_series(table.cols[name]) for name in table.order}
    )
