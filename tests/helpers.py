"""Shared test utilities."""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import types as T


def to_spark(spark, pdf: pd.DataFrame):
    """pandas → Spark DataFrame with an explicit schema (handles empty)."""
    if len(pdf):
        return spark.createDataFrame(pdf)
    fields = []
    for c, dt in pdf.dtypes.items():
        if pd.api.types.is_bool_dtype(dt):
            t = T.BooleanType()
        elif pd.api.types.is_integer_dtype(dt):
            t = T.LongType()
        elif pd.api.types.is_float_dtype(dt):
            t = T.DoubleType()
        elif pd.api.types.is_datetime64_any_dtype(dt):
            t = T.TimestampType()
        else:
            t = T.StringType()
        fields.append(T.StructField(str(c), t))
    return spark.createDataFrame([], T.StructType(fields))


def canon(pdf: pd.DataFrame) -> pd.DataFrame:
    """Column-sorted, row-sorted, float-rounded frame for comparison."""
    pdf = pdf[sorted(pdf.columns)].reset_index(drop=True).copy()
    for c in pdf.select_dtypes(include=["float", "float64"]).columns:
        pdf[c] = pdf[c].round(6)
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True)


def assert_frames_match(got: pd.DataFrame, exp: pd.DataFrame) -> None:
    assert set(got.columns) == set(exp.columns), (
        sorted(got.columns), sorted(exp.columns)
    )
    pd.testing.assert_frame_equal(canon(got), canon(exp), check_dtype=False)


def rand_df(n: int, seed: int = 0) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "k": g.integers(0, max(n // 3, 2), n),
            "v": g.random(n) * 100,
            "s": g.choice(["aa", "bb", "cc", "dd"], n),
            "d": pd.to_datetime("1994-01-01")
            + pd.to_timedelta(g.integers(0, 1000, n), unit="D"),
        }
    )
