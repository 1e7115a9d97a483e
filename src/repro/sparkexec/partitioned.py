"""Partition-local tensor-plan execution via ``mapInPandas``."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from repro.core.compiler import compile_plan


def schema_for(pdf: pd.DataFrame):
    """Derive a Spark schema for a pandas result frame.

    Falls back to dtype mapping when the sample result is empty (e.g. a
    sample-driven join with no matching keys).
    """
    spark = SparkSession.getActiveSession()
    assert spark is not None, "no active SparkSession"
    if len(pdf):
        return spark.createDataFrame(pdf).schema
    fields = []
    for c, dt in pdf.dtypes.items():
        if pd.api.types.is_bool_dtype(dt):
            t = T.BooleanType()
        elif pd.api.types.is_integer_dtype(dt):
            t = T.LongType()
        elif pd.api.types.is_float_dtype(dt):
            t = T.DoubleType()
        elif pd.api.types.is_datetime64_any_dtype(dt):
            t = T.TimestampNTZType()
        else:
            t = T.StringType()
        fields.append(T.StructField(str(c), t))
    return T.StructType(fields)


def run_map_plan(df: DataFrame, plan_factory, mode: str = "jit") -> DataFrame:
    """Run a single-table TQP plan over every partition of ``df``.

    ``plan_factory()`` must build a plan whose only scan is the table
    named ``"input"`` and which is partition-local (filters, projections,
    per-row expressions — no joins or global aggregates).  The compiled
    tensor program executes once per Arrow batch inside the executors.
    """
    sample = df.limit(100).toPandas()
    out_schema = schema_for(compile_plan(plan_factory(), mode).run({"input": sample}))

    def fn(batches):
        cq = compile_plan(plan_factory(), mode)
        for pdf in batches:
            if len(pdf):
                yield cq.run({"input": pdf})

    return df.mapInPandas(fn, schema=out_schema)
