"""Distributed tensor joins: hash bucketing + per-bucket Algorithm 1/2.

Both sides are bucketed by a hash of the join keys; Spark's shuffle
co-locates matching keys, and the paper's tensor join algorithms run on
each bucket pair inside ``cogroup().applyInPandas``.  Because bucketing
is complete (every row lands in exactly one bucket and matching keys
share buckets), all join modes — inner, left_outer, left_semi,
left_anti — are correct per bucket.
"""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.core.compiler import compile_plan
from repro.core.expr import Expr
from repro.frontends.builder import scan
from repro.sparkexec.partitioned import schema_for

_BUCKET = "__tqp_bucket"


def tensor_join(
    left: DataFrame,
    right: DataFrame,
    left_on: list[str],
    right_on: list[str],
    how: str = "inner",
    residual: Expr | None = None,
    impl: str = "sort",
    buckets: int = 32,
    mode: str = "jit",
) -> DataFrame:
    """Equi-join two Spark DataFrames with TQP's tensor join per bucket."""
    lb = left.withColumn(_BUCKET, F.pmod(F.hash(*left_on), F.lit(buckets)))
    rb = right.withColumn(_BUCKET, F.pmod(F.hash(*right_on), F.lit(buckets)))

    def build_plan():
        return scan("l").join(
            scan("r"), left_on, right_on, how=how, residual=residual, impl=impl
        )

    l_sample = left.limit(50).toPandas()
    r_sample = right.limit(50).toPandas()
    out_schema = schema_for(
        compile_plan(build_plan(), mode).run({"l": l_sample, "r": r_sample})
    )
    out_cols = [f.name for f in out_schema.fields]

    def fn(lpdf: pd.DataFrame, rpdf: pd.DataFrame) -> pd.DataFrame:
        lpdf = lpdf.drop(columns=[_BUCKET])
        rpdf = rpdf.drop(columns=[_BUCKET])
        out = compile_plan(build_plan(), mode).run({"l": lpdf, "r": rpdf})
        return out[out_cols]

    return (
        lb.groupBy(_BUCKET)
        .cogroup(rb.groupBy(_BUCKET))
        .applyInPandas(fn, schema=out_schema)
    )
