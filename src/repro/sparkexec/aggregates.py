"""Distributed tensor aggregation: partial per partition, tensor merge.

Each executor partition runs Algorithm 3 locally (partial aggregates);
Spark shuffles the small partial results by group key; a second tensor
aggregation merges partials per group.  AVG decomposes into SUM+COUNT,
COUNT merges by summation, MIN/MAX by re-minimization — the classical
partial-aggregation scheme, with every arithmetic step a tensor op.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.compiler import compile_plan
from repro.core.expr import Agg, col
from repro.frontends.builder import scan
from repro.sparkexec.partitioned import schema_for

_SUPPORTED = {"sum", "count_star", "count", "avg", "min", "max"}


def _decompose(aggs: dict[str, Agg]):
    """Split logical aggregates into (partial aggs, merge aggs, finisher)."""
    partial: dict[str, Agg] = {}
    merge: dict[str, Agg] = {}
    finals: list[tuple[str, str, str | None]] = []  # (name, num, den)
    for name, a in aggs.items():
        if a.fn not in _SUPPORTED:
            raise NotImplementedError(f"distributed {a.fn} not supported")
        if a.fn in ("sum", "count_star", "count", "avg"):
            s = f"{name}__sum"
            if a.fn in ("sum", "avg"):
                partial[s] = Agg("sum", a.expr)
            else:
                partial[s] = Agg(a.fn, a.expr)
            merge[s] = Agg("sum", col(s))
            if a.fn == "avg":
                c = f"{name}__cnt"
                partial[c] = Agg("count", a.expr)
                merge[c] = Agg("sum", col(c))
                finals.append((name, s, c))
            else:
                finals.append((name, s, None))
        else:  # min / max re-reduce
            s = f"{name}__{a.fn}"
            partial[s] = Agg(a.fn, a.expr)
            merge[s] = Agg(a.fn, col(s))
            finals.append((name, s, None))
    return partial, merge, finals


def tensor_aggregate(
    df: DataFrame, keys: list[str], aggs: dict[str, Agg], mode: str = "jit"
) -> DataFrame:
    """Group-by aggregation over Spark with TQP tensor kernels."""
    partial, merge, finals = _decompose(aggs)

    def partial_plan():
        return scan("input").aggregate(keys, partial)

    def merge_plan():
        return scan("input").aggregate(keys, merge)

    sample = df.limit(100).toPandas()
    part_sample = compile_plan(partial_plan(), mode).run({"input": sample})
    part_schema = schema_for(part_sample)
    part_cols = [f.name for f in part_schema.fields]

    def run_partial(batches):
        cq = compile_plan(partial_plan(), mode)
        for pdf in batches:
            if len(pdf):
                yield cq.run({"input": pdf})[part_cols]

    partials = df.mapInPandas(run_partial, schema=part_schema)

    merged_sample = compile_plan(merge_plan(), mode).run({"input": part_sample})
    final_sample = _finish(merged_sample, keys, finals)
    final_schema = schema_for(final_sample)
    final_cols = [f.name for f in final_schema.fields]

    def run_merge(pdf: pd.DataFrame) -> pd.DataFrame:
        out = compile_plan(merge_plan(), mode).run({"input": pdf})
        return _finish(out, keys, finals)[final_cols]

    if keys:
        return partials.groupBy(*keys).applyInPandas(run_merge, schema=final_schema)

    empty_partials = part_sample.iloc[0:0]

    def run_global(batches):
        frames = list(batches)
        pdf = pd.concat(frames) if frames else empty_partials
        yield run_merge(pdf)

    return partials.coalesce(1).mapInPandas(run_global, schema=final_schema)


def _finish(merged: pd.DataFrame, keys: list[str], finals) -> pd.DataFrame:
    out = merged[keys].copy() if keys else pd.DataFrame(index=merged.index)
    for name, num, den in finals:
        out[name] = merged[num] if den is None else merged[num] / merged[den]
    return out
