"""Sort-based group-by aggregation — Algorithm 3 of the paper.

Concatenate the group-by columns (realized as a mixed-radix integer
combine of per-column codes), sort, permute the payload, collapse runs
with ``unique_consecutive``, then evaluate every aggregate expression
per segment with segment/scatter reductions.
"""
from __future__ import annotations

import numpy as np

from repro.core.expr import Agg
from repro.core.operators.base import group_key_codes
from repro.core.schema import NUM, Column, Table
from repro.tensor import indexing, reduction, scatter_ops, sorting


def _segment_counts(starts: np.ndarray, n: int) -> np.ndarray:
    if starts.shape[0] == 0:
        return np.zeros(0, dtype=np.int64)
    ends = np.empty_like(starts)
    ends[:-1] = starts[1:]
    ends[-1] = n
    return ends - starts


def _distinct_counts(
    codes: np.ndarray, values: Column, n_groups: int
) -> np.ndarray:
    """COUNT(DISTINCT expr) per group via a joint (group, value) sort."""
    vals = values.int_codes()
    order = sorting.lexsort([vals, codes])  # group primary, value secondary
    g = indexing.index_select(codes, order)
    v = indexing.index_select(vals, order)
    if g.shape[0] == 0:
        return np.zeros(n_groups, dtype=np.int64)
    new_grp = np.empty(g.shape[0], dtype=bool)
    new_grp[0] = True
    np.not_equal(g[1:], g[:-1], out=new_grp[1:])
    new_val = np.empty_like(new_grp)
    new_val[0] = True
    np.not_equal(v[1:], v[:-1], out=new_val[1:])
    fresh = (new_grp | new_val).astype(np.int64)
    if values.mask is not None:
        fresh &= indexing.index_select(values.valid(), order).astype(np.int64)
    starts = indexing.nonzero(new_grp)
    return scatter_ops.segment_sum(fresh, starts).astype(np.int64)


def _null_scalar(kind: str) -> Column:
    values = np.zeros(1, dtype=np.float64)
    return Column(values, kind if kind != "str" else NUM, np.zeros(1, dtype=bool))


def run_aggregate(
    table: Table, keys: list[str], aggs: dict[str, Agg], agg_inputs: dict[str, Column]
) -> Table:
    """Execute Algorithm 3 over pre-evaluated aggregate input columns.

    ``agg_inputs`` maps output names to the evaluated argument column of
    each aggregate (absent for ``count_star``).
    """
    n = table.n
    if not keys:
        return _global_aggregate(n, aggs, agg_inputs)
    # lines 1-2: group keys as one combined code tensor
    codes = group_key_codes(table, keys)
    # line 3: sort the keys
    sorted_codes, perm = sorting.sort(codes)
    # line 5: collapse runs; starts index the sorted domain
    starts = reduction.group_starts(sorted_codes)
    n_groups = starts.shape[0]
    counts = _segment_counts(starts, n)
    out_cols: dict[str, Column] = {}
    # group-key output = first row of every run (line 4 permute + gather)
    first_idx = indexing.index_select(perm, starts)
    for k in keys:
        out_cols[k] = table[k].take(first_idx)
    # line 6: evaluate each aggregate per segment
    for name, agg in aggs.items():
        if agg.fn == "count_star":
            out_cols[name] = Column(counts.astype(np.int64), NUM)
            continue
        src = agg_inputs[name]
        if agg.fn == "count_distinct":
            out_cols[name] = Column(_distinct_counts(codes, src, n_groups), NUM)
            continue
        valid = src.valid()
        vperm = indexing.index_select(src.values, perm)
        if agg.fn == "count":
            cnt = scatter_ops.segment_sum(
                indexing.index_select(valid, perm).astype(np.int64), starts
            )
            out_cols[name] = Column(cnt.astype(np.int64), NUM)
            continue
        if src.mask is not None:
            vperm = np.where(indexing.index_select(valid, perm), vperm, 0)
        if agg.fn == "sum":
            out_cols[name] = Column(scatter_ops.segment_sum(vperm, starts), NUM)
        elif agg.fn == "avg":
            sums = scatter_ops.segment_sum(vperm.astype(np.float64), starts)
            cnts = scatter_ops.segment_sum(
                indexing.index_select(valid, perm).astype(np.int64), starts
            )
            out_cols[name] = Column(sums / np.maximum(cnts, 1), NUM)
        elif agg.fn == "min":
            out_cols[name] = Column(
                scatter_ops.segment_min(vperm, starts), src.kind
            )
        elif agg.fn == "max":
            out_cols[name] = Column(
                scatter_ops.segment_max(vperm, starts), src.kind
            )
        else:  # pragma: no cover
            raise ValueError(f"unsupported aggregate {agg.fn}")
    order = keys + [a for a in aggs]
    return Table(out_cols, order)


def _global_aggregate(
    n: int, aggs: dict[str, Agg], agg_inputs: dict[str, Column]
) -> Table:
    """No GROUP BY: one output row; SQL null semantics on empty input."""
    out_cols: dict[str, Column] = {}
    for name, agg in aggs.items():
        if agg.fn == "count_star":
            out_cols[name] = Column(np.array([n], dtype=np.int64), NUM)
            continue
        src = agg_inputs[name]
        valid = src.valid()
        n_valid = int(valid.sum())
        if agg.fn == "count":
            out_cols[name] = Column(np.array([n_valid], dtype=np.int64), NUM)
            continue
        if agg.fn == "count_distinct":
            vals = src.int_codes()[valid]
            out_cols[name] = Column(
                np.array([np.unique(vals).shape[0]], dtype=np.int64), NUM
            )
            continue
        if n_valid == 0:
            out_cols[name] = _null_scalar(src.kind)
            continue
        vals = src.values if src.mask is None else src.values[valid]
        if agg.fn == "sum":
            out_cols[name] = Column(
                np.asarray(reduction.sum_(vals)).reshape(1), NUM
            )
        elif agg.fn == "avg":
            out_cols[name] = Column(np.asarray(reduction.mean(vals)).reshape(1), NUM)
        elif agg.fn == "min":
            out_cols[name] = Column(
                np.asarray(reduction.min_(vals)).reshape(1), src.kind
            )
        elif agg.fn == "max":
            out_cols[name] = Column(
                np.asarray(reduction.max_(vals)).reshape(1), src.kind
            )
        else:  # pragma: no cover
            raise ValueError(f"unsupported aggregate {agg.fn}")
    return Table(out_cols, list(aggs))
