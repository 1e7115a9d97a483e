"""Join finalization shared by the sort- and hash-based algorithms (§5.2).

Both algorithms emit *index pairs* — late materialization: only the key
columns flow through the join, and ``CREATEOUTPUT`` gathers payload rows
by index afterwards.  Residual (non-equi) conditions are evaluated on
the gathered candidate pairs; the join mode (inner / left-outer /
left-semi / left-anti) is then realized from the surviving pair list.
"""
from __future__ import annotations

import numpy as np

from repro.core.operators.base import filter_mask
from repro.core.schema import Table
from repro.tensor import indexing


def finalize(
    left: Table,
    right: Table,
    left_idx: np.ndarray,
    right_idx: np.ndarray,
    how: str,
    residual_eval,
    ctx,
) -> Table:
    """Turn matched index pairs into the join output for ``how``."""
    if residual_eval is not None:
        pair = Table.merge(left.take(left_idx), right.take(right_idx))
        mask = filter_mask(residual_eval(pair, ctx))
        left_idx = indexing.masked_select(left_idx, mask)
        right_idx = indexing.masked_select(right_idx, mask)
        if how == "inner":
            return pair.mask_rows(mask)
    if how == "inner":
        return Table.merge(left.take(left_idx), right.take(right_idx))
    if how == "left_semi":
        keep = np.zeros(left.n, dtype=bool)
        keep[left_idx] = True
        return left.take(indexing.nonzero(keep))
    if how == "left_anti":
        keep = np.ones(left.n, dtype=bool)
        keep[left_idx] = False
        return left.take(indexing.nonzero(keep))
    if how == "left_outer":
        matched = Table.merge(left.take(left_idx), right.take(right_idx))
        miss = np.ones(left.n, dtype=bool)
        miss[left_idx] = False
        miss_idx = indexing.nonzero(miss)
        pad_left = left.take(miss_idx)
        pad_right = Table(
            {c: right.cols[c].null_like(miss_idx.shape[0]) for c in right.order},
            list(right.order),
        )
        return Table.concat_rows(matched, Table.merge(pad_left, pad_right))
    raise ValueError(f"unsupported join mode: {how}")
