"""Sort-based equi-join — Algorithm 1 of the paper, verbatim.

Sort both key columns; histogram each side; the element-wise product of
histograms gives per-matching-key output bucket sizes; prefix sums plus
a parallel binary search (``bucketize``) map every output offset back to
its (left, right) source rows.  All steps are tensor ops.
"""
from __future__ import annotations

import numpy as np

from repro.tensor import creation, elementwise as ew, indexing, reduction, sorting


def sort_join_pairs(
    lk: np.ndarray, rk: np.ndarray, n_keys: int
) -> tuple[np.ndarray, np.ndarray]:
    """Matched index pairs of two dense-int key columns (Algorithm 1)."""
    empty = np.zeros(0, dtype=np.int64)
    if lk.shape[0] == 0 or rk.shape[0] == 0 or n_keys == 0:
        return empty, empty.copy()
    # 1. sort join keys (lines 2-3)
    left_sorted, left_idx = sorting.sort(lk)
    right_sorted, right_idx = sorting.sort(rk)
    # 2. histograms of the key domains (line 4)
    left_hist = reduction.bincount(left_sorted, minlength=n_keys)
    right_hist = reduction.bincount(right_sorted, minlength=n_keys)
    # 3. output rows per matching key (line 5)
    hist_mul = ew.mul(left_hist, right_hist)
    # 4-5. prefix sums (lines 6-8)
    cum_left = reduction.cumsum(left_hist)
    cum_right = reduction.cumsum(right_hist)
    cum_mul = reduction.cumsum(hist_mul)
    # 6. output size and offsets (lines 9-10)
    out_size = int(cum_mul[-1])
    if out_size == 0:
        return empty, empty.copy()
    offset = creation.arange(out_size)
    # 7. parallel binary search for each output's bucket (line 11)
    out_bucket = indexing.bucketize(offset, cum_mul, right=True)
    # 8. source indexes from left and right (lines 12-14)
    bucket_mul = indexing.index_select(hist_mul, out_bucket)
    bucket_cum_mul = indexing.index_select(cum_mul, out_bucket)
    offset = ew.sub(offset, ew.sub(bucket_cum_mul, bucket_mul))
    bucket_rh = indexing.index_select(right_hist, out_bucket)
    left_pos = ew.add(
        ew.sub(
            indexing.index_select(cum_left, out_bucket),
            indexing.index_select(left_hist, out_bucket),
        ),
        ew.floor_div(offset, bucket_rh),
    )
    right_pos = ew.add(
        ew.sub(indexing.index_select(cum_right, out_bucket), bucket_rh),
        ew.remainder(offset, bucket_rh),
    )
    left_out = indexing.index_select(left_idx, left_pos)
    right_out = indexing.index_select(right_idx, right_pos)
    return left_out, right_out
