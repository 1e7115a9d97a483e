"""Hash-based equi-join — Algorithm 2 of the paper, verbatim.

Classical hash join with the build and probe phases *interleaved*: each
iteration scatters not-yet-inserted left rows into a fresh hash table
(last write wins), probes all right rows against it, and redirects the
inserted rows' hashes to an extra (m+1)-th bucket so they drop out of
subsequent iterations.  Iterates ``max bucket occupancy`` times; with no
collisions a single pass runs (lines 9-10 / 18-19 skipped).
"""
from __future__ import annotations

import numpy as np

from repro.tensor import creation, elementwise as ew, indexing, reduction


def hash_join_pairs(
    lk: np.ndarray, rk: np.ndarray, n_keys: int
) -> tuple[np.ndarray, np.ndarray]:
    """Matched index pairs of two dense-int key columns (Algorithm 2)."""
    empty = np.zeros(0, dtype=np.int64)
    if lk.shape[0] == 0 or rk.shape[0] == 0:
        return empty, empty.copy()
    # hash table size: next power of two covering the build side
    m = 1 << int(max(lk.shape[0], 1)).bit_length()
    left_idx = creation.arange(lk.shape[0])
    right_idx = creation.arange(rk.shape[0])
    left_hash = ew.remainder(lk, m)  # line 3
    right_hash = ew.remainder(rk, m)
    hash_bincount = reduction.bincount(left_hash, minlength=m)  # line 4
    max_bucket = int(reduction.max_(hash_bincount))  # line 5
    left_out_parts: list[np.ndarray] = []
    right_out_parts: list[np.ndarray] = []
    single_pass = max_bucket <= 1
    for _ in range(max_bucket):  # line 6
        hash_table = creation.full((m + 1,), -1, dtype=np.int64)  # line 7
        indexing.scatter_(hash_table, left_hash, left_idx)  # line 8
        if not single_pass:
            # lines 9-10: redirect inserted rows to the (m+1)-th bucket
            inserted = indexing.masked_select(hash_table, ew.ge(hash_table, 0))
            indexing.scatter_(
                left_hash, inserted, creation.full(inserted.shape, m, np.int64)
            )
        # lines 11-14: probe
        left_cand = indexing.index_select(hash_table, right_hash)
        valid_mask = ew.ge(left_cand, 0)
        valid_left = indexing.masked_select(left_cand, valid_mask)
        valid_right = indexing.masked_select(right_idx, valid_mask)
        # lines 15-17: verify the actual keys match
        match = ew.eq(
            indexing.index_select(lk, valid_left),
            indexing.index_select(rk, valid_right),
        )
        left_match = indexing.masked_select(valid_left, match)
        right_match = indexing.masked_select(valid_right, match)
        # lines 18-19: accumulate across iterations
        left_out_parts.append(left_match)
        right_out_parts.append(right_match)
    if len(left_out_parts) == 1:
        return left_out_parts[0], right_out_parts[0]
    return indexing.cat(left_out_parts), indexing.cat(right_out_parts)
