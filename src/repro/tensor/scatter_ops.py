"""Grouped aggregates: ``scatter_add``/``min``/``max``/``mean``/``count``.

These mirror the ``torch-scatter`` extension the paper depends on.
``index`` maps every source element to an output slot ``0..size-1``
(Algorithm 3 produces it with ``unique_consecutive(..., inverse=True)``).

``scatter_add``/``mean`` use histogram kernels (``np.bincount`` with
weights) — the same memory-access pattern as the CUDA atomics-based
kernels.  ``min``/``max`` use ``ufunc.at`` scatter-reduce.
"""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def _rec(name: str, src: np.ndarray, idx: np.ndarray, out: np.ndarray):
    record(name, src.nbytes + idx.nbytes, out.nbytes, src.size)
    return out


def scatter_add(src: np.ndarray, index: np.ndarray, size: int) -> np.ndarray:
    out = np.bincount(index, weights=src, minlength=size)
    if np.issubdtype(src.dtype, np.integer):
        out = out.astype(np.int64)
    return _rec("scatter_add", src, index, out)


def scatter_count(index: np.ndarray, size: int) -> np.ndarray:
    out = np.bincount(index, minlength=size)
    record("scatter_add", index.nbytes, out.nbytes, index.size)
    return out


def scatter_mean(src: np.ndarray, index: np.ndarray, size: int) -> np.ndarray:
    sums = np.bincount(index, weights=src, minlength=size)
    counts = np.bincount(index, minlength=size)
    out = sums / np.maximum(counts, 1)
    return _rec("scatter_mean", src, index, out)


def scatter_min(src: np.ndarray, index: np.ndarray, size: int) -> np.ndarray:
    init = np.inf if np.issubdtype(src.dtype, np.floating) else np.iinfo(src.dtype).max
    out = np.full(size, init, dtype=src.dtype)
    np.minimum.at(out, index, src)
    return _rec("scatter_min", src, index, out)


def scatter_max(src: np.ndarray, index: np.ndarray, size: int) -> np.ndarray:
    init = -np.inf if np.issubdtype(src.dtype, np.floating) else np.iinfo(src.dtype).min
    out = np.full(size, init, dtype=src.dtype)
    np.maximum.at(out, index, src)
    return _rec("scatter_max", src, index, out)


def segment_sum(src: np.ndarray, starts: np.ndarray) -> np.ndarray:
    """Sum within segments of a *sorted* array given run start offsets.

    Equivalent to ``scatter_add`` after Algorithm 3's sort; uses the
    contiguous-segment kernel (``reduceat``) which is what a fused
    sort-based aggregation compiles to.
    """
    if src.size == 0:
        return np.zeros(0, dtype=src.dtype)
    out = np.add.reduceat(src, starts)
    record("scatter_add", src.nbytes + starts.nbytes, out.nbytes, src.size)
    return out


def segment_min(src: np.ndarray, starts: np.ndarray) -> np.ndarray:
    if src.size == 0:
        return np.zeros(0, dtype=src.dtype)
    out = np.minimum.reduceat(src, starts)
    record("scatter_min", src.nbytes + starts.nbytes, out.nbytes, src.size)
    return out


def segment_max(src: np.ndarray, starts: np.ndarray) -> np.ndarray:
    if src.size == 0:
        return np.zeros(0, dtype=src.dtype)
    out = np.maximum.reduceat(src, starts)
    record("scatter_max", src.nbytes + starts.nbytes, out.nbytes, src.size)
    return out
