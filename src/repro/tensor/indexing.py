"""Indexing, slicing, and reorganization ops (§2.2)."""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def masked_select(a: np.ndarray, mask: np.ndarray) -> np.ndarray:
    """Row-select by boolean mask.

    On a 2-d tensor (char-matrix string column) this selects whole rows,
    matching how TQP filters a string column with one bitmap.
    """
    out = a[mask]
    record("masked_select", a.nbytes + mask.nbytes, out.nbytes, a.shape[0])
    return out


def index_select(a: np.ndarray, idx: np.ndarray) -> np.ndarray:
    """Row-gather by integer index (``torch.index_select`` along dim 0)."""
    out = a[idx]
    record("index_select", a.nbytes + idx.nbytes, out.nbytes, idx.size)
    return out


def gather(a: np.ndarray, idx: np.ndarray) -> np.ndarray:
    out = np.take(a, idx)
    record("gather", a.nbytes + idx.nbytes, out.nbytes, idx.size)
    return out


def nonzero(mask: np.ndarray) -> np.ndarray:
    """Indexes of truthy elements (Selection Vector representation)."""
    out = np.flatnonzero(mask)
    record("nonzero", mask.nbytes, out.nbytes, mask.size)
    return out


def scatter_(dest: np.ndarray, index: np.ndarray, src) -> np.ndarray:
    """In-place ``dest[index] = src`` (``Tensor.scatter_`` on dim 0).

    Like the PyTorch op, the *last* write to a duplicated index wins is
    not guaranteed — numpy fancy assignment keeps the final occurrence,
    which is what Algorithm 2's interleaved build relies on.
    """
    dest[index] = src
    record(
        "scatter",
        index.nbytes + getattr(src, "nbytes", 8),
        dest.nbytes,
        index.size,
    )
    return dest


def bucketize(v: np.ndarray, boundaries: np.ndarray, *, right: bool = False) -> np.ndarray:
    """Parallel binary search (``torch.bucketize``).

    ``right=False`` returns the first bucket where ``boundaries[i] >= v``
    i.e. ``searchsorted(..., side="left")`` — the variant Algorithm 1
    needs to map an output offset to its matching-key bucket.
    """
    out = np.searchsorted(boundaries, v, side="right" if right else "left")
    record("bucketize", v.nbytes + boundaries.nbytes, out.nbytes, v.size)
    return out


def narrow(a: np.ndarray, start: int, length: int) -> np.ndarray:
    out = a[start : start + length]
    record("narrow", 0, out.nbytes, out.shape[0] if out.ndim else 1)
    return out


def cat(parts, axis: int = 0) -> np.ndarray:
    """Concatenate tensors (§2.2 "Join" category)."""
    out = np.concatenate(parts, axis=axis)
    record("cat", sum(p.nbytes for p in parts), out.nbytes, out.shape[0])
    return out


def stack(parts, axis: int = 0) -> np.ndarray:
    out = np.stack(parts, axis=axis)
    record("stack", sum(p.nbytes for p in parts), out.nbytes, out.shape[0])
    return out


def python_item(n: int) -> None:
    """Marker for Listing-2 style per-element Python item access.

    Does no work — records ``n`` scalar host accesses so simulated
    devices can price data-dependent Python control flow (Table 1).
    """
    record("python_item", 8 * n, 8 * n, n)
