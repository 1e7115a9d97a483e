"""String columns as ``(n, m)`` uint8 char-matrix tensors (§4.1).

A string column with max length ``m`` is one dense uint8 tensor: one
character per tensor column, right-padded with 0s.  All string
predicates (equality, ``LIKE``, ``IN``, ``substring``) are tensor ops
over this matrix — no Python-level per-row work.
"""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def encode(values) -> np.ndarray:
    """Encode an iterable of strings into an ``(n, m)`` uint8 matrix."""
    arr = np.asarray(values, dtype="S")
    m = max(arr.dtype.itemsize, 1)
    out = arr.view(np.uint8).reshape(len(arr), m) if len(arr) else np.zeros(
        (0, m), dtype=np.uint8
    )
    out = np.ascontiguousarray(out)
    record("encode_str", 0, out.nbytes, len(arr))
    return out


def encode_const(s: str, m: int) -> np.ndarray:
    """Encode one literal into a length-``m`` uint8 vector (0-padded)."""
    b = s.encode()
    out = np.zeros(m, dtype=np.uint8)
    out[: len(b)] = np.frombuffer(b[:m], dtype=np.uint8)
    return out


def decode(mat: np.ndarray) -> np.ndarray:
    """Decode a char matrix back into an object array of ``str``."""
    n, m = mat.shape
    as_bytes = np.ascontiguousarray(mat).view(f"S{m}").reshape(n)
    out = np.array([b.decode() for b in as_bytes], dtype=object)
    record("decode_str", mat.nbytes, mat.nbytes, n)
    return out


def lengths(mat: np.ndarray) -> np.ndarray:
    """Per-row string lengths (strings contain no interior NULs)."""
    out = (mat != 0).sum(axis=1)
    record("ne", mat.nbytes, out.nbytes, mat.shape[0])
    return out


def eq_const(mat: np.ndarray, s: str) -> np.ndarray:
    """``col = 'literal'`` as one vectorized comparison (§5.1 example)."""
    n, m = mat.shape
    if len(s.encode()) > m:
        out = np.zeros(n, dtype=bool)
    else:
        out = (mat == encode_const(s, m)).all(axis=1)
    record("eq", mat.nbytes, out.nbytes, n)
    return out


def eq_rows(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Row-wise equality of two string columns (pads to common width)."""
    m = max(a.shape[1], b.shape[1])
    if a.shape[1] < m:
        a = np.pad(a, ((0, 0), (0, m - a.shape[1])))
    if b.shape[1] < m:
        b = np.pad(b, ((0, 0), (0, m - b.shape[1])))
    out = (a == b).all(axis=1)
    record("eq", a.nbytes + b.nbytes, out.nbytes, a.shape[0])
    return out


def isin_consts(mat: np.ndarray, values) -> np.ndarray:
    """``col IN (...)`` — OR of vectorized equality comparisons."""
    out = np.zeros(mat.shape[0], dtype=bool)
    for v in values:
        out |= eq_const(mat, v)
    return out


def codes(mat: np.ndarray) -> np.ndarray:
    """Dense int codes preserving lexicographic order.

    Views each row as a fixed-width byte string (numpy sorts those
    lexicographically) and densifies with ``unique`` — the same
    sort+unique primitive TQP uses to make string columns joinable,
    sortable, and groupable as plain integer tensors.
    """
    n, m = mat.shape
    as_bytes = np.ascontiguousarray(mat).view(f"S{m}").reshape(n)
    _, inv = np.unique(as_bytes, return_inverse=True)
    inv = inv.reshape(-1).astype(np.int64)
    record("unique", mat.nbytes, inv.nbytes, n)
    return inv


def substring(mat: np.ndarray, start: int, length: int) -> np.ndarray:
    """SQL ``substring(col, start, length)`` (1-based) as a column slice."""
    out = np.ascontiguousarray(mat[:, start - 1 : start - 1 + length])
    record("narrow", mat.nbytes, out.nbytes, mat.shape[0])
    return out


def _find_from(
    mat: np.ndarray, sub: str, pos: np.ndarray, lens: np.ndarray
) -> np.ndarray:
    """First occurrence index of ``sub`` at/after ``pos`` per row; -1 if none."""
    n, m = mat.shape
    k = len(sub.encode())
    if k == 0:
        return pos.copy()
    if k > m:
        return np.full(n, -1, dtype=np.int64)
    target = np.frombuffer(sub.encode(), dtype=np.uint8)
    win = np.lib.stride_tricks.sliding_window_view(mat, k, axis=1)
    match = (win == target).all(axis=2)
    starts = np.arange(m - k + 1, dtype=np.int64)
    valid = match & (starts[None, :] >= pos[:, None])
    valid &= starts[None, :] <= (lens - k)[:, None]
    has = valid.any(axis=1)
    first = np.where(has, valid.argmax(axis=1), -1).astype(np.int64)
    record("like_scan", mat.nbytes, first.nbytes, n)
    return first


def like(mat: np.ndarray, pattern: str) -> np.ndarray:
    """SQL ``LIKE`` with ``%`` wildcards, fully vectorized.

    Supports any mix of anchors and multi-``%`` ordered containment
    (e.g. ``'%special%requests%'``, ``'PROMO%'``, ``'%BRASS'``).
    ``_`` wildcards are not needed by TPC-H and are not supported.
    """
    n, m = mat.shape
    if "_" in pattern:
        raise NotImplementedError("LIKE '_' wildcard not supported")
    if "%" not in pattern:
        return eq_const(mat, pattern)
    lens = (mat != 0).sum(axis=1).astype(np.int64)
    segs = [s for s in pattern.split("%") if s]
    ok = np.ones(n, dtype=bool)
    pos = np.zeros(n, dtype=np.int64)
    anchored_start = not pattern.startswith("%")
    anchored_end = not pattern.endswith("%")
    end_seg = segs[-1] if (anchored_end and segs) else None
    mid = list(segs)
    if anchored_start and mid:
        s0 = mid.pop(0)
        k = len(s0.encode())
        if k > m:
            return np.zeros(n, dtype=bool)
        ok &= (mat[:, :k] == np.frombuffer(s0.encode(), np.uint8)).all(axis=1)
        pos = np.full(n, k, dtype=np.int64)
    if end_seg is not None and mid:
        mid.pop()  # the last segment is handled as the anchored suffix
    for s in mid:
        idx = _find_from(mat, s, pos, lens)
        ok &= idx >= 0
        pos = idx + len(s.encode())
    if end_seg is not None:
        k = len(end_seg.encode())
        start_at = lens - k
        okpos = start_at >= pos
        # Gather the per-row suffix window and compare.
        safe = np.maximum(start_at, 0)
        cols = safe[:, None] + np.arange(k)[None, :]
        cols = np.minimum(cols, m - 1)
        suffix = mat[np.arange(n)[:, None], cols]
        target = np.frombuffer(end_seg.encode(), np.uint8)
        ok &= okpos & (suffix == target).all(axis=1) & (lens >= k)
    record("like", mat.nbytes, ok.nbytes, n)
    return ok
