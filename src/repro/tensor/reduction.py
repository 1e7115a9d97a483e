"""Reduction ops: simple aggregates, histograms, uniques (§2.2)."""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def _red(name: str, a: np.ndarray, out) -> np.ndarray:
    out = np.asarray(out)
    record(name, a.nbytes, out.nbytes, a.size)
    return out


def sum_(a: np.ndarray):
    return _red("sum", a, np.sum(a))


def max_(a: np.ndarray):
    return _red("max", a, np.max(a))


def min_(a: np.ndarray):
    return _red("min", a, np.min(a))


def mean(a: np.ndarray):
    return _red("mean", a, np.mean(a))


def any_(a: np.ndarray):
    return _red("any", a, np.any(a))


def all_(a: np.ndarray):
    return _red("all", a, np.all(a))


def cumsum(a: np.ndarray) -> np.ndarray:
    out = np.cumsum(a)
    record("cumsum", a.nbytes, out.nbytes, a.size)
    return out


def bincount(a: np.ndarray, weights=None, minlength: int = 0) -> np.ndarray:
    """Histogram of non-negative ints (``torch.bincount``)."""
    out = np.bincount(a, weights=weights, minlength=minlength)
    bi = a.nbytes + (weights.nbytes if weights is not None else 0)
    record("bincount", bi, out.nbytes, a.size)
    return out


def unique(a: np.ndarray, *, return_inverse: bool = False):
    """Sorted unique values (``torch.unique``), optionally with inverse."""
    if return_inverse:
        vals, inv = np.unique(a, return_inverse=True)
        record("unique", a.nbytes, vals.nbytes + inv.nbytes, a.size)
        return vals, inv.reshape(-1)
    vals = np.unique(a)
    record("unique", a.nbytes, vals.nbytes, a.size)
    return vals


def unique_consecutive(a: np.ndarray, *, return_inverse: bool = False):
    """Collapse runs of equal *consecutive* values.

    Algorithm 3 applies this to the sorted group keys; the inverse index
    maps every sorted row to its group bucket.  Works on 1-d key codes.
    """
    if a.size == 0:
        starts = np.zeros(0, dtype=np.int64)
        inv = np.zeros(0, dtype=np.int64)
        record("unique_consecutive", 0, 0, 0)
        return (a, inv) if return_inverse else a
    change = np.empty(a.shape[0], dtype=bool)
    change[0] = True
    np.not_equal(a[1:], a[:-1], out=change[1:])
    vals = a[change]
    record("unique_consecutive", a.nbytes, vals.nbytes, a.size)
    if return_inverse:
        inv = np.cumsum(change) - 1
        return vals, inv
    return vals


def group_starts(a: np.ndarray) -> np.ndarray:
    """Start offsets of each run of equal consecutive values (sorted keys)."""
    if a.size == 0:
        return np.zeros(0, dtype=np.int64)
    change = np.empty(a.shape[0], dtype=bool)
    change[0] = True
    np.not_equal(a[1:], a[:-1], out=change[1:])
    out = np.flatnonzero(change)
    record("unique_consecutive", a.nbytes, out.nbytes, a.size)
    return out
