"""Sorting ops (§2.2 "Reorganization")."""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def sort(a: np.ndarray):
    """Return ``(sorted_values, argsort_indexes)`` like ``torch.sort``."""
    idx = np.argsort(a, kind="stable")
    vals = a[idx]
    record("sort", a.nbytes, vals.nbytes + idx.nbytes, a.size)
    return vals, idx


def argsort(a: np.ndarray) -> np.ndarray:
    idx = np.argsort(a, kind="stable")
    record("argsort", a.nbytes, idx.nbytes, a.size)
    return idx


def lexsort(keys) -> np.ndarray:
    """Stable multi-key argsort; last key in ``keys`` is primary
    (numpy convention)."""
    idx = np.lexsort(keys)
    record("lexsort", sum(k.nbytes for k in keys), idx.nbytes, idx.size)
    return idx
