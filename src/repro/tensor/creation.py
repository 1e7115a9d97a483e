"""Tensor creation ops (§2.2 "Creation")."""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def _rec(name: str, out: np.ndarray) -> np.ndarray:
    record(name, 0, out.nbytes, out.size)
    return out


def arange(n: int, dtype=np.int64) -> np.ndarray:
    """Equivalent of ``torch.arange``."""
    return _rec("arange", np.arange(n, dtype=dtype))


def zeros(shape, dtype=np.float64) -> np.ndarray:
    return _rec("zeros", np.zeros(shape, dtype=dtype))


def ones(shape, dtype=np.float64) -> np.ndarray:
    return _rec("ones", np.ones(shape, dtype=dtype))


def full(shape, value, dtype=None) -> np.ndarray:
    return _rec("full", np.full(shape, value, dtype=dtype))


def empty(shape, dtype=np.float64) -> np.ndarray:
    return _rec("empty", np.empty(shape, dtype=dtype))


def zeros_like(a: np.ndarray) -> np.ndarray:
    return _rec("zeros", np.zeros_like(a))


def ones_like(a: np.ndarray) -> np.ndarray:
    return _rec("ones", np.ones_like(a))


def from_numpy(a) -> np.ndarray:
    """Zero-copy ingest of an external array (``torch.from_numpy``)."""
    return np.asarray(a)
