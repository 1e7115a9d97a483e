"""Elementwise arithmetic, comparison, and logical ops (§2.2)."""
from __future__ import annotations

import numpy as np

from repro.tensor.device import record


def _binop(name: str, fn, a, b) -> np.ndarray:
    out = fn(a, b)
    bi = getattr(a, "nbytes", 8) + getattr(b, "nbytes", 8)
    record(name, bi, out.nbytes, out.size)
    return out


def _unop(name: str, fn, a) -> np.ndarray:
    out = fn(a)
    record(name, a.nbytes, out.nbytes, out.size)
    return out


def add(a, b):
    return _binop("add", np.add, a, b)


def sub(a, b):
    return _binop("sub", np.subtract, a, b)


def mul(a, b):
    return _binop("mul", np.multiply, a, b)


def div(a, b):
    return _binop("div", np.divide, a, b)


def fmod(a, b):
    return _binop("fmod", np.fmod, a, b)


def remainder(a, b):
    return _binop("remainder", np.remainder, a, b)


def floor_div(a, b):
    """``torch.div(..., rounding_mode="floor")`` as used by Algorithm 1."""
    return _binop("div", np.floor_divide, a, b)


def neg(a):
    return _unop("neg", np.negative, a)


def abs_(a):
    return _unop("abs", np.abs, a)


def eq(a, b):
    return _binop("eq", np.equal, a, b)


def ne(a, b):
    return _binop("ne", np.not_equal, a, b)


def lt(a, b):
    return _binop("lt", np.less, a, b)


def le(a, b):
    return _binop("le", np.less_equal, a, b)


def gt(a, b):
    return _binop("gt", np.greater, a, b)


def ge(a, b):
    return _binop("ge", np.greater_equal, a, b)


def isnan(a):
    return _unop("isnan", np.isnan, a)


def logical_and(a, b):
    return _binop("logical_and", np.logical_and, a, b)


def logical_or(a, b):
    return _binop("logical_or", np.logical_or, a, b)


def logical_not(a):
    return _unop("logical_not", np.logical_not, a)


def minimum(a, b):
    return _binop("minimum", np.minimum, a, b)


def maximum(a, b):
    return _binop("maximum", np.maximum, a, b)


def where(cond: np.ndarray, a, b) -> np.ndarray:
    """Conditional select (``torch.where``)."""
    out = np.where(cond, a, b)
    bi = cond.nbytes + getattr(a, "nbytes", 8) + getattr(b, "nbytes", 8)
    record("where", bi, out.nbytes, out.size)
    return out
