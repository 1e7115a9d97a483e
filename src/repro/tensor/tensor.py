"""A thin ``torch.Tensor``-like facade over numpy arrays.

The relational operators call the functional op modules directly (they
are the hot path); this wrapper exists so that paper listings (e.g.
Listing 1/2 in §3.1) can be transcribed nearly verbatim in tests and
microbenchmarks, including the pathological Python-control-flow variant.
"""
from __future__ import annotations

import numpy as np

from repro.tensor import elementwise as ew
from repro.tensor import indexing as ix
from repro.tensor.device import record


class Tensor:
    """Dense tensor on a (possibly simulated) device."""

    __slots__ = ("data",)

    def __init__(self, data) -> None:
        self.data = np.asarray(data)

    # -- metadata ------------------------------------------------------
    @property
    def shape(self):
        return self.data.shape

    @property
    def dtype(self):
        return self.data.dtype

    def __len__(self) -> int:
        return self.data.shape[0]

    def numpy(self) -> np.ndarray:
        return self.data

    # -- scalar access (prices Listing-2 style Python loops) -----------
    def __getitem__(self, i):
        out = self.data[i]
        if np.isscalar(i) or isinstance(i, (int, np.integer)):
            record("python_item", 8, 8, 1)
            return out
        return Tensor(out)

    def __setitem__(self, i, v) -> None:
        if np.isscalar(i) or isinstance(i, (int, np.integer)):
            record("python_item", 8, 8, 1)
        self.data[i] = v.data if isinstance(v, Tensor) else v

    def item(self):
        record("item", self.data.nbytes, 8, 1)
        return self.data.item()

    # -- ops (dispatch through the metered functional layer) -----------
    def _coerce(self, other):
        return other.data if isinstance(other, Tensor) else other

    def __lt__(self, o):
        return Tensor(ew.lt(self.data, self._coerce(o)))

    def __le__(self, o):
        return Tensor(ew.le(self.data, self._coerce(o)))

    def __gt__(self, o):
        return Tensor(ew.gt(self.data, self._coerce(o)))

    def __ge__(self, o):
        return Tensor(ew.ge(self.data, self._coerce(o)))

    def __add__(self, o):
        return Tensor(ew.add(self.data, self._coerce(o)))

    def __sub__(self, o):
        return Tensor(ew.sub(self.data, self._coerce(o)))

    def __mul__(self, o):
        return Tensor(ew.mul(self.data, self._coerce(o)))

    def __truediv__(self, o):
        return Tensor(ew.div(self.data, self._coerce(o)))

    def masked_select(self, mask: "Tensor") -> "Tensor":
        return Tensor(ix.masked_select(self.data, mask.data))

    def sum(self):
        from repro.tensor import reduction

        return float(reduction.sum_(self.data))


def lt(a: Tensor, b) -> Tensor:
    """``torch.lt`` — Listing 1 line 1."""
    return a < b


def masked_select(a: Tensor, mask: Tensor) -> Tensor:
    """``torch.masked_select`` — Listing 1 line 2."""
    return a.masked_select(mask)


def zeros_like(a: Tensor) -> Tensor:
    from repro.tensor import creation

    return Tensor(creation.zeros_like(a.data))
