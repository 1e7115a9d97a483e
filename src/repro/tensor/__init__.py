"""Numpy-backed tensor computation runtime (TCR) substrate.

PyTorch is not available in this environment, so this package provides
the TCR the paper's algorithms run on: the exact §2.2 op surface
(``lt``, ``masked_select``, ``bincount``, ``bucketize``, ``scatter_add``,
``unique_consecutive``, ...) over dense numpy arrays, plus

- :mod:`repro.tensor.device` — device registry with an analytic cost
  model for simulated accelerators (GPUs/TPU/WASM), driven by real
  per-op traces recorded by the dispatcher, and
- :mod:`repro.tensor.strings` — ops over ``(n, m)`` uint8 char-matrix
  string columns (§4.1 data representation).

All ops accept and return ``numpy.ndarray``; when a trace is active
(:func:`repro.tensor.device.tracing`) every op records its name and the
bytes it moved, which the simulated-device cost model consumes.
"""
from repro.tensor import (  # noqa: F401
    creation,
    device,
    elementwise,
    indexing,
    reduction,
    scatter_ops,
    sorting,
    strings,
)
from repro.tensor.tensor import Tensor  # noqa: F401
