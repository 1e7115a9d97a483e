"""Devices, op tracing, and the analytic cost model for simulated hardware.

The real device is ``cpu`` (numpy kernels, wall-clock timing).  All other
devices are *simulated*: the tensor program executes functionally on CPU
while the dispatcher records one :class:`OpRecord` per tensor op; a
:class:`DeviceProfile` then prices the trace as

    time(op) = launch_s + moved_bytes / bw * factor(op) [+ sync_s]

where ``factor`` multiplies sort-class ops by ``log2(n)`` (comparison
sorts) and ``sync_s`` is added for ops whose output size is data
dependent and therefore require host/device synchronization (the paper
calls out ``nonzero`` for exactly this, §6.5).

Profiles are calibrated once against the paper's published Q6 numbers
(Table 4) and then held fixed for every experiment; see EXPERIMENTS.md.
"""
from __future__ import annotations

import math
from contextlib import contextmanager
from dataclasses import dataclass

# Ops whose cost scales ~ n log n (comparison/radix sorts, uniques).
SORT_OPS = frozenset(
    {"sort", "argsort", "lexsort", "unique", "unique_consecutive"}
)
# Ops with data-dependent output sizes => host/device sync on accelerators.
SYNC_OPS = frozenset({"nonzero", "masked_select", "unique", "item"})
# Cheap elementwise ops that a fusing compiler (TorchScript/TVM) merges
# into a single kernel launch.
ELEMENTWISE_OPS = frozenset(
    {
        "add", "sub", "mul", "div", "fmod", "remainder", "neg", "abs",
        "eq", "ne", "lt", "le", "gt", "ge", "isnan", "where",
        "logical_and", "logical_or", "logical_not", "minimum", "maximum",
    }
)


@dataclass(frozen=True)
class OpRecord:
    """One executed tensor op: name + bytes moved + output cardinality."""

    name: str
    bytes_in: int
    bytes_out: int
    n: int  # dominant element count (for log factors / python-loop costs)


@dataclass(frozen=True)
class DeviceProfile:
    """Analytic performance model of one hardware backend.

    ``launch_s``    per-kernel dispatch/launch latency (seconds)
    ``bw``          effective memory bandwidth (bytes/second)
    ``sort_factor`` extra multiplier applied per log2(n) for sort ops
    ``sync_s``      host/device round-trip for data-dependent-size ops
    ``python_item_s`` cost of one Python-level scalar item access —
                    prices Listing-2 style data-dependent control flow
    """

    name: str
    launch_s: float
    bw: float
    sort_factor: float
    sync_s: float
    python_item_s: float

    def op_time(self, r: OpRecord) -> float:
        t = self.launch_s + (r.bytes_in + r.bytes_out) / self.bw
        if r.name in SORT_OPS and r.n > 1:
            t += (r.bytes_in / self.bw) * self.sort_factor * math.log2(r.n)
        if r.name in SYNC_OPS:
            t += self.sync_s
        if r.name == "python_item":
            t = self.python_item_s * r.n
        return t


# Calibrated against Table 4 of the paper (Q6 hand-opt, SF1) and the
# GPU/CPU ratios of Table 2; see EXPERIMENTS.md § calibration.
PROFILES: dict[str, DeviceProfile] = {
    p.name: p
    for p in [
        # NVIDIA data-center GPUs: HBM-class bandwidth, ~5-10us launches.
        DeviceProfile("gpu-p100", 8e-6, 550e9, 0.08, 30e-6, 35e-6),
        DeviceProfile("gpu-v100", 7e-6, 830e9, 0.08, 25e-6, 35e-6),
        DeviceProfile("gpu-t4", 9e-6, 260e9, 0.08, 30e-6, 35e-6),
        DeviceProfile("gpu-k80", 20e-6, 110e9, 0.10, 100e-6, 45e-6),
        # TPU via an XLA-like path: fast HBM but heavyweight per-op
        # dispatch and no fallback-free data-dependent ops.
        DeviceProfile("tpu", 1.5e-3, 600e9, 0.10, 2e-3, 60e-6),
        # Integrated GPUs: share DDR with the CPU; effective bandwidth of
        # generic Metal-codegen kernels is far below peak.
        DeviceProfile("igpu-intel", 30e-6, 7.5e9, 0.12, 40e-6, 40e-6),
        DeviceProfile("igpu-amd", 25e-6, 28e9, 0.12, 40e-6, 40e-6),
        # Browser/WASM: single-threaded, no SIMD assumed, tiny "bandwidth".
        DeviceProfile("wasm-chrome", 2e-6, 0.25e9, 0.25, 0.0, 3e-6),
    ]
}


class OpTrace:
    """Accumulates :class:`OpRecord` objects for one program execution."""

    def __init__(self) -> None:
        self.records: list[OpRecord] = []

    def add(self, rec: OpRecord) -> None:
        self.records.append(rec)

    def scaled(self, k: float) -> "OpTrace":
        """Return a trace with data sizes scaled by ``k``.

        Launch counts are structural (one per op in the compiled program)
        so they do not scale; bytes and element counts do.  Used to report
        SF1-equivalent simulated times from an SF0.1 run.
        """
        t = OpTrace()
        for r in self.records:
            t.add(
                OpRecord(
                    r.name,
                    int(r.bytes_in * k),
                    int(r.bytes_out * k),
                    int(r.n * k),
                )
            )
        return t

    def time_on(self, profile: DeviceProfile, *, fused: bool = False) -> float:
        """Price the trace on ``profile``.

        ``fused=True`` models a fusing compiler (TorchScript/TVM): each
        maximal run of consecutive elementwise ops costs a single launch
        and only the run's first input + last output cross memory.
        """
        total = 0.0
        i, recs = 0, self.records
        while i < len(recs):
            r = recs[i]
            if fused and r.name in ELEMENTWISE_OPS:
                j = i
                while j + 1 < len(recs) and recs[j + 1].name in ELEMENTWISE_OPS:
                    j += 1
                last = recs[j]
                total += profile.launch_s + (
                    r.bytes_in + last.bytes_out
                ) / profile.bw
                i = j + 1
            else:
                total += profile.op_time(r)
                i += 1
        return total


_current: OpTrace | None = None


def record(name: str, bytes_in: int, bytes_out: int, n: int) -> None:
    """Record one op into the active trace (no-op when not tracing)."""
    if _current is not None:
        _current.add(OpRecord(name, bytes_in, bytes_out, n))


def is_tracing() -> bool:
    return _current is not None


@contextmanager
def tracing():
    """Context manager that installs a fresh :class:`OpTrace` and yields it."""
    global _current
    prev, _current = _current, OpTrace()
    try:
        yield _current
    finally:
        _current = prev
