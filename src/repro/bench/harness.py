"""Timing protocol and table formatting.

The paper does 10 runs per measurement (5 warm-up) and reports the
median of the last 5.  That protocol is preserved but scaled through
``REPRO_BENCH_WARMUP`` / ``REPRO_BENCH_RUNS`` so the full suite stays
tractable in CI (defaults: 2 warm-ups, median of 3).
"""
from __future__ import annotations

import os
import statistics
import time


def bench(fn, warmup: int | None = None, runs: int | None = None) -> float:
    """Median wall-clock seconds of ``fn()`` after warm-up runs."""
    if warmup is None:
        warmup = int(os.environ.get("REPRO_BENCH_WARMUP", "2"))
    if runs is None:
        runs = int(os.environ.get("REPRO_BENCH_RUNS", "3"))
    for _ in range(warmup):
        fn()
    times = []
    for _ in range(max(runs, 1)):
        t0 = time.perf_counter()
        fn()
        times.append(time.perf_counter() - t0)
    return statistics.median(times)


def fmt_table(headers: list[str], rows: list[list]) -> str:
    """Fixed-width text table (the jobs print these)."""
    def cell(v):
        if isinstance(v, float):
            return f"{v:.3f}"
        return str(v)

    srows = [[cell(v) for v in r] for r in rows]
    widths = [
        max(len(h), *(len(r[i]) for r in srows)) if srows else len(h)
        for i, h in enumerate(headers)
    ]
    out = ["  ".join(h.ljust(w) for h, w in zip(headers, widths))]
    out.append("  ".join("-" * w for w in widths))
    for r in srows:
        out.append("  ".join(c.ljust(w) for c, w in zip(r, widths)))
    return "\n".join(out)
