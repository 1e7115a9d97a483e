"""TQP compilation entry point (§4.2): IR → rules → plan → executor.

``compile_plan`` produces a :class:`CompiledQuery` exposing the two
phases the paper separates: data conversion (once per dataset) and
query execution.  Simulated-device timing prices a real execution trace
with a device profile (see :mod:`repro.tensor.device`).
"""
from __future__ import annotations

import pandas as pd

from repro.core import convert, rules
from repro.core.executor import Executor
from repro.core.schema import Table
from repro.tensor.device import PROFILES, tracing


class CompiledQuery:
    """An executable tensor program for one query."""

    def __init__(self, root, mode: str = "torch"):
        self.mode = mode
        self.root = rules.canonicalize_and_optimize(root)
        self.executor = Executor(self.root, mode)

    # -- phase 1: data conversion -------------------------------------
    def convert(self, inputs: dict[str, pd.DataFrame]) -> dict[str, Table]:
        return self.executor.convert_inputs(inputs)

    # -- phase 2: execution -------------------------------------------
    def execute(self, tables: dict[str, Table]) -> pd.DataFrame:
        return convert.table_to_pandas(self.executor.execute(tables))

    def run(self, inputs: dict[str, pd.DataFrame]) -> pd.DataFrame:
        """Convert + execute + materialize the result as pandas."""
        return self.execute(self.convert(inputs))

    # -- simulated devices --------------------------------------------
    def run_traced(self, tables: dict[str, Table]):
        """Execute once while recording the per-op trace."""
        with tracing() as trace:
            out = convert.table_to_pandas(self.executor.execute(tables))
        return out, trace

    def simulated_time(
        self,
        tables: dict[str, Table],
        device: str,
        *,
        scale: float = 1.0,
        fused: bool | None = None,
    ) -> float:
        """Simulated execution time (seconds) on a device profile.

        ``scale`` linearly rescales data sizes in the trace (e.g. report
        SF1-equivalent numbers from an SF0.1 run); ``fused`` defaults to
        True for compiled (jit) mode — a fusing backend merges
        elementwise kernel launches.
        """
        _, trace = self.run_traced(tables)
        if scale != 1.0:
            trace = trace.scaled(scale)
        if fused is None:
            fused = self.mode == "jit"
        return trace.time_on(PROFILES[device], fused=fused)


def compile_plan(plan, mode: str = "torch") -> CompiledQuery:
    """Compile a frontend plan (or raw IR root node) into an executable."""
    root = getattr(plan, "node", plan)  # Plan handle or raw IR Node
    return CompiledQuery(root, mode)
