"""Execution layer: run the operator plan on the TCR (§4.2.5, §4.3).

The executor calls each tensor program in topological order, wires
output tensors into successors, and reference-counts intermediate
results so they are garbage-collected as soon as their last consumer
(including scalar-subquery consumers) has run.
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from repro.core import convert
from repro.core.ir import Node, all_deps, topo_order
from repro.core.planner import build_impl
from repro.core.schema import Table


class RunContext:
    """Per-run state: converted inputs, node outputs, scalar cache."""

    def __init__(self, tables: dict[str, Table]):
        self.tables = tables
        self.outputs: dict[int, Table] = {}


class Executor:
    """A compiled operator plan, executable over converted tensor tables."""

    def __init__(self, root: Node, mode: str):
        self.root = root
        self.mode = mode
        self.order = topo_order(root)
        self.impls = {n.id: build_impl(n, mode) for n in self.order}
        # static consumer counts for tensor GC
        self.consumers: Counter[int] = Counter()
        for node in self.order:
            for dep in all_deps(node):
                self.consumers[dep.id] += 1

    def scan_columns(self) -> dict[str, list[str] | None]:
        """Per input table: union of columns needed by its scans."""
        need: dict[str, set[str] | None] = {}
        for node in self.order:
            if node.alias != "scan":
                continue
            name = node.params["table"]
            cols = node.params.get("columns")
            if cols is None or need.get(name, set()) is None:
                need[name] = None
            else:
                need.setdefault(name, set()).update(cols)
        return {
            name: (sorted(cols) if cols is not None else None)
            for name, cols in need.items()
        }

    def execute(self, tables: dict[str, Table]) -> Table:
        ctx = RunContext(tables)
        remaining = Counter(self.consumers)
        for node in self.order:
            inputs = [ctx.outputs[i.id] for i in node.inputs]
            ctx.outputs[node.id] = self.impls[node.id].run(inputs, ctx)
            for dep in all_deps(node):
                remaining[dep.id] -= 1
                if remaining[dep.id] == 0 and dep.id != self.root.id:
                    del ctx.outputs[dep.id]  # tensor GC (§4.2.5)
        return ctx.outputs[self.root.id]

    def convert_inputs(self, inputs: dict[str, pd.DataFrame]) -> dict[str, Table]:
        """Data conversion step (§4.3), honoring pushed-down projections."""
        need = self.scan_columns()
        out: dict[str, Table] = {}
        for name, cols in need.items():
            pdf = inputs[name]
            use = [c for c in cols if c in pdf.columns] if cols is not None else None
            out[name] = convert.pandas_to_table(pdf, use)
        return out
