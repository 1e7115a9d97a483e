"""Planning layer: map IR operators to tensor-program impls (§4.2.4).

``OPERATOR_IMPLS`` is the dictionary the paper describes: for every IR
node the planner fetches the implementation class and instantiates it
with the node's reference to the frontend operator parameters (the
expressions, key lists, join mode, ...).  ``jit`` mode pre-compiles all
expressions into closures at plan time.
"""
from __future__ import annotations

import numpy as np

from repro.core.ir import Node
from repro.core.operators import aggregate as agg_impl
from repro.core.operators import join_common, join_hash, join_sort
from repro.core.operators.base import evaluator, filter_mask, join_key_codes
from repro.core.schema import Table
from repro.tensor import indexing, sorting


class OperatorImpl:
    """Base class: one compiled tensor program for one IR operator."""

    def __init__(self, node: Node, mode: str):
        self.node = node
        self.params = node.params
        self.mode = mode

    def run(self, inputs: list[Table], ctx) -> Table:  # pragma: no cover
        raise NotImplementedError


class ScanImpl(OperatorImpl):
    """Fetch (a projection of) a converted input table."""

    def run(self, inputs, ctx) -> Table:
        table = ctx.tables[self.params["table"]]
        cols = self.params.get("columns")
        if cols is None:
            return table
        return table.select([c for c in cols if c in table.cols])


class FilterImpl(OperatorImpl):
    """Bitmap filter: predicate → boolean mask → masked_select (§3.1)."""

    def __init__(self, node, mode):
        super().__init__(node, mode)
        self._pred = evaluator(self.params["pred"], mode)

    def run(self, inputs, ctx) -> Table:
        (table,) = inputs
        return table.mask_rows(filter_mask(self._pred(table, ctx)))


class ProjectImpl(OperatorImpl):
    def __init__(self, node, mode):
        super().__init__(node, mode)
        self._exprs = {
            name: evaluator(e, mode) for name, e in self.params["exprs"].items()
        }

    def run(self, inputs, ctx) -> Table:
        (table,) = inputs
        return Table(
            {name: f(table, ctx) for name, f in self._exprs.items()},
            list(self._exprs),
        )


class JoinImpl(OperatorImpl):
    """Equi-join: Algorithm 1 (sort) or Algorithm 2 (hash) + finalize."""

    def __init__(self, node, mode):
        super().__init__(node, mode)
        res = self.params.get("residual")
        self._residual = evaluator(res, mode) if res is not None else None

    def run(self, inputs, ctx) -> Table:
        left, right = inputs
        lk, rk, n_keys = join_key_codes(
            left, right, self.params["left_on"], self.params["right_on"]
        )
        pairs = (
            join_hash.hash_join_pairs
            if self.params.get("impl") == "hash"
            else join_sort.sort_join_pairs
        )
        left_idx, right_idx = pairs(lk, rk, n_keys)
        how = self.params.get("how", "inner")
        return join_common.finalize(
            left, right, left_idx, right_idx, how, self._residual, ctx
        )


class AggregateImpl(OperatorImpl):
    def __init__(self, node, mode):
        super().__init__(node, mode)
        self._inputs = {
            name: evaluator(a.expr, mode)
            for name, a in self.params["aggs"].items()
            if a.expr is not None
        }

    def run(self, inputs, ctx) -> Table:
        (table,) = inputs
        agg_inputs = {name: f(table, ctx) for name, f in self._inputs.items()}
        return agg_impl.run_aggregate(
            table, self.params["keys"], self.params["aggs"], agg_inputs
        )


class SortImpl(OperatorImpl):
    """Multi-key ORDER BY via stable lexsort over order-preserving codes."""

    def run(self, inputs, ctx) -> Table:
        (table,) = inputs
        keys = []
        for name, direction in reversed(self.params["keys"]):
            col = table[name]
            if col.kind == "str":
                k = col.int_codes()
            else:
                k = col.values
                if k.dtype == bool:
                    k = k.astype(np.int64)
            if direction == "desc":
                k = -k
            keys.append(k)
        perm = sorting.lexsort(keys)
        return table.take(perm)


class LimitImpl(OperatorImpl):
    def run(self, inputs, ctx) -> Table:
        (table,) = inputs
        n = min(self.params["n"], table.n)
        return table.take(indexing.narrow(np.arange(table.n, dtype=np.int64), 0, n))


OPERATOR_IMPLS: dict[str, type[OperatorImpl]] = {
    "scan": ScanImpl,
    "filter": FilterImpl,
    "project": ProjectImpl,
    "join": JoinImpl,
    "aggregate": AggregateImpl,
    "sort": SortImpl,
    "limit": LimitImpl,
}


def build_impl(node: Node, mode: str) -> OperatorImpl:
    """Fetch + instantiate the tensor program for one IR operator."""
    try:
        cls = OPERATOR_IMPLS[node.alias]
    except KeyError:  # pragma: no cover
        raise NotImplementedError(f"no tensor implementation for {node.alias}")
    return cls(node, mode)
