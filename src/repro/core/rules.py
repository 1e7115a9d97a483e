"""Canonicalization and optimization rules over the IR (§4.2.3).

Rules are IR-to-IR rewrites applied in two stages, like a classical
rule-based optimizer:

- *canonicalization* removes frontend idiosyncrasies — here, stacked
  filter nodes are merged into one conjunctive predicate;
- *optimization* rewrites for performance — here, column pruning pushes
  the set of actually-referenced columns into every scan, which also
  narrows data conversion (TQP "pushes projections into data
  conversion", §6 footnote 5).

ScalarRef edges are preserved: rules never remove aggregate/limit nodes
(the only legal scalar-subquery targets).
"""
from __future__ import annotations

from repro.core.expr import Agg, BoolOp
from repro.core.ir import Node, node_exprs, topo_order


def merge_filters(root: Node) -> None:
    """Filter(Filter(x, p1), p2) → Filter(x, p1 AND p2)."""
    for node in topo_order(root):
        while node.alias == "filter" and node.inputs[0].alias == "filter":
            inner = node.inputs[0]
            node.params = {
                "pred": BoolOp("and", inner.params["pred"], node.params["pred"])
            }
            node.inputs = list(inner.inputs)


def _expr_columns(node: Node) -> set[str]:
    cols: set[str] = set()
    for e in node_exprs(node):
        cols |= e.columns()
    return cols


def prune_columns(root: Node) -> None:
    """Compute per-node required columns top-down; narrow every scan.

    ``None`` means "all columns".  Requirements flow from a node to its
    inputs; scalar-subquery references add the referenced column to the
    target node's requirement.  Schemas are not known statically, so at
    joins the requirement is sent to *both* sides (a column lands only
    where it exists; scans intersect with the real table schema).
    """
    order = topo_order(root)
    required: dict[int, set[str] | None] = {root.id: None}

    def add(node: Node, cols: set[str] | None) -> None:
        cur = required.get(node.id, set())
        if cols is None or cur is None:
            required[node.id] = None
        else:
            required[node.id] = cur | cols

    for node in reversed(order):
        req = required.get(node.id, set())
        # scalar deps: referenced columns must survive on the target node
        from repro.core.expr import ScalarRef

        def walk(e):
            if isinstance(e, ScalarRef):
                add(e.node, {e.col})
            for c in getattr(e, "children", ()):
                walk(c)

        for e in node_exprs(node):
            walk(e)
        if node.alias == "scan":
            node.params["columns"] = sorted(req) if req is not None else None
            continue
        if node.alias == "project":
            exprs = node.params["exprs"]
            used = exprs if req is None else {n: exprs[n] for n in exprs if n in req}
            need: set[str] = set()
            for e in used.values():
                need |= e.columns()
            add(node.inputs[0], need)
        elif node.alias == "filter":
            need = None if req is None else req | node.params["pred"].columns()
            add(node.inputs[0], need)
        elif node.alias == "aggregate":
            need = set(node.params["keys"])
            for a in node.params["aggs"].values():
                if isinstance(a, Agg):
                    need |= a.columns()
            add(node.inputs[0], need)
        elif node.alias == "join":
            if req is None:
                need = None
            else:
                need = set(req)
                need |= set(node.params["left_on"]) | set(node.params["right_on"])
                res = node.params.get("residual")
                if res is not None:
                    need |= res.columns()
            add(node.inputs[0], need)
            add(node.inputs[1], need)
        elif node.alias == "sort":
            need = (
                None
                if req is None
                else req | {name for name, _ in node.params["keys"]}
            )
            add(node.inputs[0], need)
        elif node.alias == "limit":
            add(node.inputs[0], req if req is not None else None)
        else:  # pragma: no cover
            for inp in node.inputs:
                add(inp, None)


def canonicalize_and_optimize(root: Node) -> Node:
    """Apply both rule stages in order; returns the (mutated) root."""
    merge_filters(root)
    prune_columns(root)
    return root
