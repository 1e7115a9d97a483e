"""TQP's graph-based intermediate representation (§4.2.1).

A :class:`Node` is one relational operator: an alias identifying the
operator type, a parameter dict (the reference to the frontend operator
instance — expressions, key lists, etc.), and input edges.  Output
variables are the node's output columns; they are created fresh by every
operator (columns are immutable once produced), which is what lets the
executor garbage-collect intermediates safely (§4.2.5).
"""
from __future__ import annotations

import itertools

from repro.core.expr import Agg, Expr

_ids = itertools.count()

# alias -> parameter keys holding expressions (used for dep discovery)
_EXPR_PARAMS = {
    "filter": ("pred",),
    "project": ("exprs",),
    "join": ("residual",),
    "aggregate": ("aggs",),
}


class Node:
    """One IR operator node."""

    __slots__ = ("id", "alias", "params", "inputs")

    def __init__(self, alias: str, params: dict, inputs: list["Node"]):
        self.id = next(_ids)
        self.alias = alias
        self.params = params
        self.inputs = inputs

    def __repr__(self) -> str:  # pragma: no cover
        return f"<{self.alias}#{self.id}>"


def node_exprs(node: Node) -> list[Expr]:
    """All expression trees referenced by a node's parameters."""
    out: list[Expr] = []
    for key in _EXPR_PARAMS.get(node.alias, ()):
        v = node.params.get(key)
        if v is None:
            continue
        if isinstance(v, Expr):
            out.append(v)
        elif isinstance(v, dict):
            for item in v.values():
                if isinstance(item, Expr):
                    out.append(item)
                elif isinstance(item, Agg) and item.expr is not None:
                    out.append(item.expr)
    return out


def scalar_dep_nodes(node: Node) -> list[Node]:
    """Plan nodes referenced via scalar subqueries in this node's exprs."""
    deps: list[Node] = []
    for e in node_exprs(node):
        deps.extend(e.scalar_deps())
    return deps


def all_deps(node: Node) -> list[Node]:
    return list(node.inputs) + scalar_dep_nodes(node)


def topo_order(root: Node) -> list[Node]:
    """Postorder DFS over the DAG (shared nodes visited once, §4.2.2)."""
    order: list[Node] = []
    seen: set[int] = set()
    stack: list[tuple[Node, bool]] = [(root, False)]
    while stack:
        node, expanded = stack.pop()
        if expanded:
            order.append(node)
            continue
        if node.id in seen:
            continue
        seen.add(node.id)
        stack.append((node, True))
        for dep in all_deps(node):
            if dep.id not in seen:
                stack.append((dep, False))
    return order


def all_nodes(root: Node) -> list[Node]:
    return topo_order(root)
