"""Fluent physical-plan builder — the reproduction's frontend (§4.2.2)."""
from __future__ import annotations

from repro.core.expr import Agg, Col, Expr, ScalarRef
from repro.core.ir import Node


class Plan:
    """A handle on an IR node with fluent operators for plan construction."""

    def __init__(self, node: Node):
        self.node = node

    # -- relational operators -----------------------------------------
    def filter(self, pred: Expr) -> "Plan":
        return Plan(Node("filter", {"pred": pred}, [self.node]))

    def project(self, **exprs) -> "Plan":
        """Projection; string values are shorthand for column renames."""
        resolved = {
            name: (Col(e) if isinstance(e, str) else e) for name, e in exprs.items()
        }
        return Plan(Node("project", {"exprs": resolved}, [self.node]))

    def select(self, *names: str) -> "Plan":
        return self.project(**{n: Col(n) for n in names})

    def join(
        self,
        other: "Plan",
        left_on: list[str],
        right_on: list[str],
        how: str = "inner",
        residual: Expr | None = None,
        impl: str = "sort",
    ) -> "Plan":
        """Equi-join with optional residual (non-equi) condition.

        ``how`` ∈ inner | left_outer | left_semi | left_anti;
        ``impl`` ∈ sort (Algorithm 1) | hash (Algorithm 2).
        """
        return Plan(
            Node(
                "join",
                {
                    "left_on": list(left_on),
                    "right_on": list(right_on),
                    "how": how,
                    "residual": residual,
                    "impl": impl,
                },
                [self.node, other.node],
            )
        )

    def aggregate(self, keys: list[str], aggs: dict[str, Agg]) -> "Plan":
        return Plan(
            Node("aggregate", {"keys": list(keys), "aggs": dict(aggs)}, [self.node])
        )

    def sort(self, keys: list[tuple[str, str]]) -> "Plan":
        """Order by ``[(column, "asc"|"desc"), ...]``."""
        return Plan(Node("sort", {"keys": list(keys)}, [self.node]))

    def limit(self, n: int) -> "Plan":
        return Plan(Node("limit", {"n": n}, [self.node]))

    def distinct(self, *names: str) -> "Plan":
        """DISTINCT projection as a key-only aggregation."""
        base = self.select(*names) if names else self
        cols = names or tuple(
            base.node.params["exprs"] if base.node.alias == "project" else ()
        )
        return base.aggregate(list(cols), {})

    # -- scalar subqueries --------------------------------------------
    def scalar(self, colname: str) -> ScalarRef:
        """Use this (1-row) plan's column as a scalar in another plan."""
        return ScalarRef(self.node, colname)


def scan(table: str) -> Plan:
    """Scan a named input table."""
    return Plan(Node("scan", {"table": table, "columns": None}, []))
