"""Relational expressions compiled to tensor-op chains (§5.1).

Each node knows how to apply itself to already-evaluated child columns
(``_apply``); the two execution modalities differ only in dispatch:

- ``eval``  — tree-walking interpretation, re-dispatching every op per
  run (the "Torch"/eager modality), and
- ``build`` — one-time compilation into nested Python closures, removing
  per-run tree traversal (the "TorchScript"/TQPJ modality).

The operator→tensor-op dictionary of §5.1 is embodied in ``_ARITH`` and
``_CMP`` below: ``*`` → ``mul``, ``=`` → ``eq`` (or the char-matrix
comparison for strings), ``AND`` → ``logical_and``, and so on.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.schema import DATE, NUM, STR, Column
from repro.tensor import elementwise as ew
from repro.tensor import strings

_ARITH = {"+": ew.add, "-": ew.sub, "*": ew.mul, "/": ew.div, "%": ew.remainder}
_CMP = {"==": ew.eq, "!=": ew.ne, "<": ew.lt, "<=": ew.le, ">": ew.gt, ">=": ew.ge}


def _and_masks(*cols: Column) -> np.ndarray | None:
    mask = None
    for c in cols:
        if c.mask is not None:
            mask = c.mask if mask is None else ew.logical_and(mask, c.mask)
    return mask


class Expr:
    """Base expression node."""

    children: tuple["Expr", ...] = ()

    def _apply(self, cols, table, ctx) -> Column:  # pragma: no cover
        raise NotImplementedError

    def eval(self, table, ctx) -> Column:
        """Interpreted evaluation: walk the tree, dispatching per op."""
        return self._apply([c.eval(table, ctx) for c in self.children], table, ctx)

    def build(self):
        """Compile once into closures (no per-run tree walk)."""
        childfns = [c.build() for c in self.children]
        apply = self._apply
        return lambda table, ctx: apply(
            [f(table, ctx) for f in childfns], table, ctx
        )

    def columns(self) -> set[str]:
        out: set[str] = set()
        for c in self.children:
            out |= c.columns()
        return out

    def scalar_deps(self) -> list:
        out = []
        for c in self.children:
            out.extend(c.scalar_deps())
        return out

    # sugar so plans read like expressions ----------------------------
    def __add__(self, o):
        return BinArith("+", self, _wrap(o))

    def __sub__(self, o):
        return BinArith("-", self, _wrap(o))

    def __mul__(self, o):
        return BinArith("*", self, _wrap(o))

    def __truediv__(self, o):
        return BinArith("/", self, _wrap(o))

    def __eq__(self, o):  # type: ignore[override]
        return Cmp("==", self, _wrap(o))

    def __ne__(self, o):  # type: ignore[override]
        return Cmp("!=", self, _wrap(o))

    def __lt__(self, o):
        return Cmp("<", self, _wrap(o))

    def __le__(self, o):
        return Cmp("<=", self, _wrap(o))

    def __gt__(self, o):
        return Cmp(">", self, _wrap(o))

    def __ge__(self, o):
        return Cmp(">=", self, _wrap(o))

    def __and__(self, o):
        return BoolOp("and", self, _wrap(o))

    def __or__(self, o):
        return BoolOp("or", self, _wrap(o))

    def __invert__(self):
        return Not(self)

    def __hash__(self):
        return id(self)

    def isin(self, values):
        return InList(self, list(values))

    def like(self, pattern: str):
        return Like(self, pattern)

    def not_like(self, pattern: str):
        return Not(Like(self, pattern))

    def between(self, lo, hi):
        return (self >= _wrap(lo)) & (self <= _wrap(hi))

    def is_null(self):
        return IsNull(self)

    def is_not_null(self):
        return Not(IsNull(self))

    def substr(self, start: int, length: int):
        return Substr(self, start, length)

    def year(self):
        return Year(self)


def _wrap(v) -> "Expr":
    if isinstance(v, Expr):
        return v
    if isinstance(v, str):
        return StrLit(v)
    return Lit(v)


class Col(Expr):
    """A column reference (leaf: fetch the column tensor, §5.1)."""

    def __init__(self, name: str):
        self.name = name

    def _apply(self, cols, table, ctx) -> Column:
        return table[self.name]

    def columns(self) -> set[str]:
        return {self.name}


class Lit(Expr):
    """A numeric constant (0-d tensor, broadcast by the TCR)."""

    def __init__(self, value):
        self.value = np.asarray(value)

    def _apply(self, cols, table, ctx) -> Column:
        return Column(self.value, NUM)


class StrLit(Expr):
    """A string constant (kept as Python str; §5.1 encodes on use)."""

    def __init__(self, s: str):
        self.s = s

    def _apply(self, cols, table, ctx) -> Column:
        raise TypeError("string literal used outside a string comparison")


class DateLit(Expr):
    """A date constant as an int64-nanosecond 0-d tensor (§4.1)."""

    def __init__(self, s: str):
        self.value = np.datetime64(s, "ns").astype(np.int64)

    def _apply(self, cols, table, ctx) -> Column:
        return Column(np.asarray(self.value), DATE)


class BinArith(Expr):
    def __init__(self, op: str, l: Expr, r: Expr):
        self.op = op
        self.children = (l, r)

    def _apply(self, cols, table, ctx) -> Column:
        l, r = cols
        return Column(_ARITH[self.op](l.values, r.values), NUM, _and_masks(l, r))


class Cmp(Expr):
    """Comparison; dispatches to char-matrix ops for string operands."""

    def __init__(self, op: str, l: Expr, r: Expr):
        self.op = op
        self.children = (l, r)

    def eval(self, table, ctx) -> Column:
        return self._apply_special(table, ctx, None)

    def build(self):
        l, r = self.children
        if isinstance(r, StrLit) or isinstance(l, StrLit):
            return lambda table, ctx: self._apply_special(table, ctx, None)
        lf, rf = l.build(), r.build()
        op = _CMP[self.op]
        def fn(table, ctx):
            lc, rc = lf(table, ctx), rf(table, ctx)
            if lc.kind == STR or rc.kind == STR:
                return self._str_cols(lc, rc)
            return Column(op(lc.values, rc.values), NUM, _and_masks(lc, rc))
        return fn

    def _apply_special(self, table, ctx, _):
        l, r = self.children
        if isinstance(r, StrLit):
            lc = l.eval(table, ctx)
            return self._str_const(lc, r.s)
        if isinstance(l, StrLit):
            flipped = {"<": ">", "<=": ">=", ">": "<", ">=": "<="}.get(
                self.op, self.op
            )
            return Cmp(flipped, r, l).eval(table, ctx)
        lc, rc = l.eval(table, ctx), r.eval(table, ctx)
        if lc.kind == STR or rc.kind == STR:
            return self._str_cols(lc, rc)
        return Column(_CMP[self.op](lc.values, rc.values), NUM, _and_masks(lc, rc))

    def _str_const(self, lc: Column, s: str) -> Column:
        if self.op == "==":
            return Column(strings.eq_const(lc.values, s), NUM, lc.mask)
        if self.op == "!=":
            return Column(
                ew.logical_not(strings.eq_const(lc.values, s)), NUM, lc.mask
            )
        raise NotImplementedError(f"string comparison {self.op} vs constant")

    def _str_cols(self, lc: Column, rc: Column) -> Column:
        if self.op == "==":
            return Column(strings.eq_rows(lc.values, rc.values), NUM, _and_masks(lc, rc))
        if self.op == "!=":
            return Column(
                ew.logical_not(strings.eq_rows(lc.values, rc.values)),
                NUM,
                _and_masks(lc, rc),
            )
        raise NotImplementedError(f"string comparison {self.op} between columns")

    def columns(self) -> set[str]:
        return set().union(*(c.columns() for c in self.children))


class BoolOp(Expr):
    def __init__(self, op: str, l: Expr, r: Expr):
        self.op = op
        self.children = (l, r)

    def _apply(self, cols, table, ctx) -> Column:
        l, r = cols
        fn = ew.logical_and if self.op == "and" else ew.logical_or
        return Column(fn(l.values, r.values), NUM, _and_masks(l, r))


class Not(Expr):
    def __init__(self, e: Expr):
        self.children = (e,)

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        return Column(ew.logical_not(c.values), NUM, c.mask)


class IsNull(Expr):
    def __init__(self, e: Expr):
        self.children = (e,)

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        if c.mask is None:
            return Column(np.zeros(c.n, dtype=bool), NUM)
        return Column(ew.logical_not(c.mask), NUM)


class InList(Expr):
    """``col IN (...)`` — OR of vectorized equality tests."""

    def __init__(self, e: Expr, values: list):
        self.children = (e,)
        self.values = values

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        if c.kind == STR:
            return Column(strings.isin_consts(c.values, self.values), NUM, c.mask)
        out = np.zeros(c.n, dtype=bool)
        for v in self.values:
            out = ew.logical_or(out, ew.eq(c.values, v))
        return Column(out, NUM, c.mask)


class Like(Expr):
    def __init__(self, e: Expr, pattern: str):
        self.children = (e,)
        self.pattern = pattern

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        return Column(strings.like(c.values, self.pattern), NUM, c.mask)


class Substr(Expr):
    def __init__(self, e: Expr, start: int, length: int):
        self.children = (e,)
        self.start, self.length = start, length

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        return Column(strings.substring(c.values, self.start, self.length), STR, c.mask)


class Year(Expr):
    """``EXTRACT(year FROM date)`` over int64-ns date tensors."""

    def __init__(self, e: Expr):
        self.children = (e,)

    def _apply(self, cols, table, ctx) -> Column:
        (c,) = cols
        years = c.values.view("datetime64[ns]").astype("datetime64[Y]").astype(
            np.int64
        ) + 1970
        return Column(years, NUM, c.mask)


class Case(Expr):
    """``CASE WHEN ... THEN ... ELSE ... END`` as a ``where`` chain."""

    def __init__(self, whens: list[tuple[Expr, Expr]], default):
        self.n_whens = len(whens)
        flat: list[Expr] = []
        for cond, val in whens:
            flat += [cond, _wrap(val)]
        flat.append(_wrap(default))
        self.children = tuple(flat)

    def _apply(self, cols, table, ctx) -> Column:
        out = cols[-1].values
        for i in range(self.n_whens - 1, -1, -1):
            cond, val = cols[2 * i], cols[2 * i + 1]
            out = ew.where(cond.values, val.values, out)
        return Column(out, NUM, _and_masks(*cols))


class ScalarRef(Expr):
    """A scalar-subquery result: the single value of another plan node.

    The executor guarantees the referenced node ran first and keeps its
    output alive until all scalar consumers finished (§4.2.5 GC).
    """

    def __init__(self, node, col: str):
        self.node = node
        self.col = col

    def _apply(self, cols, table, ctx) -> Column:
        out = ctx.outputs[self.node.id]
        assert out.n == 1, "scalar subquery returned more than one row"
        c = out[self.col]
        if c.mask is not None and not bool(c.mask[0]):
            return Column(np.asarray(np.nan), NUM)
        return Column(np.asarray(c.values[0]), c.kind)

    def scalar_deps(self) -> list:
        return [self.node]


@dataclass
class Agg:
    """An aggregate call: SUM/AVG/MIN/MAX/COUNT (optionally DISTINCT)."""

    fn: str  # sum | avg | min | max | count | count_star | count_distinct
    expr: Expr | None = None
    distinct: bool = field(default=False)

    def __post_init__(self):
        if self.fn == "count_distinct":
            self.distinct = True

    def columns(self) -> set[str]:
        return self.expr.columns() if self.expr is not None else set()


def col(name: str) -> Col:
    return Col(name)


def lit(v) -> Lit:
    return Lit(v)


def date(s: str) -> DateLit:
    return DateLit(s)


def case(whens, default) -> Case:
    return Case(whens, default)
