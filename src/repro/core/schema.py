"""Columnar tensor tables with virtual IDs (§4.1, Figure 1).

Each column is one dense tensor: numeric/date columns are ``(n,)``
arrays (dates as int64 nanoseconds since epoch), string columns are
``(n, m)`` uint8 char matrices.  A column may carry a validity mask
(True = valid) — nulls only arise from outer joins and empty aggregates
in TPC-H, and the mask participates in COUNT/IS NULL semantics.
"""
from __future__ import annotations

import numpy as np

from repro.tensor import indexing, strings

NUM = "num"
STR = "str"
DATE = "date"


class Column:
    """One column: values tensor + kind tag + optional validity mask."""

    __slots__ = ("values", "kind", "mask")

    def __init__(self, values: np.ndarray, kind: str, mask: np.ndarray | None = None):
        self.values = values
        self.kind = kind
        self.mask = mask

    @property
    def n(self) -> int:
        return self.values.shape[0]

    def take(self, idx: np.ndarray) -> "Column":
        """Row-gather (late materialization step of joins/sorts)."""
        return Column(
            indexing.index_select(self.values, idx),
            self.kind,
            None if self.mask is None else indexing.index_select(self.mask, idx),
        )

    def mask_rows(self, mask: np.ndarray) -> "Column":
        """Bitmap filter (Listing 1: ``masked_select``)."""
        return Column(
            indexing.masked_select(self.values, mask),
            self.kind,
            None if self.mask is None else indexing.masked_select(self.mask, mask),
        )

    def valid(self) -> np.ndarray:
        """Validity as a dense boolean array."""
        if self.mask is None:
            return np.ones(self.n, dtype=bool)
        return self.mask

    def int_codes(self) -> np.ndarray:
        """Order-preserving dense/int representation for sort/join/group.

        Numeric and date columns are already totally ordered scalars;
        string columns densify through sort+unique (lexicographic codes).
        """
        if self.kind == STR:
            return strings.codes(self.values)
        v = self.values
        if v.dtype == bool:
            return v.astype(np.int64)
        if np.issubdtype(v.dtype, np.floating):
            # order-preserving densification for float keys
            _, inv = np.unique(v, return_inverse=True)
            return inv.reshape(-1).astype(np.int64)
        return v.astype(np.int64)

    @staticmethod
    def concat(a: "Column", b: "Column") -> "Column":
        """Row-concatenate two columns (outer-join finalization)."""
        av, bv = a.values, b.values
        if a.kind == STR and av.shape[1] != bv.shape[1]:
            m = max(av.shape[1], bv.shape[1])
            av = np.pad(av, ((0, 0), (0, m - av.shape[1])))
            bv = np.pad(bv, ((0, 0), (0, m - bv.shape[1])))
        values = indexing.cat([av, bv])
        if a.mask is None and b.mask is None:
            mask = None
        else:
            mask = indexing.cat(
                [
                    a.mask if a.mask is not None else np.ones(a.n, dtype=bool),
                    b.mask if b.mask is not None else np.ones(b.n, dtype=bool),
                ]
            )
        return Column(values, a.kind, mask)

    def null_like(self, n: int) -> "Column":
        """An all-null column of the same kind/width (outer-join padding)."""
        if self.kind == STR:
            values = np.zeros((n, self.values.shape[1]), dtype=np.uint8)
        else:
            values = np.zeros(n, dtype=self.values.dtype)
        return Column(values, self.kind, np.zeros(n, dtype=bool))


class Table:
    """An ordered set of named columns of equal length."""

    __slots__ = ("cols", "order")

    def __init__(self, cols: dict[str, Column], order: list[str] | None = None):
        self.cols = cols
        self.order = order if order is not None else list(cols)

    @property
    def n(self) -> int:
        return next(iter(self.cols.values())).n if self.cols else 0

    def __getitem__(self, name: str) -> Column:
        return self.cols[name]

    def select(self, names) -> "Table":
        return Table({c: self.cols[c] for c in names}, list(names))

    def take(self, idx: np.ndarray) -> "Table":
        return Table({c: col.take(idx) for c, col in self.cols.items()}, list(self.order))

    def mask_rows(self, mask: np.ndarray) -> "Table":
        return Table(
            {c: col.mask_rows(mask) for c, col in self.cols.items()}, list(self.order)
        )

    @staticmethod
    def concat_rows(a: "Table", b: "Table") -> "Table":
        assert a.order == b.order, "concat requires identical schemas"
        return Table(
            {c: Column.concat(a.cols[c], b.cols[c]) for c in a.order}, list(a.order)
        )

    @staticmethod
    def merge(left: "Table", right: "Table") -> "Table":
        """Column-wise merge of two same-length tables (join output)."""
        dup = set(left.cols) & set(right.cols)
        assert not dup, f"join would produce duplicate columns: {dup}"
        cols = dict(left.cols)
        cols.update(right.cols)
        return Table(cols, left.order + right.order)
