"""Shared operator machinery: expression evaluators and key encoding."""
from __future__ import annotations

import numpy as np

from repro.core.expr import Expr
from repro.core.schema import Column, Table
from repro.tensor import reduction

# Cap on the dense-key domain before the join/group encoder densifies
# through ``unique`` (keeps bincount histograms proportional to input).
_DENSE_LIMIT_FACTOR = 4
_DENSE_LIMIT_SLACK = 1024


def evaluator(expr: Expr, mode: str):
    """Expression evaluator for the execution modality.

    ``torch`` re-walks the tree per run (eager); ``jit`` compiles the
    tree into closures once at plan time (TorchScript analog).
    """
    if mode == "jit":
        return expr.build()
    return lambda table, ctx: expr.eval(table, ctx)


def filter_mask(col: Column) -> np.ndarray:
    """SQL predicate semantics: NULL counts as not-selected."""
    mask = col.values
    if mask.dtype != bool:
        mask = mask.astype(bool)
    if col.mask is not None:
        mask = mask & col.mask
    return mask


def _as_int_pair(lc: Column, rc: Column) -> tuple[np.ndarray, np.ndarray]:
    """Order-preserving integer codes for one join-key column pair.

    String keys densify jointly (codes must agree across sides); numeric
    and date keys are used directly when integral, otherwise densified.
    """
    if lc.kind == "str" or rc.kind == "str":
        from repro.tensor import strings

        m = max(lc.values.shape[1], rc.values.shape[1])
        lv, rv = lc.values, rc.values
        if lv.shape[1] < m:
            lv = np.pad(lv, ((0, 0), (0, m - lv.shape[1])))
        if rv.shape[1] < m:
            rv = np.pad(rv, ((0, 0), (0, m - rv.shape[1])))
        both = np.concatenate([lv, rv])
        codes = strings.codes(both)
        return codes[: lv.shape[0]], codes[lv.shape[0] :]
    lv, rv = lc.values, rc.values
    if not (np.issubdtype(lv.dtype, np.integer) and np.issubdtype(rv.dtype, np.integer)):
        both = np.concatenate([lv.astype(np.float64), rv.astype(np.float64)])
        _, inv = reduction.unique(both, return_inverse=True)
        return inv[: lv.shape[0]].astype(np.int64), inv[lv.shape[0] :].astype(np.int64)
    return lv.astype(np.int64), rv.astype(np.int64)


def _densify(lk: np.ndarray, rk: np.ndarray) -> tuple[np.ndarray, np.ndarray, int]:
    both = np.concatenate([lk, rk])
    vals, inv = reduction.unique(both, return_inverse=True)
    inv = inv.astype(np.int64)
    return inv[: lk.shape[0]], inv[lk.shape[0] :], int(vals.shape[0])


def join_key_codes(
    left: Table, right: Table, left_on: list[str], right_on: list[str]
) -> tuple[np.ndarray, np.ndarray, int]:
    """Encode (possibly multi-column) join keys as dense non-negative ints.

    Returns ``(left_codes, right_codes, n_keys)`` with codes in
    ``[0, n_keys)`` — the domain Algorithm 1's ``bincount`` histograms
    and Algorithm 2's hash table are sized by.
    """
    assert left_on, "join requires at least one key column"
    n_total = left.n + right.n
    if n_total == 0:
        z = np.zeros(0, dtype=np.int64)
        return z, z.copy(), 0
    limit = _DENSE_LIMIT_FACTOR * n_total + _DENSE_LIMIT_SLACK
    lk = rk = None
    card = 1
    for ln, rn in zip(left_on, right_on):
        lc, rc = _as_int_pair(left[ln], right[rn])
        mn = min(int(lc.min(initial=0)), int(rc.min(initial=0)))
        if mn < 0:
            lc, rc = lc - mn, rc - mn
        sub_card = max(int(max(lc.max(initial=-1), rc.max(initial=-1))) + 1, 1)
        if lk is None:
            lk, rk, card = lc, rc, sub_card
        else:
            # mixed-radix combine; densify first if overflow threatens
            if card * sub_card > 2**62:
                lk, rk, card = _densify(lk, rk)
            lk = lk * sub_card + lc
            rk = rk * sub_card + rc
            card = card * sub_card
    if card > limit:
        lk, rk, card = _densify(lk, rk)
    return lk, rk, card


def group_key_codes(table: Table, keys: list[str]) -> np.ndarray:
    """Dense int codes for group-by keys (Algorithm 3 lines 1–2).

    The horizontal concat of key columns is realized as a mixed-radix
    integer combine over per-column order-preserving codes.
    """
    out = None
    card = 1
    for k in keys:
        codes = table[k].int_codes().astype(np.int64)
        if codes.shape[0] == 0:
            return np.zeros(0, dtype=np.int64)
        mn = int(codes.min(initial=0))
        if mn < 0:
            codes = codes - mn
        sub_card = max(int(codes.max(initial=-1)) + 1, 1)
        if out is None:
            out, card = codes, sub_card
        else:
            if card * sub_card > 2**62:
                _, out = reduction.unique(out, return_inverse=True)
                out = out.astype(np.int64)
                card = int(out.max(initial=0)) + 1
            out = out * sub_card + codes
            card = card * sub_card
    assert out is not None
    return out
