"""Hand-optimized tensor programs for Q1, Q6, Q9, Q14 (§6.6, Table 3).

These are the programs "a reasonable optimizer with knowledge about
cardinalities and tensor characteristics" would generate:

- **Q1** — the group-by domain is tiny (3×2 single-char keys), so the
  sort + ``unique_consecutive`` pipeline of Algorithm 3 is replaced by
  direct ``scatter_add`` histograms over a byte-pair code (no sort).
- **Q6** — straight filter + reduce; the TVM variant fuses the whole
  query into one pass with no materialized intermediates.
- **Q9** — key columns are known-contiguous (``p_partkey``,
  ``o_orderkey``, ``s_suppkey`` are 1..n), so joins become direct
  index lookups; the partsupp join uses the *hash* join (Algorithm 2)
  on the raw composite int key; aggregation scatters onto the small
  nation×year domain instead of sorting.
- **Q14** — the part join becomes a direct index lookup; aggregation
  fuses into two masked reductions.

Each query has a ``torch`` variant (metered tensor-op layer — traceable
for simulated devices) and a ``jit`` variant (direct numpy, no dispatch
layer — the TorchScript analog).  ``tvm`` exists only for Q6 and Q14,
matching the paper's TVM support matrix.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.convert import pandas_to_table
from repro.core.operators.join_hash import hash_join_pairs
from repro.core.schema import Table
from repro.tensor import elementwise as ew
from repro.tensor import indexing as ix
from repro.tensor import reduction, scatter_ops

_DAY_NS = 86_400_000_000_000


def _ns(s: str) -> np.int64:
    return np.datetime64(s, "ns").astype(np.int64)


# The columns each hand-optimized program reads (projection pushed into
# data conversion, as TQP does).
COLUMNS: dict[int, dict[str, list[str]]] = {
    1: {
        "lineitem": [
            "l_shipdate", "l_quantity", "l_extendedprice", "l_discount",
            "l_tax", "l_returnflag", "l_linestatus",
        ]
    },
    6: {
        "lineitem": [
            "l_shipdate", "l_discount", "l_quantity", "l_extendedprice",
        ]
    },
    9: {
        "lineitem": [
            "l_partkey", "l_suppkey", "l_orderkey", "l_quantity",
            "l_extendedprice", "l_discount",
        ],
        "part": ["p_partkey", "p_name"],
        "partsupp": ["ps_partkey", "ps_suppkey", "ps_supplycost"],
        "orders": ["o_orderkey", "o_orderdate"],
        "supplier": ["s_suppkey", "s_nationkey"],
        "nation": ["n_nationkey", "n_name"],
    },
    14: {
        "lineitem": [
            "l_shipdate", "l_partkey", "l_extendedprice", "l_discount",
        ],
        "part": ["p_partkey", "p_type"],
    },
}


def convert_tables(pdfs: dict[str, pd.DataFrame], q: int) -> dict[str, Table]:
    """Convert only the columns query ``q``'s hand-opt program reads."""
    return {
        name: pandas_to_table(pdfs[name], cols)
        for name, cols in COLUMNS[q].items()
    }


# ---------------------------------------------------------------- Q1 --
def q1_torch(t: dict[str, Table]) -> pd.DataFrame:
    li = t["lineitem"]
    mask = ew.le(li["l_shipdate"].values, _ns("1998-09-02"))
    qty = ix.masked_select(li["l_quantity"].values, mask)
    ep = ix.masked_select(li["l_extendedprice"].values, mask)
    disc = ix.masked_select(li["l_discount"].values, mask)
    tax = ix.masked_select(li["l_tax"].values, mask)
    rf = ix.masked_select(li["l_returnflag"].values, mask)[:, 0].astype(np.int64)
    ls = ix.masked_select(li["l_linestatus"].values, mask)[:, 0].astype(np.int64)
    code = ew.add(ew.mul(rf, 256), ls)
    size = 256 * 256
    disc_price = ew.mul(ep, ew.sub(1.0, disc))
    charge = ew.mul(disc_price, ew.add(1.0, tax))
    cnt = scatter_ops.scatter_count(code, size)
    sums = {
        "sum_qty": scatter_ops.scatter_add(qty, code, size),
        "sum_base_price": scatter_ops.scatter_add(ep, code, size),
        "sum_disc_price": scatter_ops.scatter_add(disc_price, code, size),
        "sum_charge": scatter_ops.scatter_add(charge, code, size),
        "sum_disc": scatter_ops.scatter_add(disc, code, size),
    }
    groups = reduction.unique(code)  # sorted ⇒ alphabetical output order
    out = {
        "l_returnflag": [chr(c >> 8) for c in groups],
        "l_linestatus": [chr(c & 255) for c in groups],
    }
    n = cnt[groups].astype(np.float64)
    out["sum_qty"] = sums["sum_qty"][groups]
    out["sum_base_price"] = sums["sum_base_price"][groups]
    out["sum_disc_price"] = sums["sum_disc_price"][groups]
    out["sum_charge"] = sums["sum_charge"][groups]
    out["avg_qty"] = out["sum_qty"] / n
    out["avg_price"] = out["sum_base_price"] / n
    out["avg_disc"] = sums["sum_disc"][groups] / n
    out["count_order"] = cnt[groups]
    return pd.DataFrame(out)


def q1_jit(t: dict[str, Table]) -> pd.DataFrame:
    li = t["lineitem"]
    mask = li["l_shipdate"].values <= _ns("1998-09-02")
    qty = li["l_quantity"].values[mask]
    ep = li["l_extendedprice"].values[mask]
    disc = li["l_discount"].values[mask]
    tax = li["l_tax"].values[mask]
    rf = li["l_returnflag"].values[mask][:, 0].astype(np.int64)
    ls = li["l_linestatus"].values[mask][:, 0].astype(np.int64)
    code = rf * 256 + ls
    size = 256 * 256
    disc_price = ep * (1.0 - disc)
    charge = disc_price * (1.0 + tax)
    cnt = np.bincount(code, minlength=size)
    bc = lambda w: np.bincount(code, weights=w, minlength=size)
    groups = np.unique(code)
    n = cnt[groups].astype(np.float64)
    return pd.DataFrame(
        {
            "l_returnflag": [chr(c >> 8) for c in groups],
            "l_linestatus": [chr(c & 255) for c in groups],
            "sum_qty": bc(qty)[groups],
            "sum_base_price": bc(ep)[groups],
            "sum_disc_price": bc(disc_price)[groups],
            "sum_charge": bc(charge)[groups],
            "avg_qty": bc(qty)[groups] / n,
            "avg_price": bc(ep)[groups] / n,
            "avg_disc": bc(disc)[groups] / n,
            "count_order": cnt[groups],
        }
    )


# ---------------------------------------------------------------- Q6 --
def _q6_mask_torch(li: Table) -> np.ndarray:
    ship = li["l_shipdate"].values
    disc = li["l_discount"].values
    m = ew.logical_and(
        ew.ge(ship, _ns("1994-01-01")), ew.lt(ship, _ns("1995-01-01"))
    )
    m = ew.logical_and(m, ew.ge(disc, 0.05))
    m = ew.logical_and(m, ew.le(disc, 0.07))
    return ew.logical_and(m, ew.lt(li["l_quantity"].values, 24))


def q6_torch(t: dict[str, Table]) -> pd.DataFrame:
    li = t["lineitem"]
    m = _q6_mask_torch(li)
    ep = ix.masked_select(li["l_extendedprice"].values, m)
    disc = ix.masked_select(li["l_discount"].values, m)
    return pd.DataFrame({"revenue": [float(reduction.sum_(ew.mul(ep, disc)))]})


def q6_jit(t: dict[str, Table]) -> pd.DataFrame:
    li = t["lineitem"]
    ship = li["l_shipdate"].values
    disc = li["l_discount"].values
    m = (
        (ship >= _ns("1994-01-01")) & (ship < _ns("1995-01-01"))
        & (disc >= 0.05) & (disc <= 0.07)
        & (li["l_quantity"].values < 24)
    )
    return pd.DataFrame(
        {"revenue": [float(np.sum(li["l_extendedprice"].values[m] * disc[m]))]}
    )


def q6_tvm(t: dict[str, Table]) -> pd.DataFrame:
    """Fully fused single pass: no materialized filtered intermediates."""
    li = t["lineitem"]
    ship = li["l_shipdate"].values
    disc = li["l_discount"].values
    m = (
        (ship >= _ns("1994-01-01")) & (ship < _ns("1995-01-01"))
        & (disc >= 0.05) & (disc <= 0.07)
        & (li["l_quantity"].values < 24)
    )
    rev = float(np.dot(li["l_extendedprice"].values * disc, m))
    return pd.DataFrame({"revenue": [rev]})


# ---------------------------------------------------------------- Q9 --
def q9_torch(t: dict[str, Table]) -> pd.DataFrame:
    from repro.tensor import strings

    li, part, ps = t["lineitem"], t["part"], t["partsupp"]
    # part filter via direct index (p_partkey is 1..n, known to the optimizer)
    green = strings.like(part["p_name"].values, "%green%")
    keep = ix.index_select(green, ew.sub(li["l_partkey"].values, 1))
    lpk = ix.masked_select(li["l_partkey"].values, keep)
    lsk = ix.masked_select(li["l_suppkey"].values, keep)
    lok = ix.masked_select(li["l_orderkey"].values, keep)
    qty = ix.masked_select(li["l_quantity"].values, keep)
    ep = ix.masked_select(li["l_extendedprice"].values, keep)
    disc = ix.masked_select(li["l_discount"].values, keep)
    # partsupp join via the hash-based Algorithm 2 on the composite key
    n_supp = t["supplier"].n
    lkey = ew.add(ew.mul(lpk, n_supp + 1), lsk)
    pskey = ew.add(
        ew.mul(ps["ps_partkey"].values, n_supp + 1), ps["ps_suppkey"].values
    )
    li_idx, ps_idx = hash_join_pairs(lkey, pskey, 0)
    cost = ix.index_select(ps["ps_supplycost"].values, ps_idx)
    amount = ew.sub(
        ew.mul(ix.index_select(ep, li_idx), ew.sub(1.0, ix.index_select(disc, li_idx))),
        ew.mul(cost, ix.index_select(qty, li_idx)),
    )
    # orders/supplier/nation joins via direct index (contiguous keys)
    odate = t["orders"]["o_orderdate"].values
    year = (
        odate.view("datetime64[ns]").astype("datetime64[Y]").astype(np.int64) + 1970
    )
    y = ix.index_select(year, ew.sub(ix.index_select(lok, li_idx), 1))
    s_nk = ix.index_select(
        t["supplier"]["s_nationkey"].values,
        ew.sub(ix.index_select(lsk, li_idx), 1),
    )
    # aggregate by scatter on the small nation×year domain (no sort)
    y0 = ew.sub(y, 1992)
    code = ew.add(ew.mul(s_nk, 16), y0)
    size = 25 * 16
    sums = scatter_ops.scatter_add(amount, code, size)
    cnt = scatter_ops.scatter_count(code, size)
    groups = ix.nonzero(ew.gt(cnt, 0))
    nation_names = strings.decode(t["nation"]["n_name"].values)
    out = pd.DataFrame(
        {
            "nation": nation_names[groups // 16],
            "o_year": (groups % 16) + 1992,
            "sum_profit": sums[groups],
        }
    )
    return out.sort_values(
        ["nation", "o_year"], ascending=[True, False], ignore_index=True
    )


def q9_jit(t: dict[str, Table]) -> pd.DataFrame:
    from repro.tensor import strings

    li, part, ps = t["lineitem"], t["part"], t["partsupp"]
    green = strings.like(part["p_name"].values, "%green%")
    keep = green[li["l_partkey"].values - 1]
    lpk = li["l_partkey"].values[keep]
    lsk = li["l_suppkey"].values[keep]
    lok = li["l_orderkey"].values[keep]
    qty = li["l_quantity"].values[keep]
    ep = li["l_extendedprice"].values[keep]
    disc = li["l_discount"].values[keep]
    n_supp = t["supplier"].n
    lkey = lpk * (n_supp + 1) + lsk
    pskey = ps["ps_partkey"].values * (n_supp + 1) + ps["ps_suppkey"].values
    li_idx, ps_idx = hash_join_pairs(lkey, pskey, 0)
    cost = ps["ps_supplycost"].values[ps_idx]
    amount = ep[li_idx] * (1.0 - disc[li_idx]) - cost * qty[li_idx]
    odate = t["orders"]["o_orderdate"].values
    year = odate.view("datetime64[ns]").astype("datetime64[Y]").astype(np.int64) + 1970
    y = year[lok[li_idx] - 1]
    s_nk = t["supplier"]["s_nationkey"].values[lsk[li_idx] - 1]
    code = s_nk * 16 + (y - 1992)
    size = 25 * 16
    sums = np.bincount(code, weights=amount, minlength=size)
    cnt = np.bincount(code, minlength=size)
    groups = np.flatnonzero(cnt)
    nation_names = strings.decode(t["nation"]["n_name"].values)
    out = pd.DataFrame(
        {
            "nation": nation_names[groups // 16],
            "o_year": (groups % 16) + 1992,
            "sum_profit": sums[groups],
        }
    )
    return out.sort_values(
        ["nation", "o_year"], ascending=[True, False], ignore_index=True
    )


# --------------------------------------------------------------- Q14 --
def q14_torch(t: dict[str, Table]) -> pd.DataFrame:
    from repro.tensor import strings

    li, part = t["lineitem"], t["part"]
    ship = li["l_shipdate"].values
    m = ew.logical_and(
        ew.ge(ship, _ns("1995-09-01")), ew.lt(ship, _ns("1995-10-01"))
    )
    pk = ix.masked_select(li["l_partkey"].values, m)
    ep = ix.masked_select(li["l_extendedprice"].values, m)
    disc = ix.masked_select(li["l_discount"].values, m)
    rev = ew.mul(ep, ew.sub(1.0, disc))
    promo = strings.like(part["p_type"].values, "PROMO%")
    is_promo = ix.index_select(promo, ew.sub(pk, 1))
    num = reduction.sum_(ew.mul(rev, is_promo))
    den = reduction.sum_(rev)
    return pd.DataFrame({"promo_revenue": [100.0 * float(num) / float(den)]})


def q14_jit(t: dict[str, Table]) -> pd.DataFrame:
    from repro.tensor import strings

    li, part = t["lineitem"], t["part"]
    ship = li["l_shipdate"].values
    m = (ship >= _ns("1995-09-01")) & (ship < _ns("1995-10-01"))
    pk = li["l_partkey"].values[m]
    rev = li["l_extendedprice"].values[m] * (1.0 - li["l_discount"].values[m])
    promo = strings.like(part["p_type"].values, "PROMO%")
    num = float(np.sum(rev * promo[pk - 1]))
    return pd.DataFrame({"promo_revenue": [100.0 * num / float(np.sum(rev))]})


def q14_tvm(t: dict[str, Table]) -> pd.DataFrame:
    """Fused: both reductions in one pass over unmaterialized products."""
    from repro.tensor import strings

    li, part = t["lineitem"], t["part"]
    ship = li["l_shipdate"].values
    m = (ship >= _ns("1995-09-01")) & (ship < _ns("1995-10-01"))
    rev = li["l_extendedprice"].values * (1.0 - li["l_discount"].values) * m
    promo = strings.like(part["p_type"].values, "PROMO%")
    num = float(np.dot(rev, promo[li["l_partkey"].values - 1]))
    return pd.DataFrame({"promo_revenue": [100.0 * num / float(np.sum(rev))]})


HANDOPT: dict[int, dict[str, object]] = {
    1: {"torch": q1_torch, "jit": q1_jit, "tvm": None},
    6: {"torch": q6_torch, "jit": q6_jit, "tvm": q6_tvm},
    9: {"torch": q9_torch, "jit": q9_jit, "tvm": None},
    14: {"torch": q14_torch, "jit": q14_jit, "tvm": q14_tvm},
}
