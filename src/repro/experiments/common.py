"""Shared experiment utilities: TPC-H-lite engines and table rendering."""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core import plan as P
from repro.core.engine import DTEngine
from repro.synth_data import lineitem_pdf, orders_pdf

LINEITEM = P.Scan("lineitem")
ORDERS = P.Scan("orders")

#: "Enriched lineitems": join + filter + project — linear incremental cost.
JOIN_PLAN = P.Project(
    P.Filter(
        P.Join(LINEITEM, ORDERS, ("l_orderkey",), ("o_orderkey",), "inner"),
        "l_quantity > 5",
    ),
    (
        ("orderkey", "o_orderkey"),
        ("priority", "o_orderpriority"),
        ("qty", "l_quantity"),
        ("revenue", "l_extendedprice * (1 - l_discount)"),
    ),
)

#: Per-order aggregate over the join — high-cardinality grouping, so
#: changed-group recompute touches few groups for small changes.
AGG_PLAN = P.Aggregate(
    P.Join(LINEITEM, ORDERS, ("l_orderkey",), ("o_orderkey",), "inner"),
    ("o_orderkey",),
    (("n_items", "count(*)"), ("total_qty", "sum(l_quantity)"), ("rev", "sum(l_extendedprice)")),
)


def tpch_engine(spark: SparkSession, *, sf: float = 0.1, seed: int = 0) -> DTEngine:
    """An engine loaded with TPC-H-lite lineitem/orders at the given SF."""
    engine = DTEngine(spark)
    engine.create_base_table("lineitem", lineitem_pdf(sf=sf, seed=seed), now=0.0)
    engine.create_base_table("orders", orders_pdf(sf=sf, seed=seed + 1), now=0.0)
    return engine


def insert_lineitem_fraction(
    engine: DTEngine, *, fraction: float, ts: float, seed: int = 0
) -> int:
    """Insert ``fraction`` × |lineitem| fresh rows (existing order keys)."""
    g = np.random.default_rng(seed + int(ts))
    base = engine.store.table("lineitem").current.snapshot
    n_orders = int(engine.store.table("orders").current.snapshot["o_orderkey"].max())
    n = max(1, int(len(base) * fraction))
    rows = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, 1000, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1995-01-01")
            + pd.to_timedelta(g.integers(0, 100, n), unit="D"),
        }
    )
    txn = engine.txn(now=ts)
    txn.insert("lineitem", rows)
    txn.commit()
    return n


def render_table(title: str, columns: list[str], rows: list[list], *, notes: str = "") -> str:
    """Fixed-width text table (printed into bench/job output)."""
    widths = [
        max(len(str(c)), *(len(str(r[i])) for r in rows)) if rows else len(str(c))
        for i, c in enumerate(columns)
    ]
    def fmt(row):
        return "  ".join(str(v).ljust(w) for v, w in zip(row, widths))

    lines = [f"== {title} ==", fmt(columns), fmt(["-" * w for w in widths])]
    lines += [fmt(r) for r in rows]
    if notes:
        lines.append(notes)
    return "\n".join(lines)
