"""T1 — Incremental vs full refresh cost versus change fraction.

Paper claims reproduced (§3.3.2, §6.3):

- "variable costs scale linearly with the amount of changed data in the
  sources" — incremental refresh time should grow with the change fraction;
- "67% of incremental refreshes change <1% of the DT … 21% change more than
  10%, highlighting the need to be able to dynamically choose full refreshes
  when a large fraction of the data has changed" — i.e. incremental wins by a
  large factor at small change fractions and the advantage shrinks (or
  inverts) as the fraction grows.

Workload: TPC-H-lite lineitem ⋈ orders at SF (default 0.1), two DT shapes
(linear join+filter+project; high-cardinality per-order aggregate), each in
INCREMENTAL and FULL mode over the same change stream.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.refresh import FULL, INCREMENTAL
from repro.experiments.common import (
    AGG_PLAN,
    JOIN_PLAN,
    insert_lineitem_fraction,
    render_table,
    tpch_engine,
)

PAPER_CLAIMS = {
    "variable_cost_linear": "incremental cost grows ~linearly in changed rows (§3.3.2)",
    "small_changes_favor_incremental": "67% of refreshes change <1% → incremental must win there (§6.3)",
    "large_changes_favor_full": "21% change >10% → full refresh competitive there (§6.3)",
}

DEFAULT_FRACTIONS = (0.001, 0.01, 0.1, 0.3)


def run(spark: SparkSession, *, sf: float = 0.1, fractions=DEFAULT_FRACTIONS, seed: int = 0) -> dict:
    engine = tpch_engine(spark, sf=sf, seed=seed)
    engine.create_dynamic_table("dt_join_incr", JOIN_PLAN, refresh_mode=INCREMENTAL, now=0.0)
    engine.create_dynamic_table("dt_join_full", JOIN_PLAN, refresh_mode=FULL, now=0.0)
    engine.create_dynamic_table("dt_agg_incr", AGG_PLAN, refresh_mode=INCREMENTAL, now=0.0)
    engine.create_dynamic_table("dt_agg_full", AGG_PLAN, refresh_mode=FULL, now=0.0)
    rows = []
    ts = 0.0
    for f in fractions:
        ts += 100.0
        n = insert_lineitem_fraction(engine, fraction=f, ts=ts - 1.0, seed=seed)
        rec = {"fraction": f, "rows_inserted": n}
        for name in ("dt_join_incr", "dt_join_full", "dt_agg_incr", "dt_agg_full"):
            res = engine.refresh(name, ts=ts)
            rec[name] = {
                "action": res.action,
                "wall_s": res.wall_s,
                "rows_changed": res.rows_changed,
                "dt_size": res.dt_size,
            }
        rows.append(rec)
    return {"sf": sf, "rows": rows, "engine": engine, "last_ts": ts}


def summarize(result: dict) -> dict:
    """Derived observations checked by the benchmark assertions."""
    rows = result["rows"]
    large = rows[-1]
    # "small" = best speedup among change fractions <= 1% (the first refresh
    # pays cold-start conversion costs, so take the max over the small band)
    small_rows = [r for r in rows if r["fraction"] <= 0.01] or rows[:1]

    def speedup(rec, shape):
        return rec[f"dt_{shape}_full"]["wall_s"] / max(1e-9, rec[f"dt_{shape}_incr"]["wall_s"])

    incr_walls = [r["dt_join_incr"]["wall_s"] for r in rows]
    return {
        "join_speedup_small": max(speedup(r, "join") for r in small_rows),
        "join_speedup_large": speedup(large, "join"),
        "agg_speedup_small": max(speedup(r, "agg") for r in small_rows),
        "agg_speedup_large": speedup(large, "agg"),
        "incr_wall_monotone_increasing": incr_walls[-1] > incr_walls[0],
    }


def format_table(result: dict) -> str:
    cols = [
        "change_frac",
        "join incr s",
        "join full s",
        "join speedup",
        "agg incr s",
        "agg full s",
        "agg speedup",
        "Δrows (join)",
    ]
    out_rows = []
    for r in result["rows"]:
        ji, jf = r["dt_join_incr"]["wall_s"], r["dt_join_full"]["wall_s"]
        ai, af = r["dt_agg_incr"]["wall_s"], r["dt_agg_full"]["wall_s"]
        out_rows.append(
            [
                f"{r['fraction']:.4f}",
                f"{ji:.2f}",
                f"{jf:.2f}",
                f"{jf / max(ji, 1e-9):.1f}x",
                f"{ai:.2f}",
                f"{af:.2f}",
                f"{af / max(ai, 1e-9):.1f}x",
                r["dt_join_incr"]["rows_changed"],
            ]
        )
    return render_table(
        f"T1: incremental vs full refresh wall time (TPC-H-lite SF={result['sf']})",
        cols,
        out_rows,
        notes="Paper: incremental wins at <1% changes; advantage shrinks toward >10% (§3.3.2, §6.3).",
    )
