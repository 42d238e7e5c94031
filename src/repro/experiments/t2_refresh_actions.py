"""T2 — Cost of the refresh actions.

Paper claims (§3.3.2, §5.4, §6.3):

- "NO_DATA … only updates the DT's data timestamp and does not consume any
  virtual warehouse resources" / "uses negligible resources";
- ">90% of refreshes have no data … these refreshes are inexpensive";
- FULL cost ≈ the defining query; INCREMENTAL = fixed + variable cost.

We measure wall time (and rows touched) of the four actions on the same DT.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.refresh import FULL, INCREMENTAL, NO_DATA, REINITIALIZE
from repro.experiments.common import (
    AGG_PLAN,
    insert_lineitem_fraction,
    render_table,
    tpch_engine,
)


def run(spark: SparkSession, *, sf: float = 0.1, seed: int = 0) -> dict:
    engine = tpch_engine(spark, sf=sf, seed=seed)
    dt = engine.create_dynamic_table("dt_actions", AGG_PLAN, now=0.0)
    timings: dict[str, list[float]] = {NO_DATA: [], INCREMENTAL: [], FULL: [], REINITIALIZE: []}
    timings[REINITIALIZE].append(dt.refresh_log[0].wall_s)
    ts = 0.0
    # NO_DATA refreshes (no source commits in the interval)
    for _ in range(5):
        ts += 50.0
        res = engine.refresh("dt_actions", ts=ts)
        assert res.action == NO_DATA
        timings[NO_DATA].append(res.wall_s)
    # small incremental refreshes
    for _ in range(3):
        ts += 50.0
        insert_lineitem_fraction(engine, fraction=0.005, ts=ts - 1.0, seed=seed)
        res = engine.refresh("dt_actions", ts=ts)
        assert res.action == INCREMENTAL
        timings[INCREMENTAL].append(res.wall_s)
    # full refreshes of the same query (separate FULL-mode DT, same store)
    engine.create_dynamic_table("dt_actions_full", AGG_PLAN, refresh_mode=FULL, now=ts)
    for _ in range(2):
        ts += 50.0
        insert_lineitem_fraction(engine, fraction=0.005, ts=ts - 1.0, seed=seed)
        res = engine.refresh("dt_actions_full", ts=ts)
        assert res.action == FULL
        timings[FULL].append(res.wall_s)
    mean = {k: (sum(v) / len(v) if v else float("nan")) for k, v in timings.items()}
    return {"sf": sf, "mean_wall_s": mean, "timings": timings}


def format_table(result: dict) -> str:
    m = result["mean_wall_s"]
    rows = [
        [NO_DATA, f"{m[NO_DATA]*1000:.1f} ms", "~0 (metadata-only; zero warehouse compute)"],
        [INCREMENTAL, f"{m[INCREMENTAL]:.2f} s", "fixed + variable·Δrows"],
        [FULL, f"{m[FULL]:.2f} s", "≈ cost of the defining query"],
        [REINITIALIZE, f"{m[REINITIALIZE]:.2f} s", "full + incremental metadata"],
        [
            "NO_DATA / FULL ratio",
            f"{m[NO_DATA]/m[FULL]*100:.2f} %",
            "paper: 'negligible' — >90% of fleet refreshes cost this",
        ],
    ]
    return render_table(
        f"T2: refresh-action cost (SF={result['sf']})",
        ["action", "mean wall", "paper characterization (§3.3.2/§5.4)"],
        rows,
    )
