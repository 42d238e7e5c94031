"""Fleet simulation for the §6.3 usage statistics (T3/T6).

The paper reports operational statistics over Snowflake's production fleet
(1M+ DTs). We cannot observe that fleet, so this module builds a synthetic
population with the *reported input distributions* — target lags shaped like
Figure 5, defining queries drawn from the Figure 6 operator mix, source
update cadences slower than refresh cadences — and pushes it through the
real scheduler (cost-model executor at fleet scale) and the real engine
(Spark refreshes at small scale) to measure the *output* statistics the
paper reports: NO_DATA fraction, incremental-mode fraction, and the
change-fraction distribution of incremental refreshes.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core import plan as P
from repro.core.engine import DTEngine, RefreshResult
from repro.core.refresh import FULL, INCREMENTAL, NO_DATA
from repro.scheduler import DTSpec, ModelExecutor, Scheduler, attainment
from repro.workload.generator import QueryGenerator

#: Figure 5-shaped target-lag buckets: (lag seconds, probability).
#: Calibrated to the paper's summary: ~20% under 5 minutes, ~55% between
#: 5 minutes and 16 hours, ~25% at 16 hours or more.
FIG5_LAG_BUCKETS: list[tuple[float, float]] = [
    (60.0, 0.08),
    (240.0, 0.12),
    (900.0, 0.12),
    (3600.0, 0.18),
    (4 * 3600.0, 0.15),
    (8 * 3600.0, 0.10),
    (16 * 3600.0, 0.15),
    (24 * 3600.0, 0.10),
]


def sample_target_lag(rng: np.random.Generator) -> float:
    lags = [b[0] for b in FIG5_LAG_BUCKETS]
    ps = np.array([b[1] for b in FIG5_LAG_BUCKETS])
    return float(rng.choice(lags, p=ps / ps.sum()))


def lag_bucket_shares(lags: list[float]) -> dict[str, float]:
    """The three Figure 5 summary bands."""
    n = len(lags)
    return {
        "lt_5min": sum(1 for l in lags if l < 300) / n,
        "5min_to_16h": sum(1 for l in lags if 300 <= l < 16 * 3600) / n,
        "ge_16h": sum(1 for l in lags if l >= 16 * 3600) / n,
    }


# ---------------------------------------------------------------------------
# Fleet-scale simulation (cost model; no Spark) — NO_DATA fraction, lag
# attainment, skip behaviour across thousands of simulated refreshes.
# ---------------------------------------------------------------------------


def sample_fleet(n_dts: int, *, seed: int = 0, incremental_share: float = 0.7) -> dict[str, DTSpec]:
    """A fleet of independent DTs with Fig. 5 lags and varied source cadence.

    Source update periods are log-uniform between 10 minutes and 1 day —
    customers "often set the target lag lower than their data refresh rate"
    (§6.3), which is what produces the dominant NO_DATA share.
    """
    rng = np.random.default_rng(seed)
    specs: dict[str, DTSpec] = {}
    for i in range(n_dts):
        lag = sample_target_lag(rng)
        source_period = float(np.exp(rng.uniform(np.log(600), np.log(86400))))
        mode = INCREMENTAL if rng.random() < incremental_share else FULL
        specs[f"dt{i}"] = DTSpec(
            name=f"dt{i}",
            target_lag=lag,
            refresh_mode=mode,
            source_update_period=source_period,
            rows_per_update=int(rng.integers(10, 1000)),
            fixed_cost_s=float(rng.uniform(0.5, 5.0)),
            var_cost_s_per_row=0.0005,
            full_cost_s=float(rng.uniform(5.0, 60.0)),
        )
    return specs


@dataclass
class FleetStats:
    """Fleet-level output statistics (the T6 table rows)."""

    n_dts: int
    n_refreshes: int
    frac_no_data: float
    mean_attainment: float
    total_skips: int
    lag_shares: dict[str, float] = field(default_factory=dict)


def run_fleet(specs: dict[str, DTSpec], *, hours: float = 24.0) -> tuple[Scheduler, FleetStats]:
    sched = Scheduler(specs, ModelExecutor(specs))
    sched.run(hours * 3600.0)
    all_spans = [sp for n in specs for sp in sched.spans(n)[1:]]  # skip init
    n_nd = sum(1 for sp in all_spans if sp.action == NO_DATA)
    atts = [
        attainment(sched.spans(n)[1:], specs[n].target_lag)
        for n in specs
        if len(sched.spans(n)) > 1
    ]
    stats = FleetStats(
        n_dts=len(specs),
        n_refreshes=len(all_spans),
        frac_no_data=n_nd / max(1, len(all_spans)),
        mean_attainment=float(np.mean(atts)) if atts else 1.0,
        total_skips=sum(sched.skip_count(n) for n in specs),
        lag_shares=lag_bucket_shares([s.target_lag for s in specs.values()]),
    )
    return sched, stats


# ---------------------------------------------------------------------------
# Operator coverage (T3): what share of a Fig.-6 query population does the
# differentiation framework support incrementally?
# ---------------------------------------------------------------------------


def operator_coverage(n_queries: int = 400, *, seed: int = 0) -> dict:
    g = QueryGenerator(seed=seed)
    plans = [g.random_plan(allow_unsupported=True) for _ in range(n_queries)]
    supported = [P.incremental_supported(p) for p in plans]
    by_reason: dict[str, int] = {}
    for p, s in zip(plans, supported):
        if not s:
            r = P.unsupported_reason(p)
            by_reason[r] = by_reason.get(r, 0) + 1
    op_counts: dict[str, int] = {}
    for p in plans:
        for name in set(P.operator_names(p)):
            op_counts[name] = op_counts.get(name, 0) + 1
    return {
        "n_queries": n_queries,
        "frac_incremental": sum(supported) / n_queries,
        "unsupported_by_reason": by_reason,
        "operator_frequency": {k: v / n_queries for k, v in sorted(op_counts.items())},
    }


# ---------------------------------------------------------------------------
# Engine-scale population (real Spark refreshes): change-fraction stats.
# ---------------------------------------------------------------------------


def make_base_store_tables(rng: np.random.Generator, *, n_orders: int = 4000, n_lines: int = 8000, n_cust: int = 200):
    orders = pd.DataFrame(
        {
            "o_ok": np.arange(1, n_orders + 1),
            "o_ck": rng.integers(1, n_cust + 1, n_orders),
            "o_price": (rng.random(n_orders) * 1000).round(2),
            "o_status": rng.choice(list("OFP"), n_orders),
        }
    )
    lines = pd.DataFrame(
        {
            "l_ok": rng.integers(1, n_orders + 1, n_lines),
            "l_pk": rng.integers(1, 200, n_lines),
            "l_qty": rng.integers(1, 20, n_lines).astype("float64"),
        }
    )
    cust = pd.DataFrame(
        {
            "c_ck": np.arange(1, n_cust + 1),
            "c_seg": rng.choice(["A", "B", "C", "D"], n_cust),
        }
    )
    return orders, lines, cust


def run_engine_population(
    spark,
    *,
    n_dts: int = 6,
    cycles: int = 10,
    seed: int = 0,
    p_bulk: float = 0.2,
) -> list[RefreshResult]:
    """A small real-engine fleet: random incremental DTs over shared base
    tables, refreshed through cycles of mostly-small (occasionally bulk) DML.

    ``p_bulk`` calibrates the §6.3 split: most refreshes change <1% of the
    DT, a minority changes >10% (where dynamically choosing FULL pays off).
    Returns all non-initial RefreshResults.
    """
    rng = np.random.default_rng(seed)
    engine = DTEngine(spark)
    orders, lines, cust = make_base_store_tables(rng)
    engine.create_base_table("t_orders", orders, now=0.0)
    engine.create_base_table("t_lines", lines, now=0.0)
    engine.create_base_table("t_cust", cust, now=0.0)
    g = QueryGenerator(seed=seed)
    made = 0
    while made < n_dts:
        plan_ = g.random_plan(allow_unsupported=False)
        engine.create_dynamic_table(f"pop{made}", plan_, now=0.0)
        made += 1
    out: list[RefreshResult] = []
    next_ok = len(orders) + 1
    for c in range(1, cycles + 1):
        ts = 60.0 * c
        txn = engine.txn(now=ts - 1.0)
        if rng.random() < p_bulk:
            n_ins = int(len(orders) * rng.uniform(0.1, 0.3))
        else:
            n_ins = int(rng.integers(1, 8))
        txn.insert(
            "t_orders",
            pd.DataFrame(
                {
                    "o_ok": np.arange(next_ok, next_ok + n_ins),
                    "o_ck": rng.integers(1, 201, n_ins),
                    "o_price": (rng.random(n_ins) * 1000).round(2),
                    "o_status": rng.choice(list("OFP"), n_ins),
                }
            ),
        )
        next_ok += n_ins
        n_li = max(1, n_ins // 2)
        txn.insert(
            "t_lines",
            pd.DataFrame(
                {
                    "l_ok": rng.integers(1, next_ok, n_li),
                    "l_pk": rng.integers(1, 200, n_li),
                    "l_qty": rng.integers(1, 20, n_li).astype("float64"),
                }
            ),
        )
        txn.commit()
        out.extend(engine.refresh_graph(ts=ts))
    return [r for r in out if r.action != "REINITIALIZE"]


def change_fraction_stats(results: list[RefreshResult]) -> dict:
    """The §6.3 change-fraction table over incremental refreshes."""
    incr = [r for r in results if r.action == INCREMENTAL and r.rows_changed > 0]
    if not incr:
        return {"n": 0}
    fracs = [r.change_fraction for r in incr]
    return {
        "n": len(incr),
        "frac_lt_1pct": sum(1 for f in fracs if f < 0.01) / len(fracs),
        "frac_gt_10pct": sum(1 for f in fracs if f > 0.10) / len(fracs),
        "median": float(np.median(fracs)),
    }
