"""Scheduler subsystem (§5.2, §3.3.3): canonical periods, lag sawtooth,
skip/catch-up behaviour, error suspension, and the upstream-alignment
invariant — plus an integration test driving the real engine."""
import math

import pandas as pd
import pytest

from repro.core import plan as P
from repro.core.engine import DTEngine
from repro.core.refresh import FULL, INCREMENTAL, NO_DATA
from repro.scheduler import (
    DTSpec,
    EngineExecutor,
    ModelExecutor,
    RefreshSpan,
    Scheduler,
    SKIPPED_BUSY,
    attainment,
    canonical_period_for,
    choose_periods,
    peak_lags,
    trough_lags,
)
from repro.scheduler.periods import canonical_periods

from tests.helpers import engine_dvs_check, small_store


class TestCanonicalPeriods:
    def test_grid_is_48_times_powers_of_two(self):
        ps = canonical_periods()
        assert 48.0 in ps
        for a, b in zip(ps, ps[1:]):
            assert b == 2 * a

    @pytest.mark.parametrize(
        "target,expected",
        [
            (60.0, 24.0),       # 60/2=30 → largest 48·2^n ≤ 30 is 24
            (120.0, 48.0),
            (300.0, 96.0),
            (3600.0, 1536.0),
            (16 * 3600.0, 24576.0),
        ],
    )
    def test_period_leaves_headroom(self, target, expected):
        p = canonical_period_for(target)
        assert p == expected
        assert p <= target / 2

    def test_tiny_target_clamps_to_minimum(self):
        assert canonical_period_for(1.0) == 3.0  # 48·2^-4

    def test_infinite_target_maps_to_max(self):
        assert canonical_period_for(float("inf")) == canonical_periods()[-1]

    def test_periods_divide_each_other(self):
        ps = canonical_periods()
        for small in ps:
            for big in ps:
                if big >= small:
                    assert (big / small) == int(big / small)

    def test_upstream_clamp(self):
        periods = choose_periods(
            {"up": 3600.0, "down": 60.0}, {"up": (), "down": ("up",)}
        )
        # downstream would pick 24s but is clamped to upstream's 1536s
        assert periods["down"] == periods["up"] == 1536.0

    def test_chain_clamp_monotone(self):
        periods = choose_periods(
            {"a": 7200.0, "b": 600.0, "c": 60.0},
            {"a": (), "b": ("a",), "c": ("b",)},
        )
        assert periods["a"] <= periods["b"] <= periods["c"] or (
            periods["a"] >= periods["b"] >= periods["c"]
        )
        assert periods["b"] >= periods["a"] and periods["c"] >= periods["b"]

    def test_alignment_guarantee(self):
        # any two DT periods: the larger is a multiple of the smaller
        periods = choose_periods(
            {"x": 60.0, "y": 3600.0, "z": 16 * 3600.0}, {"x": (), "y": (), "z": ()}
        )
        vals = sorted(periods.values())
        for a, b in zip(vals, vals[1:]):
            assert b % a == 0


class TestLag:
    def _spans(self):
        # Figure 4 shape: refreshes every 10s taking 2s, data_ts = tick
        return [RefreshSpan(10.0 * i, 10.0 * i, 10.0 * i + 2.0, INCREMENTAL) for i in range(1, 5)]

    def test_trough_lag_is_end_minus_own_ts(self):
        assert trough_lags(self._spans()) == [2.0] * 4

    def test_peak_lag_uses_preceding_data_ts(self):
        peaks = peak_lags(self._spans(), initial_data_ts=0.0)
        assert peaks == [12.0] * 4  # e_i - v_{i-1} = (10i+2) - 10(i-1)

    def test_attainment(self):
        spans = self._spans()
        assert attainment(spans, 12.0, initial_data_ts=0.0) == 1.0
        assert attainment(spans, 11.9, initial_data_ts=0.0) == 0.0

    def test_slow_refresh_raises_peak(self):
        spans = [
            RefreshSpan(10.0, 10.0, 12.0, INCREMENTAL),
            RefreshSpan(20.0, 20.0, 35.0, INCREMENTAL),  # 15s refresh
        ]
        assert peak_lags(spans, initial_data_ts=0.0)[1] == 25.0

    def test_empty_spans(self):
        assert attainment([], 10.0) == 1.0
        assert peak_lags([]) == []


class TestModelScheduler:
    def test_single_dt_meets_target(self):
        specs = {
            "a": DTSpec("a", target_lag=300.0, source_update_period=30.0, fixed_cost_s=2.0)
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(3600.0)
        spans = s.spans("a")
        assert len(spans) == math.floor(3600 / 96)  # period for 300s target is 96s
        assert attainment(spans[1:], 300.0) == 1.0

    def test_no_data_refreshes_dominate_when_source_slow(self):
        # §6.3: ">90% of refreshes have no data" when target lag < update rate
        specs = {
            "a": DTSpec("a", target_lag=120.0, source_update_period=3600.0)
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(4 * 3600.0)
        actions = [sp.action for sp in s.spans("a")]
        frac_no_data = actions.count(NO_DATA) / len(actions)
        assert frac_no_data > 0.9

    def test_overloaded_dt_skips_and_catches_up(self):
        # refresh takes 3 periods → skips; later refreshes still advance data_ts
        specs = {
            "a": DTSpec(
                "a",
                target_lag=120.0,  # period 48
                source_update_period=10.0,
                fixed_cost_s=130.0,  # longer than the period
            )
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(2000.0)
        assert s.skip_count("a") > 0
        assert all(r == SKIPPED_BUSY for _, r in s.state["a"].skips)
        # data timestamps still advance monotonically
        ts = [sp.data_ts for sp in s.spans("a")]
        assert ts == sorted(ts) and len(set(ts)) == len(ts)

    def test_skips_reduce_total_work_via_fixed_costs(self):
        # §3.3.3: skipping eliminates the fixed cost of the skipped refresh
        def total_work(fixed):
            specs = {
                "a": DTSpec(
                    "a", target_lag=120.0, source_update_period=10.0, fixed_cost_s=fixed
                )
            }
            s = Scheduler(specs, ModelExecutor(specs))
            s.run(4000.0)
            return s.total_busy_seconds("a"), len(s.spans("a")), s.skip_count("a")

        busy_fast, n_fast, sk_fast = total_work(2.0)
        busy_slow, n_slow, sk_slow = total_work(60.0)
        assert sk_fast == 0 and sk_slow > 0
        # the overloaded DT executes fewer refreshes (skips) but still covers
        # the whole interval
        assert n_slow < n_fast

    def test_chain_waits_for_upstream(self):
        specs = {
            "up": DTSpec("up", target_lag=300.0, source_update_period=10.0, fixed_cost_s=5.0),
            "down": DTSpec("down", target_lag=300.0, upstreams=("up",), fixed_cost_s=2.0),
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(1000.0)
        ups = {sp.data_ts: sp for sp in s.spans("up")}
        for sp in s.spans("down"):
            assert sp.data_ts in ups  # same-timestamp alignment (DVS)
            assert sp.start >= ups[sp.data_ts].end  # w_down ≥ w_up + d_up

    def test_upstream_skip_propagates(self):
        specs = {
            "up": DTSpec("up", target_lag=120.0, source_update_period=10.0, fixed_cost_s=200.0),
            "down": DTSpec("down", target_lag=120.0, upstreams=("up",), fixed_cost_s=0.5),
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(2000.0)
        down_skips = [r for _, r in s.state["down"].skips]
        assert "SKIPPED_UPSTREAM" in down_skips
        # whenever down committed, up committed the same timestamp
        up_ts = {sp.data_ts for sp in s.spans("up")}
        assert all(sp.data_ts in up_ts for sp in s.spans("down"))

    def test_error_threshold_suspends(self):
        bad_ts = frozenset({96.0 * k for k in range(1, 10)})
        specs = {
            "a": DTSpec("a", target_lag=300.0, source_update_period=10.0, error_at=bad_ts)
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(3000.0)
        st = s.state["a"]
        assert st.suspended
        assert len(st.errors) == 5  # stops attempting after suspension

    def test_full_mode_uses_full_cost(self):
        specs = {
            "a": DTSpec(
                "a",
                target_lag=600.0,
                source_update_period=10.0,
                refresh_mode=FULL,
                full_cost_s=17.0,
            )
        }
        s = Scheduler(specs, ModelExecutor(specs))
        s.run(1000.0)
        body = s.spans("a")[1:]  # skip REINITIALIZE
        assert all(sp.action == FULL and (sp.end - sp.start) == 17.0 for sp in body)


class TestEngineScheduler:
    def test_real_engine_refreshes_under_scheduler(self, spark):
        engine = DTEngine(spark, small_store(seed=31))
        engine.create_dynamic_table(
            "dt_up", P.Filter(P.Scan("t_orders"), "o_price > 100"), now=0.0
        )
        engine.create_dynamic_table(
            "dt_down",
            P.Aggregate(P.Scan("dt_up"), ("o_status",), (("n", "count(*)"),)),
            now=0.0,
        )
        # source data arrives at t=30 and t=130
        for i, ts in enumerate([30.0, 130.0]):
            txn = engine.txn(now=ts)
            txn.insert(
                "t_orders",
                pd.DataFrame(
                    {"o_ok": [5000 + i], "o_ck": [1], "o_price": [500.0], "o_status": ["O"]}
                ),
            )
            txn.commit()
        specs = {
            "dt_up": DTSpec("dt_up", target_lag=300.0),
            "dt_down": DTSpec("dt_down", target_lag=300.0, upstreams=("dt_up",)),
        }
        s = Scheduler(specs, EngineExecutor(engine))
        s.run(300.0)
        acts = [sp.action for sp in s.spans("dt_up")]
        assert INCREMENTAL in acts and NO_DATA in acts
        assert engine.dts["dt_down"].data_timestamp == s.state["dt_down"].data_ts
        engine_dvs_check(engine, "dt_up")
        engine_dvs_check(engine, "dt_down")
