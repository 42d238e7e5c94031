"""Experiment harnesses (T1–T7) at unit-test scale: each must run end to end
and reproduce the paper's qualitative shape. The full-scale numbers live in
benchmarks/ and EXPERIMENTS.md."""
import pytest

from repro.experiments import (
    t1_incremental_vs_full as t1,
    t2_refresh_actions as t2,
    t3_operator_coverage as t3,
    t4_scheduler as t4,
    t5_isolation as t5,
    t6_population as t6,
    t7_streaming as t7,
)


class TestT1:
    def test_small_scale_shape(self, spark):
        res = t1.run(spark, sf=0.003, fractions=(0.01, 0.5))
        s = t1.summarize(res)
        # at tiny SF the fixed costs dominate, but the sweep must complete
        # and the table must render
        assert len(res["rows"]) == 2
        assert "T1" in t1.format_table(res)
        assert isinstance(s["join_speedup_small"], float)

    def test_actions_are_expected(self, spark):
        res = t1.run(spark, sf=0.003, fractions=(0.01,))
        r = res["rows"][0]
        assert r["dt_join_incr"]["action"] == "INCREMENTAL"
        assert r["dt_join_full"]["action"] == "FULL"


class TestT2:
    def test_no_data_is_cheapest(self, spark):
        res = t2.run(spark, sf=0.003)
        m = res["mean_wall_s"]
        assert m["NO_DATA"] < m["INCREMENTAL"]
        assert m["NO_DATA"] < m["FULL"]
        assert "T2" in t2.format_table(res)


class TestT3:
    def test_coverage(self):
        res = t3.run(n_queries=150, seed=3)
        assert 0.5 < res["frac_incremental"] <= 1.0
        assert "T3" in t3.format_table(res)


class TestT4:
    def test_scheduling_and_heuristic(self, spark):
        res = t4.run(spark, hours=6.0, depth=4)
        assert res["scheduling"]["single"]["per_dt"]["a"]["attainment"] == 1.0
        assert res["scheduling"]["chain_inverted"]["per_dt"]["b"]["attainment"] < 0.5
        ih = res["init_heuristic"]
        assert ih["with_heuristic"] == 4
        assert ih["without_heuristic"] == 10
        assert "T4" in t4.format_table(res)


class TestT5:
    def test_detection_counts(self, spark):
        res = t5.run(spark, n_samples=60, seed=1)
        h = res["histories"]
        assert h["figure1_pts_serializable"] and h["figure2_dvs_g2"]
        assert h["dvs_detected"] == h["skewed"]
        assert h["adjacent_stale_pts_detected"] == 0
        d = res["engine_demo"]
        assert d["pts_violations"] == d["rounds"]
        assert d["dvs_refusals"] == d["rounds"] and d["dvs_violations"] == 0
        assert "T5" in t5.format_table(res)


class TestT6:
    def test_fleet_only(self):
        res = t6.run(None, n_dts=50, hours=12.0)
        assert res["fleet"]["frac_no_data"] > 0.8
        assert "T6" in t6.format_table(res)


class TestT7:
    def test_tiny_pipeline(self, spark):
        res = t7.run(spark, n_trains=3, hours=2, n_batches=2, seed=5)
        assert res["dt_delays"] == res["truth_delays"]
        assert "T7" in t7.format_table(res)
