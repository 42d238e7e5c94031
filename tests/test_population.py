"""Fleet population (T3/T6 infrastructure): Fig. 5 lag sampling, fleet
simulation output statistics, operator coverage, and the real-engine
change-fraction population."""
import numpy as np
import pytest

from repro.core.refresh import INCREMENTAL, NO_DATA
from repro.workload.population import (
    FIG5_LAG_BUCKETS,
    change_fraction_stats,
    lag_bucket_shares,
    operator_coverage,
    run_engine_population,
    run_fleet,
    sample_fleet,
    sample_target_lag,
)


class TestLagDistribution:
    def test_bucket_probs_sum_to_one(self):
        assert abs(sum(p for _, p in FIG5_LAG_BUCKETS) - 1.0) < 1e-9

    def test_sampled_shares_match_fig5_bands(self):
        rng = np.random.default_rng(0)
        lags = [sample_target_lag(rng) for _ in range(4000)]
        shares = lag_bucket_shares(lags)
        # paper: ~20% < 5 min, ~55% in between, ~25% >= 16h
        assert 0.15 < shares["lt_5min"] < 0.25
        assert 0.50 < shares["5min_to_16h"] < 0.60
        assert 0.20 < shares["ge_16h"] < 0.30


class TestFleetSimulation:
    def test_fleet_runs_and_reports(self):
        specs = sample_fleet(60, seed=1)
        sched, stats = run_fleet(specs, hours=24.0)
        assert stats.n_dts == 60
        assert stats.n_refreshes > 500

    def test_no_data_dominates(self):
        """§6.3: 'More than 90% of refreshes have no data' — reproduced when
        target lags sit below source update rates."""
        specs = sample_fleet(60, seed=2)
        _, stats = run_fleet(specs, hours=24.0)
        assert stats.frac_no_data > 0.85

    def test_lag_attainment_high(self):
        specs = sample_fleet(40, seed=3)
        _, stats = run_fleet(specs, hours=24.0)
        assert stats.mean_attainment > 0.95

    def test_incremental_share_configurable(self):
        specs = sample_fleet(200, seed=4, incremental_share=0.7)
        modes = [s.refresh_mode for s in specs.values()]
        assert 0.6 < modes.count(INCREMENTAL) / len(modes) < 0.8


class TestOperatorCoverage:
    def test_coverage_near_paper_70pct(self):
        """§6.3: 'almost 70% of active DTs have an incremental refresh
        mode' — our Fig. 6-mixed generator population lands nearby."""
        cov = operator_coverage(400, seed=0)
        assert 0.6 < cov["frac_incremental"] < 0.85

    def test_unsupported_reasons_reported(self):
        cov = operator_coverage(400, seed=0)
        assert set(cov["unsupported_by_reason"]) <= {
            "ScalarAggregate",
            "ScalarSubqueryFilter",
            "InSubqueryFilter",
            "UnpartitionedWindow",
        }
        assert sum(cov["unsupported_by_reason"].values()) == round(
            (1 - cov["frac_incremental"]) * 400
        )

    def test_operator_frequencies_have_expected_shape(self):
        cov = operator_coverage(400, seed=1)
        freq = cov["operator_frequency"]
        # Fig. 6 shape: projections/filters/scans near-universal, joins and
        # aggregates common, the unsupported tail small
        assert freq["Scan"] == 1.0
        assert freq["Project"] > 0.9
        assert freq.get("Join", 0) > 0.3
        assert freq.get("Aggregate", 0) > 0.2
        assert freq.get("InSubqueryFilter", 0) < 0.2


class TestEnginePopulation:
    def test_change_fractions_match_6_3_shape(self, spark):
        """§6.3: 67% of incremental refreshes change <1% of the DT; 21%
        change >10%. Same shape (small majority / bulk minority) here."""
        results = run_engine_population(spark, n_dts=5, cycles=8, seed=0)
        stats = change_fraction_stats(results)
        assert stats["n"] >= 10
        assert stats["frac_lt_1pct"] > 0.4
        assert stats["frac_gt_10pct"] > 0.05
        assert stats["frac_lt_1pct"] > stats["frac_gt_10pct"]

    def test_population_includes_no_data(self, spark):
        results = run_engine_population(spark, n_dts=4, cycles=6, seed=1)
        actions = {r.action for r in results}
        assert INCREMENTAL in actions
