"""T6 benchmark: fleet usage statistics (§6.3) — simulated fleet through the
scheduler plus a small real-engine population for change fractions."""
import pytest

from repro.experiments import t6_population as t6


@pytest.fixture(scope="module")
def t6_result(spark):
    res = t6.run(spark, n_dts=150, hours=48.0, engine_dts=6, engine_cycles=10)
    print("\n" + t6.format_table(res))
    f = res["fleet"]
    assert f["frac_no_data"] > 0.85  # paper: >90%
    assert 0.15 < f["lag_shares"]["lt_5min"] < 0.3  # Fig. 5: ~20%
    assert f["lag_shares"]["ge_16h"] > 0.15  # Fig. 5: ~25%
    c = res["change_fractions"]
    assert c["frac_lt_1pct"] > c["frac_gt_10pct"]  # §6.3 shape: 67% vs 21%
    return res


def test_t6_fleet_simulation(benchmark, t6_result):
    from repro.workload.population import run_fleet, sample_fleet

    specs = sample_fleet(100, seed=5)
    _, stats = benchmark.pedantic(run_fleet, args=(specs,), kwargs={"hours": 24.0}, rounds=2, iterations=1)
    assert stats.frac_no_data > 0.8
