"""T5 benchmark: read-skew detection — PTS masking vs DVS derivations (§4),
plus the engine-level invariant demo."""
import pytest

from repro.experiments import t5_isolation as t5


@pytest.fixture(scope="module")
def t5_result(spark):
    res = t5.run(spark, n_samples=300, seed=0)
    print("\n" + t5.format_table(res))
    h = res["histories"]
    assert h["figure1_pts_serializable"] is True
    assert h["figure2_dvs_g2"] is True
    assert h["dvs_detected"] == h["skewed"]  # DVS reveals every mixed epoch
    # the Figure-1 DT-staleness pattern is always masked by PTS, always
    # revealed by DVS; wider mixes PTS catches only partially
    assert h["adjacent_stale_pts_detected"] == 0
    assert h["adjacent_stale_dvs_detected"] == h["adjacent_stale"] > 0
    assert h["pts_detected"] < h["skewed"]
    d = res["engine_demo"]
    assert d["pts_violations"] == d["rounds"]
    assert d["dvs_violations"] == 0 and d["dvs_refusals"] == d["rounds"]
    return res


def test_t5_history_analysis(benchmark, t5_result):
    res = benchmark(t5.run_histories, n_samples=200, seed=1)
    assert res["adjacent_stale_pts_detected"] == 0
