"""T4 benchmark: scheduler — canonical periods, attainment, skip/catch-up,
and the §3.1.2 initialization heuristic (real engine for the latter)."""
import pytest

from repro.experiments import t4_scheduler as t4


@pytest.fixture(scope="module")
def t4_result(spark):
    res = t4.run(spark, hours=24.0, depth=6)
    print("\n" + t4.format_table(res))
    sched = res["scheduling"]
    for topo in ("single", "chain3", "diamond"):
        for n, d in sched[topo]["per_dt"].items():
            assert d["attainment"] >= 0.95, (topo, n, d)
    # §5.2's admitted limitation: a tight lag under a loose upstream cannot
    # be met once clamped to the upstream's canonical period
    assert sched["chain_inverted"]["per_dt"]["b"]["attainment"] < 0.5
    assert sched["overloaded"]["per_dt"]["a"]["skips"] > 0
    ih = res["init_heuristic"]
    assert ih["with_heuristic"] == ih["depth"]
    assert ih["without_heuristic"] == ih["quadratic_bound"]
    return res


def test_t4_simulated_day_of_scheduling(benchmark, t4_result):
    res = benchmark.pedantic(t4.run_scheduling, kwargs={"hours": 24.0}, rounds=3, iterations=1)
    assert res["single"]["per_dt"]["a"]["refreshes"] > 100
