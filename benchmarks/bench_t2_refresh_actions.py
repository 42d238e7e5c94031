"""T2 benchmark: cost of NO_DATA vs INCREMENTAL vs FULL refresh actions
(SF=0.1). NO_DATA must be orders of magnitude cheaper — the §6.3 '>90% of
refreshes have no data' fleet pattern depends on it."""
import os

import pytest

from repro.core.refresh import NO_DATA
from repro.experiments import t2_refresh_actions as t2
from repro.experiments.common import AGG_PLAN, tpch_engine

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="module")
def t2_result(spark):
    res = t2.run(spark, sf=SF)
    print("\n" + t2.format_table(res))
    m = res["mean_wall_s"]
    assert m[NO_DATA] < 0.1 * m["FULL"], "NO_DATA must be negligible vs FULL"
    return res


def test_t2_no_data_refresh(benchmark, spark, t2_result):
    engine = tpch_engine(spark, sf=0.01)
    engine.create_dynamic_table("dt_nd", AGG_PLAN, now=0.0)
    state = {"ts": 0.0}

    def refresh():
        state["ts"] += 10.0
        res = engine.refresh("dt_nd", ts=state["ts"])
        assert res.action == NO_DATA
        return res

    benchmark.pedantic(refresh, rounds=20, iterations=1)
