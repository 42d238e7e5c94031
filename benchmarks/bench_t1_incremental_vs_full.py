"""T1 benchmark: incremental vs full refresh cost vs change fraction
(TPC-H-lite SF=0.1). The module fixture runs the full sweep once and prints
the paper-vs-measured table; the benchmark tests time representative
refreshes on the resulting engine state."""
import os

import pytest

from repro.core.refresh import FULL, INCREMENTAL
from repro.experiments import t1_incremental_vs_full as t1
from repro.experiments.common import insert_lineitem_fraction

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="module")
def t1_result(spark):
    res = t1.run(spark, sf=SF)
    print("\n" + t1.format_table(res))
    s = t1.summarize(res)
    print(f"[T1 summary] {s}")
    # shape assertions from the paper's claims
    assert s["join_speedup_small"] > 1.0, "incremental must win at small changes"
    assert s["join_speedup_small"] > s["join_speedup_large"], (
        "incremental advantage must shrink as the change fraction grows"
    )
    return res


def _dml_then(engine, ts, fraction):
    insert_lineitem_fraction(engine, fraction=fraction, ts=ts - 1.0)


def test_t1_incremental_refresh_small_change(benchmark, t1_result):
    engine, ts = t1_result["engine"], t1_result["last_ts"] + 100.0
    _dml_then(engine, ts, 0.001)

    def refresh():
        res = engine.refresh("dt_join_incr", ts=ts)
        assert res.action == INCREMENTAL
        return res

    benchmark.pedantic(refresh, rounds=1, iterations=1)


def test_t1_incremental_refresh_bulk_change(benchmark, t1_result):
    engine, ts = t1_result["engine"], t1_result["last_ts"] + 200.0
    _dml_then(engine, ts, 0.2)

    def refresh():
        res = engine.refresh("dt_join_incr", ts=ts)
        assert res.action == INCREMENTAL
        return res

    benchmark.pedantic(refresh, rounds=1, iterations=1)


def test_t1_full_refresh(benchmark, t1_result):
    engine, ts = t1_result["engine"], t1_result["last_ts"] + 300.0
    _dml_then(engine, ts, 0.001)

    def refresh():
        res = engine.refresh("dt_join_full", ts=ts)
        assert res.action == FULL
        return res

    benchmark.pedantic(refresh, rounds=1, iterations=1)


def test_t1_agg_incremental_refresh(benchmark, t1_result):
    engine, ts = t1_result["engine"], t1_result["last_ts"] + 400.0
    _dml_then(engine, ts, 0.001)

    def refresh():
        res = engine.refresh("dt_agg_incr", ts=ts)
        assert res.action == INCREMENTAL
        return res

    benchmark.pedantic(refresh, rounds=1, iterations=1)
