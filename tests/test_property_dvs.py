"""The paper's strongest assertion (§6.1, level 4):

    "if you run the defining query as of the data timestamp, you should get
    the same result as in the DT"

applied to randomized DTs + randomized DML histories, with incremental
refreshes throughout, checked against the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.core import plan as P
from repro.core.engine import DTEngine
from repro.core.refresh import INCREMENTAL
from repro.workload.generator import QueryGenerator

from tests.helpers import engine_dvs_check, small_store


def random_dml(engine: DTEngine, rng: np.random.Generator, ts: float) -> None:
    """A random change batch against the three standard base tables."""
    txn = engine.txn(now=ts)
    base = int(ts * 100)
    if rng.random() < 0.8:
        n = int(rng.integers(1, 6))
        txn.insert(
            "t_orders",
            pd.DataFrame(
                {
                    "o_ok": range(base, base + n),
                    "o_ck": rng.integers(1, 13, n),
                    "o_price": (rng.random(n) * 1000).round(2),
                    "o_status": rng.choice(list("OFP"), n),
                }
            ),
        )
    if rng.random() < 0.6:
        n = int(rng.integers(1, 8))
        txn.insert(
            "t_lines",
            pd.DataFrame(
                {
                    "l_ok": rng.integers(1, 50, n),
                    "l_pk": rng.integers(1, 16, n),
                    "l_qty": rng.integers(1, 20, n).astype("float64"),
                }
            ),
        )
    if rng.random() < 0.4:
        txn.delete("t_orders", f"o_ok % 7 == {int(rng.integers(0, 7))}")
    if rng.random() < 0.3:
        txn.delete("t_lines", f"l_pk == {int(rng.integers(1, 16))}")
    if rng.random() < 0.3:
        txn.update(
            "t_orders",
            f"o_ck == {int(rng.integers(1, 13))}",
            {"o_price": lambda d: d["o_price"] + 1.0},
        )
    if rng.random() < 0.2:
        txn.insert("t_cust", pd.DataFrame({"c_ck": [base], "c_seg": ["A"]}))
    txn.commit()


@pytest.mark.parametrize("seed", range(12))
def test_randomized_dt_maintains_dvs_invariant(spark, seed):
    """Random query + 3 random DML/refresh cycles; invariant after each."""
    rng = np.random.default_rng(1000 + seed)
    engine = DTEngine(spark, small_store(seed=seed))
    plan_ = QueryGenerator(seed=seed).random_plan(allow_unsupported=False)
    dt = engine.create_dynamic_table("dt_rand", plan_, now=0.0)
    assert dt.refresh_mode == INCREMENTAL
    engine_dvs_check(engine, "dt_rand")
    for cycle in range(1, 4):
        random_dml(engine, rng, ts=cycle * 10.0 - 5.0)
        engine.refresh("dt_rand", ts=cycle * 10.0)
        engine_dvs_check(engine, "dt_rand")


@pytest.mark.parametrize("seed", range(4))
def test_randomized_chained_dts_maintain_dvs(spark, seed):
    """A random upstream DT + downstream aggregate over it, refreshed as a
    graph: both must satisfy the invariant (downstream reads upstream at the
    same data timestamp)."""
    rng = np.random.default_rng(2000 + seed)
    engine = DTEngine(spark, small_store(seed=50 + seed))
    up_plan = P.Filter(P.Scan("t_orders"), "o_price > 100")
    engine.create_dynamic_table("up_r", up_plan, now=0.0)
    down_plan = P.Aggregate(
        P.Scan("up_r"), ("o_status",), (("n", "count(*)"), ("t", "sum(o_price)"))
    )
    engine.create_dynamic_table("down_r", down_plan, now=0.0)
    for cycle in range(1, 4):
        random_dml(engine, rng, ts=cycle * 10.0 - 5.0)
        engine.refresh_graph(ts=cycle * 10.0)
        engine_dvs_check(engine, "up_r")
        engine_dvs_check(engine, "down_r")


@pytest.mark.parametrize("seed", range(4))
def test_randomized_full_mode_dts(spark, seed):
    """FULL-mode DTs (unsupported operators) satisfy the same invariant."""
    rng = np.random.default_rng(3000 + seed)
    engine = DTEngine(spark, small_store(seed=80 + seed))
    g = QueryGenerator(seed=300 + seed)
    plan_ = None
    for _ in range(50):
        cand = g.random_plan(allow_unsupported=True)
        if not P.incremental_supported(cand):
            plan_ = cand
            break
    assert plan_ is not None, "generator never produced an unsupported plan"
    dt = engine.create_dynamic_table("dt_full", plan_, now=0.0)
    assert dt.refresh_mode == "FULL"
    for cycle in range(1, 3):
        random_dml(engine, rng, ts=cycle * 10.0 - 5.0)
        engine.refresh("dt_full", ts=cycle * 10.0)
        engine_dvs_check(engine, "dt_full")
