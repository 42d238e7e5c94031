"""DTEngine end-to-end: refresh actions, DVS, frontiers, initialization
heuristic, error handling — §3 and §5 of the paper."""
import pandas as pd
import pytest

from repro.core import plan as P
from repro.core.engine import DTEngine, DTSuspendedError, MAX_CONSECUTIVE_ERRORS
from repro.core.refresh import FULL, INCREMENTAL, NO_DATA, REINITIALIZE
from repro.substrate.versioned_store import RID, VersionNotFound

from tests.helpers import engine_dvs_check, small_store

ORDERS = P.Scan("t_orders")
LINES = P.Scan("t_lines")

AGG_PLAN = P.Aggregate(
    P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
    ("o_status",),
    (("n", "count(*)"), ("q", "sum(l_qty)")),
)


def make_engine(spark, **kw) -> DTEngine:
    return DTEngine(spark, small_store(seed=3), **kw)


def dml_orders(engine, ts, *, n_ins=2, delete=None):
    txn = engine.txn(now=ts)
    if n_ins:
        base = 1000 + int(ts * 10)
        txn.insert(
            "t_orders",
            pd.DataFrame(
                {
                    "o_ok": range(base, base + n_ins),
                    "o_ck": [1] * n_ins,
                    "o_price": [50.0] * n_ins,
                    "o_status": ["O"] * n_ins,
                }
            ),
        )
    if delete:
        txn.delete("t_orders", delete)
    txn.commit()


class TestLifecycle:
    def test_create_initializes_synchronously(self, spark):
        e = make_engine(spark)
        dt = e.create_dynamic_table("dt1", AGG_PLAN, now=10.0)
        assert dt.initialized and dt.data_timestamp == 10.0
        assert dt.refresh_log[0].action == REINITIALIZE
        engine_dvs_check(e, "dt1")

    def test_auto_mode_resolution(self, spark):
        e = make_engine(spark)
        a = e.create_dynamic_table("a", AGG_PLAN, now=1.0)
        b = e.create_dynamic_table(
            "b", P.Aggregate(ORDERS, (), (("n", "count(*)"),)), now=1.0
        )
        assert a.refresh_mode == INCREMENTAL
        assert b.refresh_mode == FULL

    def test_explicit_incremental_on_unsupported_rejected(self, spark):
        e = make_engine(spark)
        with pytest.raises(ValueError):
            e.create_dynamic_table(
                "bad",
                P.Aggregate(ORDERS, (), (("n", "count(*)"),)),
                refresh_mode=INCREMENTAL,
                now=0.0,
            )

    def test_query_before_initialization_errors(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0, initialize=False)
        with pytest.raises(RuntimeError, match="not yet initialized"):
            e.query("dt1")

    def test_query_returns_contents_without_rid(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        df = e.query("dt1")
        assert RID not in df.columns
        assert df.count() > 0

    def test_name_collision_rejected(self, spark):
        e = make_engine(spark)
        with pytest.raises(ValueError):
            e.create_dynamic_table("t_orders", AGG_PLAN, now=0.0)


class TestRefreshActions:
    def test_no_data_when_sources_unchanged(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        res = e.refresh("dt1", ts=10.0)
        assert res.action == NO_DATA and res.rows_changed == 0
        assert e.dts["dt1"].data_timestamp == 10.0
        engine_dvs_check(e, "dt1")

    def test_incremental_after_dml(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        dml_orders(e, 5.0)
        res = e.refresh("dt1", ts=10.0)
        assert res.action == INCREMENTAL
        engine_dvs_check(e, "dt1")

    def test_full_mode_runs_full_action(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, refresh_mode=FULL, now=0.0)
        dml_orders(e, 5.0)
        res = e.refresh("dt1", ts=10.0)
        assert res.action == FULL
        engine_dvs_check(e, "dt1")

    def test_full_mode_still_no_data_when_unchanged(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, refresh_mode=FULL, now=0.0)
        assert e.refresh("dt1", ts=10.0).action == NO_DATA

    def test_reinitialize_after_base_replace(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        new_orders = small_store(seed=99).table("t_orders").current.snapshot.drop(columns=[RID])
        e.replace_base_table("t_orders", new_orders, now=5.0)
        res = e.refresh("dt1", ts=10.0)
        assert res.action == REINITIALIZE
        engine_dvs_check(e, "dt1")

    def test_reinitialize_after_alter_definition(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        e.alter_definition("dt1", P.Filter(ORDERS, "o_price > 100"), now=5.0)
        res = e.refresh("dt1", ts=10.0)
        assert res.action == REINITIALIZE
        engine_dvs_check(e, "dt1")

    def test_incremental_sequence_with_dvs_checks(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        for i in range(1, 4):
            dml_orders(e, 10.0 * i - 5, n_ins=i, delete="o_ok % 17 == 0" if i == 2 else None)
            res = e.refresh("dt1", ts=10.0 * i)
            assert res.action == INCREMENTAL
            engine_dvs_check(e, "dt1")

    def test_refresh_log_and_change_fraction(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price >= 0"), now=0.0)
        dml_orders(e, 5.0, n_ins=1)
        res = e.refresh("dt1", ts=10.0)
        assert res.rows_inserted == 1
        assert 0 < res.change_fraction < 0.1
        assert [r.action for r in e.dts["dt1"].refresh_log] == [REINITIALIZE, INCREMENTAL]


class TestChainedDTs:
    def _chain(self, spark, **kw):
        e = make_engine(spark, **kw)
        e.create_dynamic_table("up", P.Filter(ORDERS, "o_price > 100"), now=0.0)
        e.create_dynamic_table(
            "down",
            P.Aggregate(P.Scan("up"), ("o_status",), (("n", "count(*)"), ("t", "sum(o_price)"))),
            now=0.0,
        )
        return e

    def test_downstream_reads_upstream_at_same_timestamp(self, spark):
        e = self._chain(spark)
        dml_orders(e, 5.0)
        e.refresh_graph(ts=10.0)
        engine_dvs_check(e, "up")
        engine_dvs_check(e, "down")

    def test_dvs_validation_fails_without_upstream_version(self, spark):
        e = self._chain(spark)
        dml_orders(e, 5.0)
        with pytest.raises(VersionNotFound):
            e.refresh("down", ts=10.0)  # upstream has no version at 10.0

    def test_no_data_propagates_through_chain(self, spark):
        e = self._chain(spark)
        results = {r.name: r for r in e.refresh_graph(ts=10.0)}
        assert results["up"].action == NO_DATA
        assert results["down"].action == NO_DATA

    def test_upstream_change_propagates_incrementally(self, spark):
        e = self._chain(spark)
        dml_orders(e, 5.0, n_ins=3)
        results = {r.name: r for r in e.refresh_graph(ts=10.0)}
        assert results["up"].action == INCREMENTAL
        assert results["down"].action == INCREMENTAL
        engine_dvs_check(e, "down")

    def test_manual_refresh_refreshes_upstream_chain(self, spark):
        e = self._chain(spark)
        dml_orders(e, 5.0)
        results = e.manual_refresh("down", now=20.0)
        assert [r.name for r in results] == ["up", "down"]
        assert e.dts["up"].data_timestamp == 20.0
        assert e.dts["down"].data_timestamp == 20.0

    def test_three_level_chain(self, spark):
        e = self._chain(spark)
        e.create_dynamic_table(
            "down2", P.Filter(P.Scan("down"), "n > 0"), now=0.0
        )
        dml_orders(e, 5.0)
        e.refresh_graph(ts=10.0)
        engine_dvs_check(e, "down2")

    def test_diamond_graph(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("src", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        e.create_dynamic_table(
            "l", P.Aggregate(P.Scan("src"), ("o_status",), (("n", "count(*)"),)), now=0.0
        )
        e.create_dynamic_table(
            "r", P.Aggregate(P.Scan("src"), ("o_ck",), (("m", "max(o_price)"),)), now=0.0
        )
        e.create_dynamic_table(
            "sink",
            P.Join(
                P.Project(P.Scan("l"), (("s1", "o_status"), ("n", "n"))),
                P.Project(P.Scan("r"), (("k2", "o_ck"), ("m", "m"))),
                ("n",),
                ("k2",),
                "left",
            ),
            now=0.0,
        )
        dml_orders(e, 5.0)
        e.refresh_graph(ts=10.0)
        engine_dvs_check(e, "sink")


class TestInitializationHeuristic:
    def test_chain_creation_is_linear_not_quadratic(self, spark):
        # §3.1.2: creating DTs in dependency order must not refresh the
        # whole upstream chain per creation.
        e = make_engine(spark)
        e.create_dynamic_table("c0", P.Filter(ORDERS, "o_price > 0"), now=0.0, target_lag=100.0)
        for i in range(1, 5):
            e.create_dynamic_table(
                f"c{i}", P.Filter(P.Scan(f"c{i-1}"), "o_price > 0"), now=float(i), target_lag=100.0
            )
        counts = {n: len(e.dts[n].refresh_log) for n in e.dts}
        assert all(c == 1 for c in counts.values()), counts

    def test_without_heuristic_refreshes_cascade(self, spark):
        e = make_engine(spark, init_heuristic=False)
        e.create_dynamic_table("c0", P.Filter(ORDERS, "o_price > 0"), now=0.0, target_lag=100.0)
        for i in range(1, 5):
            e.create_dynamic_table(
                f"c{i}", P.Filter(P.Scan(f"c{i-1}"), "o_price > 0"), now=float(i), target_lag=100.0
            )
        total = sum(len(e.dts[n].refresh_log) for n in e.dts)
        # c0 refreshed at each downstream creation: 5+4+3+2+1 = 15 total
        assert total == 15

    def test_init_timestamp_can_be_before_creation(self, spark):
        # "a DT created at t might be initialized to a data timestamp t' < t"
        e = make_engine(spark)
        e.create_dynamic_table("up", P.Filter(ORDERS, "o_price > 0"), now=0.0, target_lag=100.0)
        dt = e.create_dynamic_table(
            "down", P.Filter(P.Scan("up"), "o_price > 10"), now=50.0, target_lag=100.0
        )
        assert dt.data_timestamp == 0.0 < dt.created_at

    def test_stale_upstream_outside_lag_forces_fresh_timestamp(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("up", P.Filter(ORDERS, "o_price > 0"), now=0.0, target_lag=10.0)
        dt = e.create_dynamic_table(
            "down", P.Filter(P.Scan("up"), "o_price > 10"), now=500.0, target_lag=10.0
        )
        assert dt.data_timestamp == 500.0
        assert e.dts["up"].data_timestamp == 500.0  # refreshed to serve init


class TestErrorsAndSuspension:
    def _failing_engine(self, spark):
        e = make_engine(spark)
        # assert_true fails at runtime once any o_price >= 900 exists
        plan = P.Project(
            ORDERS,
            (("ok", "o_ok"), ("chk", "assert_true(o_price < 900)")),
        )
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        return e

    def test_user_error_fails_refresh_and_counts(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        e.alter_definition("dt1", P.Project(ORDERS, (("ok", "o_ok"), ("chk", "assert_true(o_price < -1)"))), now=1.0)
        with pytest.raises(Exception):
            e.refresh("dt1", ts=10.0)
        assert e.dts["dt1"].error_count == 1
        assert e.dts["dt1"].refresh_log[-1].action == "ERROR"

    def test_suspension_after_consecutive_errors(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        e.alter_definition("dt1", P.Project(ORDERS, (("ok", "o_ok"), ("chk", "assert_true(o_price < -1)"))), now=1.0)
        for i in range(MAX_CONSECUTIVE_ERRORS):
            with pytest.raises(Exception):
                e.refresh("dt1", ts=10.0 + i)
        assert e.dts["dt1"].suspended
        with pytest.raises(DTSuspendedError):
            e.refresh("dt1", ts=100.0)

    def test_success_resets_error_counter(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        bad = P.Project(ORDERS, (("ok", "o_ok"), ("chk", "assert_true(o_price < -1)")))
        good = P.Filter(ORDERS, "o_price > 0")
        e.alter_definition("dt1", bad, now=1.0)
        with pytest.raises(Exception):
            e.refresh("dt1", ts=10.0)
        e.alter_definition("dt1", good, now=11.0)
        e.refresh("dt1", ts=20.0)
        assert e.dts["dt1"].error_count == 0

    def test_resume_after_suspension(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", P.Filter(ORDERS, "o_price > 0"), now=0.0)
        e.dts["dt1"].suspended = True
        e.dts["dt1"].error_count = 7
        e.resume("dt1")
        assert e.refresh("dt1", ts=10.0).action == NO_DATA


class TestTargetLag:
    def test_downstream_lag_resolves_to_min_of_downstreams(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("up", P.Filter(ORDERS, "o_price > 0"), target_lag="DOWNSTREAM", now=0.0)
        e.create_dynamic_table("d1", P.Filter(P.Scan("up"), "o_price > 1"), target_lag=120.0, now=0.0)
        e.create_dynamic_table("d2", P.Filter(P.Scan("up"), "o_price > 2"), target_lag=60.0, now=0.0)
        assert e.effective_target_lag("up") == 60.0

    def test_downstream_without_consumers_is_unbounded(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("up", P.Filter(ORDERS, "o_price > 0"), target_lag="DOWNSTREAM", now=0.0)
        assert e.effective_target_lag("up") == float("inf")

    def test_chained_downstream_resolution(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("a", P.Filter(ORDERS, "o_price > 0"), target_lag="DOWNSTREAM", now=0.0)
        e.create_dynamic_table("b", P.Filter(P.Scan("a"), "o_price > 1"), target_lag="DOWNSTREAM", now=0.0)
        e.create_dynamic_table("c", P.Filter(P.Scan("b"), "o_price > 2"), target_lag=300.0, now=0.0)
        assert e.effective_target_lag("a") == 300.0


class TestFrontiers:
    def test_frontier_tracks_each_source(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        f = e.dts["dt1"].frontier
        assert set(f) == {"t_orders", "t_lines"}
        assert all("vidx" in v and "generation" in v for v in f.values())

    def test_frontier_advances_only_for_changed_source(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        before = {k: v["vidx"] for k, v in e.dts["dt1"].frontier.items()}
        dml_orders(e, 5.0)
        e.refresh("dt1", ts=10.0)
        after = {k: v["vidx"] for k, v in e.dts["dt1"].frontier.items()}
        assert after["t_orders"] == before["t_orders"] + 1
        assert after["t_lines"] == before["t_lines"]

    def test_refresh_map_entries_for_no_data(self, spark):
        e = make_engine(spark)
        e.create_dynamic_table("dt1", AGG_PLAN, now=0.0)
        e.refresh("dt1", ts=10.0)  # NO_DATA
        t = e.store.table("dt1")
        assert t.refresh_map[0.0] == t.refresh_map[10.0]
        assert len(t.versions) == 1
