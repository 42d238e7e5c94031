"""Query differentiation (§5.5): for every operator and change pattern,
``merge(full(t0), Δ_(t0,t1])`` must equal ``full(t1)`` row-for-row, and the
result must match the DuckDB oracle."""
import pandas as pd
import pytest

from repro.core import plan as P
from repro.core.differentiation import UnsupportedIncremental, compile_delta
from repro.substrate.txn import Transaction

from tests.helpers import StoreDeltaResolver, check_incremental, small_store

ORDERS = P.Scan("t_orders")
LINES = P.Scan("t_lines")
CUST = P.Scan("t_cust")
EVENTS = P.Scan("t_events")


def _store():
    return small_store(seed=11)


def ins_orders(store, ts, rows):
    txn = Transaction(store, ts)
    txn.insert("t_orders", pd.DataFrame(rows))
    txn.commit()


def ins_lines(store, ts, rows):
    txn = Transaction(store, ts)
    txn.insert("t_lines", pd.DataFrame(rows))
    txn.commit()


def mixed_dml(store, ts=1.0):
    """A representative change batch: inserts + deletes + updates, both tables."""
    txn = Transaction(store, ts)
    txn.insert(
        "t_orders",
        pd.DataFrame(
            {"o_ok": [200, 201], "o_ck": [1, 99], "o_price": [10.5, 990.0], "o_status": ["O", "P"]}
        ),
    )
    txn.delete("t_orders", "o_ok <= 3")
    txn.update("t_orders", "o_ok == 10", {"o_price": 5000.0, "o_status": "F"})
    txn.insert("t_lines", pd.DataFrame({"l_ok": [200, 200, 5], "l_pk": [1, 2, 3], "l_qty": [7.0, 8.0, 9.0]}))
    txn.delete("t_lines", "l_ok == 7")
    txn.update("t_lines", "l_ok == 10", {"l_qty": 99.0})
    txn.commit()


class TestLinearOperators:
    def test_filter_insert_only(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [700.0], "o_status": ["O"]})
        m = check_incremental(spark, s, P.Filter(ORDERS, "o_price > 500"), 0.0, 1.0)
        assert m.rows_inserted == 1 and m.rows_deleted == 0

    def test_filter_mixed(self, spark):
        s = _store()
        mixed_dml(s)
        check_incremental(spark, s, P.Filter(ORDERS, "o_price > 100"), 0.0, 1.0)

    def test_filter_changes_filtered_out(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [1.0], "o_status": ["O"]})
        m = check_incremental(spark, s, P.Filter(ORDERS, "o_price > 500"), 0.0, 1.0)
        assert m.rows_inserted == 0 and m.rows_deleted == 0

    def test_project(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Project(ORDERS, (("k", "o_ok"), ("taxed", "o_price * 1.1")))
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_project_filter_stack(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Project(
            P.Filter(ORDERS, "o_status = 'O'"), (("k", "o_ok"), ("v", "o_price"))
        )
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_union_all(self, spark):
        s = _store()
        mixed_dml(s)
        a = P.Project(ORDERS, (("k", "o_ok"), ("v", "o_price")))
        b = P.Project(LINES, (("k", "l_ok"), ("v", "l_qty")))
        check_incremental(spark, s, P.UnionAll(a, b), 0.0, 1.0)

    def test_flatten(self, spark):
        s = _store()
        txn = Transaction(s, 1.0)
        txn.insert("t_events", pd.DataFrame({"e_id": [100], "e_k": ["x"], "e_tags": [[5, 5, 6]]}))
        txn.delete("t_events", "e_id <= 2")
        txn.commit()
        check_incremental(spark, s, P.Flatten(EVENTS, "e_tags", "tag"), 0.0, 1.0)


class TestInnerJoin:
    def test_insert_left_only(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [5], "o_ck": [1], "o_price": [1.0], "o_status": ["O"]})
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)

    def test_insert_right_only(self, spark):
        s = _store()
        ins_lines(s, 1.0, {"l_ok": [5, 5], "l_pk": [9, 9], "l_qty": [1.0, 2.0]})
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)

    def test_insert_both_sides_same_key(self, spark):
        # the ΔQ⋈ΔR cross term: both terms fire; consolidation must net out
        s = _store()
        txn = Transaction(s, 1.0)
        txn.insert("t_orders", pd.DataFrame({"o_ok": [500], "o_ck": [1], "o_price": [1.0], "o_status": ["O"]}))
        txn.insert("t_lines", pd.DataFrame({"l_ok": [500], "l_pk": [1], "l_qty": [3.0]}))
        txn.commit()
        m = check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)
        assert m.rows_inserted >= 1

    def test_delete_both_sides_same_key(self, spark):
        s = _store()
        txn = Transaction(s, 1.0)
        txn.delete("t_orders", "o_ok == 10")
        txn.delete("t_lines", "l_ok == 10")
        txn.commit()
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)

    def test_insert_left_delete_right_same_key(self, spark):
        # exact insert/delete pairs from the two bilinear terms must cancel
        s = _store()
        txn = Transaction(s, 1.0)
        txn.insert("t_orders", pd.DataFrame({"o_ok": [10], "o_ck": [1], "o_price": [2.0], "o_status": ["F"]}))
        txn.delete("t_lines", "l_ok == 10")
        txn.commit()
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)

    def test_mixed_dml(self, spark):
        s = _store()
        mixed_dml(s)
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 1.0)

    def test_residual_predicate(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner", residual="l_qty > 5")
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_three_way_join(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Join(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            CUST,
            ("o_ck",),
            ("c_ck",),
            "inner",
        )
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_multi_interval_composition(self, spark):
        # Δ over (0,2] must equal composing two commits
        s = _store()
        mixed_dml(s, ts=1.0)
        ins_lines(s, 2.0, {"l_ok": [201, 2], "l_pk": [4, 4], "l_qty": [1.0, 2.0]})
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"), 0.0, 2.0)


class TestOuterJoins:
    @pytest.mark.parametrize("how", ["left", "right", "full"])
    def test_mixed_dml(self, spark, how):
        s = _store()
        mixed_dml(s)
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), how), 0.0, 1.0)

    @pytest.mark.parametrize("how", ["left", "right", "full"])
    def test_match_appears(self, spark, how):
        # a previously NULL-padded row gains a match: anti row deleted, inner row inserted
        s = _store()
        ins_lines(s, 1.0, {"l_ok": [44], "l_pk": [1], "l_qty": [2.0]})
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), how), 0.0, 1.0)

    @pytest.mark.parametrize("how", ["left", "right", "full"])
    def test_match_disappears(self, spark, how):
        # deleting all lines of an order moves it back to the anti part
        s = _store()
        txn = Transaction(s, 1.0)
        txn.delete("t_lines", "l_ok == 10")
        txn.commit()
        check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), how), 0.0, 1.0)

    def test_left_join_insert_unmatched_left(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [999], "o_ck": [1], "o_price": [5.0], "o_status": ["O"]})
        m = check_incremental(spark, s, P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "left"), 0.0, 1.0)
        assert m.rows_inserted == 1

    def test_full_join_then_aggregate(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "full"),
            ("o_status",),
            (("n", "count(*)"), ("q", "sum(l_qty)")),
        )
        check_incremental(spark, s, p, 0.0, 1.0)


class TestAggregates:
    def test_insert_new_group(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [700.0], "o_status": ["Z"]})
        p = P.Aggregate(ORDERS, ("o_status",), (("n", "count(*)"), ("t", "sum(o_price)")))
        m = check_incremental(spark, s, p, 0.0, 1.0)
        assert m.rows_inserted == 1 and m.rows_deleted == 0  # brand-new group

    def test_update_existing_group(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [700.0], "o_status": ["O"]})
        p = P.Aggregate(ORDERS, ("o_status",), (("n", "count(*)"),))
        m = check_incremental(spark, s, p, 0.0, 1.0)
        assert m.rows_inserted == 1 and m.rows_deleted == 1  # delete+insert same rid

    def test_group_vanishes(self, spark):
        s = _store()
        txn = Transaction(s, 1.0)
        txn.delete("t_orders", "o_status == 'P'")
        txn.commit()
        p = P.Aggregate(ORDERS, ("o_status",), (("n", "count(*)"),))
        m = check_incremental(spark, s, p, 0.0, 1.0)
        assert m.rows_deleted >= 1

    def test_min_max_with_deletes(self, spark):
        # min/max are not distributive over deletes; changed-group recompute handles them
        s = _store()
        txn = Transaction(s, 1.0)
        txn.delete("t_orders", "o_price > 800")
        txn.commit()
        p = P.Aggregate(ORDERS, ("o_ck",), (("mx", "max(o_price)"), ("mn", "min(o_price)")))
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_avg(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Aggregate(LINES, ("l_pk",), (("a", "avg(l_qty)"),))
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_join_then_aggregate(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            ("o_status",),
            (("q", "sum(l_qty)"), ("n", "count(*)")),
        )
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_aggregate_then_join(self, spark):
        s = _store()
        mixed_dml(s)
        agg = P.Aggregate(LINES, ("l_ok",), (("q", "sum(l_qty)"),))
        p = P.Join(ORDERS, agg, ("o_ok",), ("l_ok",), "inner")
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_nested_aggregate(self, spark):
        s = _store()
        mixed_dml(s)
        inner = P.Aggregate(ORDERS, ("o_ck", "o_status"), (("t", "sum(o_price)"),))
        p = P.Aggregate(inner, ("o_status",), (("m", "max(t)"), ("n", "count(*)")))
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_distinct(self, spark):
        s = _store()
        mixed_dml(s)
        p = P.Distinct(P.Project(ORDERS, (("s", "o_status"), ("c", "o_ck"))))
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_distinct_duplicate_insert_no_change(self, spark):
        # inserting a duplicate of an existing distinct row must not change the DT
        s = _store()
        first = s.table("t_orders").current.snapshot.iloc[0]
        ins_orders(
            s,
            1.0,
            {"o_ok": [777], "o_ck": [int(first["o_ck"])], "o_price": [1.0], "o_status": [str(first["o_status"])]},
        )
        p = P.Distinct(P.Project(ORDERS, (("c", "o_ck"), ("s", "o_status"))))
        m = check_incremental(spark, s, p, 0.0, 1.0)
        assert m.rows_inserted == 0 and m.rows_deleted == 0


class TestWindows:
    def test_partition_recompute_running_sum(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [100.0], "o_status": ["O"]})
        p = P.Window(
            ORDERS, ("o_ck",), (("run", "sum(o_price) OVER (PARTITION BY o_ck ORDER BY o_ok)"),)
        )
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_only_changed_partitions_touched(self, spark):
        s = _store()
        ins_orders(s, 1.0, {"o_ok": [300], "o_ck": [2], "o_price": [100.0], "o_status": ["O"]})
        p = P.Window(ORDERS, ("o_ck",), (("n", "count(*) OVER (PARTITION BY o_ck)"),))
        m = check_incremental(spark, s, p, 0.0, 1.0)
        part2 = len(s.table("t_orders").current.snapshot.query("o_ck == 2"))
        # delta touches exactly partition o_ck=2: deletes old rows, reinserts all
        assert m.rows_inserted == part2
        assert m.rows_deleted == part2 - 1

    def test_rank_with_deletes(self, spark):
        s = _store()
        txn = Transaction(s, 1.0)
        txn.delete("t_orders", "o_price > 700")
        txn.commit()
        p = P.Window(
            ORDERS,
            ("o_status",),
            (("rk", "row_number() OVER (PARTITION BY o_status ORDER BY o_price, o_ok)"),),
        )
        check_incremental(spark, s, p, 0.0, 1.0)

    def test_window_over_join(self, spark):
        s = _store()
        mixed_dml(s)
        j = P.Join(ORDERS, CUST, ("o_ck",), ("c_ck",), "inner")
        p = P.Window(
            j, ("c_seg",), (("tot", "sum(o_price) OVER (PARTITION BY c_seg ORDER BY o_ok)"),)
        )
        check_incremental(spark, s, p, 0.0, 1.0)


class TestUnsupported:
    @pytest.mark.parametrize(
        "plan_",
        [
            P.Aggregate(ORDERS, (), (("n", "count(*)"),)),
            P.ScalarSubqueryFilter(ORDERS, "o_price", ">", ORDERS, "avg(o_price)"),
            P.InSubqueryFilter(ORDERS, "o_ck", CUST, "c_ck"),
            P.Window(ORDERS, (), (("n", "count(*) OVER ()"),)),
        ],
    )
    def test_raises(self, spark, plan_):
        s = _store()
        res = StoreDeltaResolver(spark, s, 0.0, 1.0)
        with pytest.raises(UnsupportedIncremental):
            compile_delta(plan_, res)


class TestNoChange:
    def test_empty_interval_empty_delta(self, spark):
        s = _store()
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            ("o_status",),
            (("n", "count(*)"),),
        )
        from repro.core.differentiation import consolidate_delta

        res = StoreDeltaResolver(spark, s, 0.0, 0.5)
        assert consolidate_delta(compile_delta(p, res)).count() == 0

    def test_irrelevant_change_empty_delta(self, spark):
        # a change in t_cust does not affect an orders-lines join
        s = _store()
        txn = Transaction(s, 1.0)
        txn.insert("t_cust", pd.DataFrame({"c_ck": [99], "c_seg": ["Z"]}))
        txn.commit()
        from repro.core.differentiation import consolidate_delta

        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner")
        res = StoreDeltaResolver(spark, s, 0.0, 1.0)
        assert consolidate_delta(compile_delta(p, res)).count() == 0
