"""Full-query compilation: every IR operator vs the DuckDB oracle, plus the
§5.5.2 row-id structure and plan metadata (dependencies, supportability)."""
import pytest

from repro.core import plan as P
from repro.core.compile import CompileError, compile_full, out_columns, to_sql
from repro.substrate.versioned_store import RID

from tests.helpers import StaticResolver, base_schemas, check_full, small_store


@pytest.fixture(scope="module")
def store():
    return small_store(seed=7)


ORDERS = P.Scan("t_orders")
LINES = P.Scan("t_lines")
CUST = P.Scan("t_cust")
EVENTS = P.Scan("t_events")


class TestOperatorsAgainstOracle:
    def test_scan(self, spark, store):
        check_full(spark, store, ORDERS, 0.0)

    def test_filter(self, spark, store):
        check_full(spark, store, P.Filter(ORDERS, "o_price > 500"), 0.0)

    def test_filter_compound_predicate(self, spark, store):
        check_full(
            spark, store, P.Filter(ORDERS, "o_price > 200 AND o_status = 'O'"), 0.0
        )

    def test_project(self, spark, store):
        p = P.Project(ORDERS, (("ok", "o_ok"), ("taxed", "o_price * 1.1")))
        check_full(spark, store, p, 0.0)

    def test_project_case_expr(self, spark, store):
        p = P.Project(
            ORDERS,
            (("ok", "o_ok"), ("cls", "CASE WHEN o_price > 500 THEN 'hi' ELSE 'lo' END")),
        )
        check_full(spark, store, p, 0.0)

    def test_inner_join(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner")
        check_full(spark, store, p, 0.0)

    def test_inner_join_residual(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner", residual="l_qty > 5")
        check_full(spark, store, p, 0.0)

    def test_left_join(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "left")
        check_full(spark, store, p, 0.0)

    def test_right_join(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "right")
        check_full(spark, store, p, 0.0)

    def test_full_join(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "full")
        check_full(spark, store, p, 0.0)

    def test_multi_column_join(self, spark, store):
        a = P.Project(ORDERS, (("k1", "o_ck"), ("k2", "o_status"), ("pr", "o_price")))
        b = P.Project(LINES, (("j1", "l_ok % 10"), ("j2", "CASE WHEN l_qty > 10 THEN 'O' ELSE 'F' END"), ("q", "l_qty")))
        p = P.Join(a, b, ("k1", "k2"), ("j1", "j2"), "inner")
        check_full(spark, store, p, 0.0)

    def test_three_way_join(self, spark, store):
        p = P.Join(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            CUST,
            ("o_ck",),
            ("c_ck",),
            "inner",
        )
        check_full(spark, store, p, 0.0)

    def test_union_all(self, spark, store):
        a = P.Project(ORDERS, (("k", "o_ok"), ("v", "o_price")))
        b = P.Project(LINES, (("k", "l_ok"), ("v", "l_qty")))
        check_full(spark, store, P.UnionAll(a, b), 0.0)

    def test_union_all_self(self, spark, store):
        a = P.Project(ORDERS, (("k", "o_ok"),))
        check_full(spark, store, P.UnionAll(a, a), 0.0)

    def test_grouped_aggregate(self, spark, store):
        p = P.Aggregate(
            ORDERS,
            ("o_status",),
            (("n", "count(*)"), ("total", "sum(o_price)"), ("mx", "max(o_price)")),
        )
        check_full(spark, store, p, 0.0)

    def test_aggregate_avg_min(self, spark, store):
        p = P.Aggregate(LINES, ("l_pk",), (("a", "avg(l_qty)"), ("m", "min(l_qty)")))
        check_full(spark, store, p, 0.0)

    def test_scalar_aggregate(self, spark, store):
        p = P.Aggregate(ORDERS, (), (("n", "count(*)"), ("s", "sum(o_price)")))
        check_full(spark, store, p, 0.0)

    def test_distinct(self, spark, store):
        p = P.Distinct(P.Project(ORDERS, (("s", "o_status"), ("c", "o_ck"))))
        check_full(spark, store, p, 0.0)

    def test_window_sum(self, spark, store):
        p = P.Window(
            ORDERS,
            ("o_ck",),
            (("run", "sum(o_price) OVER (PARTITION BY o_ck ORDER BY o_ok)"),),
        )
        check_full(spark, store, p, 0.0)

    def test_window_rank(self, spark, store):
        p = P.Window(
            ORDERS,
            ("o_status",),
            (("rk", "row_number() OVER (PARTITION BY o_status ORDER BY o_price, o_ok)"),),
        )
        check_full(spark, store, p, 0.0)

    def test_flatten(self, spark, store):
        p = P.Flatten(EVENTS, "e_tags", "tag")
        check_full(spark, store, p, 0.0)

    def test_flatten_then_aggregate(self, spark, store):
        p = P.Aggregate(P.Flatten(EVENTS, "e_tags", "tag"), ("tag",), (("n", "count(*)"),))
        check_full(spark, store, p, 0.0)

    def test_scalar_subquery_filter(self, spark, store):
        p = P.ScalarSubqueryFilter(ORDERS, "o_price", ">", ORDERS, "avg(o_price)")
        check_full(spark, store, p, 0.0)

    def test_in_subquery_filter(self, spark, store):
        p = P.InSubqueryFilter(ORDERS, "o_ck", CUST, "c_ck")
        check_full(spark, store, p, 0.0)

    def test_not_in_like_semantics_via_anti(self, spark, store):
        # negated variant uses an anti join; oracle's NOT IN matches because
        # c_ck has no NULLs in the fixture
        p = P.InSubqueryFilter(ORDERS, "o_ck", CUST, "c_ck", negated=True)
        check_full(spark, store, p, 0.0)

    def test_join_aggregate_pipeline(self, spark, store):
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            ("o_status",),
            (("q", "sum(l_qty)"), ("n", "count(*)")),
        )
        check_full(spark, store, p, 0.0)

    def test_deep_pipeline(self, spark, store):
        p = P.Filter(
            P.Aggregate(
                P.Join(
                    P.Filter(ORDERS, "o_price > 100"),
                    P.Join(LINES, CUST, ("l_pk",), ("c_ck",), "inner"),
                    ("o_ok",),
                    ("l_ok",),
                    "inner",
                ),
                ("c_seg", "o_status"),
                (("s", "sum(l_qty)"),),
            ),
            "s > 10",
        )
        check_full(spark, store, p, 0.0)


class TestRowIds:
    def test_scan_rids_are_table_prefixed(self, spark, store):
        df = compile_full(ORDERS, StaticResolver(spark, store, 0.0))
        rids = [r[RID] for r in df.select(RID).limit(3).collect()]
        assert all(r.startswith("t_orders:") for r in rids)

    def test_join_rid_concatenation(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner")
        df = compile_full(p, StaticResolver(spark, store, 0.0))
        rid = df.select(RID).first()[RID]
        l, r = rid.split("|")
        assert l.startswith("t_orders:") and r.startswith("t_lines:")

    def test_outer_join_pad_prefixes(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "full")
        df = compile_full(p, StaticResolver(spark, store, 0.0))
        rids = [r[RID] for r in df.select(RID).collect()]
        assert any(r.startswith("a:") for r in rids)  # unmatched orders
        assert any(r.startswith("b:") for r in rids)  # unmatched lines
        assert any("|" in r for r in rids)

    def test_union_branch_prefixes(self, spark, store):
        a = P.Project(ORDERS, (("k", "o_ok"),))
        df = compile_full(P.UnionAll(a, a), StaticResolver(spark, store, 0.0))
        rids = {r[RID][:3] for r in df.select(RID).collect()}
        assert rids == {"u0:", "u1:"}

    def test_group_rid_prefix_and_uniqueness(self, spark, store):
        p = P.Aggregate(ORDERS, ("o_status",), (("n", "count(*)"),))
        df = compile_full(p, StaticResolver(spark, store, 0.0))
        rids = [r[RID] for r in df.select(RID).collect()]
        assert all(r.startswith("g:") for r in rids)
        assert len(rids) == len(set(rids))

    def test_rids_unique_for_every_operator(self, spark, store):
        plans = [
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "full"),
            P.Flatten(EVENTS, "e_tags", "tag"),
            P.Distinct(P.Project(ORDERS, (("s", "o_status"),))),
            P.Window(ORDERS, ("o_ck",), (("n", "count(*) OVER (PARTITION BY o_ck)"),)),
        ]
        for p in plans:
            df = compile_full(p, StaticResolver(spark, store, 0.0))
            n, d = df.count(), df.select(RID).distinct().count()
            assert n == d, f"duplicate rids in {p}"

    def test_rids_stable_across_recompute(self, spark, store):
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            ("o_status",),
            (("n", "count(*)"),),
        )
        df1 = compile_full(p, StaticResolver(spark, store, 0.0))
        df2 = compile_full(p, StaticResolver(spark, store, 0.0))
        assert sorted(r[RID] for r in df1.collect()) == sorted(r[RID] for r in df2.collect())


class TestPlanMetadata:
    def test_tables_collects_scans(self):
        p = P.Join(ORDERS, P.Filter(LINES, "l_qty > 1"), ("o_ok",), ("l_ok",), "inner")
        assert p.tables() == {"t_orders", "t_lines"}

    def test_out_columns_matches_compiled(self, spark, store):
        p = P.Aggregate(
            P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "inner"),
            ("o_status",),
            (("q", "sum(l_qty)"),),
        )
        df = compile_full(p, StaticResolver(spark, store, 0.0))
        assert set(out_columns(p, base_schemas(store))) == set(df.columns) - {RID}

    @pytest.mark.parametrize(
        "plan_, reason",
        [
            (P.Aggregate(ORDERS, (), (("n", "count(*)"),)), "ScalarAggregate"),
            (P.ScalarSubqueryFilter(ORDERS, "o_price", ">", ORDERS, "avg(o_price)"), "ScalarSubqueryFilter"),
            (P.InSubqueryFilter(ORDERS, "o_ck", CUST, "c_ck"), "InSubqueryFilter"),
            (P.Window(ORDERS, (), (("n", "count(*) OVER ()"),)), "UnpartitionedWindow"),
        ],
    )
    def test_unsupported_reasons(self, plan_, reason):
        assert P.unsupported_reason(plan_) == reason
        assert not P.incremental_supported(plan_)

    def test_supported_plans(self):
        assert P.incremental_supported(
            P.Aggregate(
                P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "left"),
                ("o_status",),
                (("n", "count(*)"),),
            )
        )

    def test_nested_unsupported_detected(self):
        p = P.Filter(P.Aggregate(ORDERS, (), (("n", "count(*)"),)), "n > 0")
        assert P.unsupported_reason(p) == "ScalarAggregate"

    def test_join_column_collision_rejected(self, spark, store):
        p = P.Join(ORDERS, ORDERS, ("o_ok",), ("o_ok",), "inner")
        with pytest.raises(CompileError):
            compile_full(p, StaticResolver(spark, store, 0.0))

    def test_residual_on_outer_join_rejected(self, spark, store):
        p = P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "left", residual="l_qty > 1")
        with pytest.raises(CompileError):
            compile_full(p, StaticResolver(spark, store, 0.0))

    def test_union_mismatched_columns_rejected(self, spark, store):
        a = P.Project(ORDERS, (("k", "o_ok"),))
        b = P.Project(ORDERS, (("z", "o_ok"),))
        with pytest.raises(CompileError):
            compile_full(P.UnionAll(a, b), StaticResolver(spark, store, 0.0))

    def test_to_sql_renders_all_nodes(self, store):
        schemas = base_schemas(store)
        p = P.Filter(
            P.Aggregate(
                P.Join(ORDERS, LINES, ("o_ok",), ("l_ok",), "left"),
                ("o_status",),
                (("n", "count(*)"),),
            ),
            "n > 0",
        )
        sql = to_sql(p, schemas)
        assert "LEFT JOIN" in sql and "GROUP BY" in sql
