"""Shared test utilities: a small versioned store, resolvers for
full/delta compilation outside the engine, and correctness checkers that
route every result through the DuckDB oracle and/or the merge-equality
invariant (apply Δ to old state ⇒ new state)."""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.compile import compile_full, to_sql
from repro.core.differentiation import compile_delta, consolidate_delta
from repro.core.refresh import merge
from repro.oracle import assert_equivalent
from pyspark.sql import types as T

from repro.substrate.versioned_store import RID, SIGN, VersionedStore, coerce, to_spark, with_field
from repro.substrate import cdc


def small_store(seed: int = 0, n_orders: int = 40, n_lines: int = 120, n_cust: int = 10) -> VersionedStore:
    """A store with small orders/lines/cust/events tables at ts=0.

    ``l_ok`` intentionally ranges past ``n_orders`` so outer joins have
    unmatched rows on both sides; ``e_tags`` includes empty arrays.
    """
    g = np.random.default_rng(seed)
    store = VersionedStore()
    store.create_table(
        "t_orders",
        pd.DataFrame(
            {
                "o_ok": np.arange(1, n_orders + 1),
                "o_ck": g.integers(1, n_cust + 3, n_orders),  # some dangling custkeys
                "o_price": (g.random(n_orders) * 1000).round(2),
                "o_status": g.choice(list("OFP"), n_orders),
            }
        ),
        ts=0.0,
    )
    store.create_table(
        "t_lines",
        pd.DataFrame(
            {
                "l_ok": g.integers(1, n_orders + 6, n_lines),
                "l_pk": g.integers(1, 16, n_lines),
                "l_qty": g.integers(1, 20, n_lines).astype("float64"),
            }
        ),
        ts=0.0,
    )
    store.create_table(
        "t_cust",
        pd.DataFrame(
            {
                "c_ck": np.arange(1, n_cust + 1),
                "c_seg": g.choice(["A", "B", "C"], n_cust),
            }
        ),
        ts=0.0,
    )
    store.create_table(
        "t_events",
        pd.DataFrame(
            {
                "e_id": np.arange(1, 21),
                "e_k": g.choice(["x", "y"], 20),
                "e_tags": [list(map(int, g.integers(0, 9, g.integers(0, 4)))) for _ in range(20)],
            }
        ),
        ts=0.0,
    )
    return store


def base_schemas(store: VersionedStore) -> dict[str, list[str]]:
    """Column lists per table, for SQL generation (RID excluded)."""
    return {
        name: [f.name for f in t.schema.fields if f.name != RID]
        for name, t in store.tables.items()
    }


def oracle_tables(store: VersionedStore, ts: float) -> dict[str, pd.DataFrame]:
    """The store's snapshots at ``ts`` minus row ids, for DuckDB."""
    return {
        name: t.resolve_at(ts).snapshot.drop(columns=[RID])
        for name, t in store.tables.items()
        if t.versions and t.versions[0].ts <= ts
    }


class StaticResolver:
    """Resolves scans against the persisted store state at one timestamp."""

    def __init__(self, spark: SparkSession, store: VersionedStore, ts: float) -> None:
        self.spark, self.store, self.ts = spark, store, ts

    def scan(self, table: str) -> DataFrame:
        return self.store.spark_snapshot(self.spark, table, self.ts)


class StoreDeltaResolver:
    """Old/new/delta scans for the interval ``(t0, t1]`` over a store."""

    def __init__(self, spark: SparkSession, store: VersionedStore, t0: float, t1: float) -> None:
        self.spark, self.store, self.t0, self.t1 = spark, store, t0, t1

    def scan_old(self, table: str) -> DataFrame:
        return self.store.spark_snapshot(self.spark, table, self.t0)

    def scan_new(self, table: str) -> DataFrame:
        return self.store.spark_snapshot(self.spark, table, self.t1)

    def scan_delta(self, table: str) -> DataFrame:
        pdf = cdc.changes_between(self.store, table, self.t0, self.t1)
        schema = with_field(self.store.table(table).schema, SIGN, T.LongType())
        return to_spark(self.spark, pdf, schema)


def check_full(spark, store, plan_, ts: float) -> DataFrame:
    """Oracle-check a full compile at ``ts`` against DuckDB. Returns the DF."""
    df = compile_full(plan_, StaticResolver(spark, store, ts))
    sql = to_sql(plan_, base_schemas(store))
    assert_equivalent(df.drop(RID), sql, **oracle_tables(store, ts))
    return df


def _canon_by_rid(pdf: pd.DataFrame) -> pd.DataFrame:
    out = pdf.sort_values(RID).reset_index(drop=True)
    return out[sorted(out.columns)]


def check_incremental(spark, store, plan_, t0: float, t1: float, *, oracle: bool = True):
    """The core IVM correctness check.

    1. merge(full(t0), Δ_(t0,t1]) must equal full(t1) row-for-row (by row id),
    2. full(t1) must equal the DuckDB result of the plan's SQL at t1,
    3. merge validations must pass (unique ($ROW_ID,$ACTION); no ghost deletes).

    Returns the MergeResult for count inspection.
    """
    res = StoreDeltaResolver(spark, store, t0, t1)
    full_new_df = compile_full(plan_, StaticResolver(spark, store, t1))
    schema = full_new_df.schema
    old_pdf = coerce(
        compile_full(plan_, StaticResolver(spark, store, t0)).toPandas(), schema
    )
    delta = consolidate_delta(compile_delta(plan_, res))
    m = merge(spark, old_pdf, schema, delta)
    new_pdf = coerce(full_new_df.toPandas(), schema)
    got = _canon_by_rid(coerce(m.new_snapshot, schema))
    want = _canon_by_rid(new_pdf)
    pd.testing.assert_frame_equal(got, want, check_dtype=False, rtol=1e-9, atol=1e-9)
    if oracle:
        sql = to_sql(plan_, base_schemas(store))
        assert_equivalent(full_new_df.drop(RID), sql, **oracle_tables(store, t1))
    return m


def engine_dvs_check(engine, name: str) -> None:
    """The paper's §6.1 randomized-workload assertion: 'if you run the
    defining query as of the data timestamp, you should get the same result
    as in the DT' — checked against DuckDB."""
    dt = engine.dts[name]
    ts = dt.data_timestamp
    stored = engine.store.table(name).current.snapshot
    schemas = base_schemas(engine.store)
    sql = to_sql(dt.defining_plan, schemas)
    tables = oracle_tables(engine.store, ts)
    # Upstream DTs resolve at the same data timestamp (DVS): override with the
    # exact version the refresh should have seen.
    for u in dt.defining_plan.tables():
        t = engine.store.table(u)
        if t.is_dynamic:
            tables[u] = t.resolve_exact(ts).snapshot.drop(columns=[RID])
    df = to_spark(
        engine.spark,
        stored,
        engine.store.table(name).schema,
    ).drop(RID)
    assert_equivalent(df, sql, **tables)
