"""The Dynamic Table engine: catalog, dependency DAG, data-timestamp
selection, refresh orchestration, frontiers, and delayed view semantics.

This is the reproduction of §3 and §5 of the paper:

- DTs are created from a defining query (IR plan), a **target lag**, and a
  refresh mode (AUTO resolves to INCREMENTAL when the differentiation
  framework covers every operator, FULL otherwise — §3.3.2).
- **Initialization** picks its data timestamp per §3.1.2: the most recent
  upstream-DT data timestamp within the target lag, else the creation time —
  avoiding the quadratic refresh blow-up of naive creation-in-dependency-order.
- **Refreshes** resolve upstream DTs at the *same data timestamp* (delayed
  view semantics) through the refresh-timestamp mapping, or — under the
  alternative ``semantics="PTS"`` (persisted table semantics, §3.1.1/§4) — at
  whatever version is currently persisted. DVS refreshes fail with
  :class:`~repro.substrate.versioned_store.VersionNotFound` if the exact
  upstream version is missing (§6.1 validation #1).
- **Frontiers** (§5.3) track, per source, the exact version consumed, plus
  its generation, enabling NO_DATA detection and REINITIALIZE on upstream
  replacement.
- Error counting and automatic **suspension** after consecutive failures
  (§3.3.3).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from graphlib import TopologicalSorter

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import plan as P
from repro.core.compile import compile_full
from repro.core.differentiation import compile_delta, consolidate_delta
from repro.core.refresh import (
    FULL,
    INCREMENTAL,
    NO_DATA,
    REINITIALIZE,
    diff_snapshots,
    merge,
)
from repro.substrate import cdc
from repro.substrate.txn import Transaction
from pyspark.sql import types as T

from repro.substrate.versioned_store import (
    RID,
    SIGN,
    VersionedStore,
    coerce,
    to_spark,
    with_field,
)

#: Consecutive-failure threshold before a DT is auto-suspended (§3.3.3).
MAX_CONSECUTIVE_ERRORS = 5

DOWNSTREAM = "DOWNSTREAM"


@dataclass
class RefreshResult:
    """Telemetry for one refresh (feeds the scheduler and the experiments)."""

    name: str
    action: str
    data_ts: float
    rows_inserted: int = 0
    rows_deleted: int = 0
    dt_size: int = 0
    wall_s: float = 0.0
    error: str | None = None

    @property
    def rows_changed(self) -> int:
        return self.rows_inserted + self.rows_deleted

    @property
    def change_fraction(self) -> float:
        """Changed rows relative to DT size — the §6.3 fleet statistic."""
        return self.rows_changed / max(1, self.dt_size)


@dataclass
class DTRecord:
    """Catalog entry for one Dynamic Table."""

    name: str
    defining_plan: P.Plan
    target_lag: float | str
    refresh_mode: str
    warehouse: str
    created_at: float
    data_timestamp: float | None = None
    #: per-source consumed state: {"vidx": version index, "generation": g}
    frontier: dict[str, dict] = field(default_factory=dict)
    error_count: int = 0
    suspended: bool = False
    initialized: bool = False
    refresh_log: list[RefreshResult] = field(default_factory=list)


class DTSuspendedError(RuntimeError):
    """Refresh attempted on a suspended DT."""


class _Resolver:
    """Versioned scans for one refresh: old/new snapshots + CDC deltas.

    ``t0`` state comes from the DT's frontier (exact consumed versions),
    ``t1`` from the refresh timestamp. Upstream DTs resolve via the
    refresh-ts mapping under DVS, or by persisted commit time under PTS.
    """

    def __init__(self, engine: "DTEngine", dt: DTRecord, ts_new: float) -> None:
        self.e = engine
        self.dt = dt
        self.ts_new = ts_new
        self._cache: dict[tuple[str, str], DataFrame] = {}

    def _vidx_new(self, table: str) -> int:
        t = self.e.store.table(table)
        if t.is_dynamic and self.e.semantics == "DVS":
            t.resolve_exact(self.ts_new)  # raises VersionNotFound if absent
            return t.refresh_map[self.ts_new]
        return t.version_index_at(self.ts_new)

    def _vidx_old(self, table: str) -> int:
        return self.dt.frontier[table]["vidx"]

    def _snap(self, table: str, vidx: int) -> DataFrame:
        return self.e.materialized_snapshot(table, vidx)

    def scan(self, table: str) -> DataFrame:  # full compile (new end)
        return self.scan_new(table)

    def scan_new(self, table: str) -> DataFrame:
        key = (table, "new")
        if key not in self._cache:
            self._cache[key] = self._snap(table, self._vidx_new(table))
        return self._cache[key]

    def scan_old(self, table: str) -> DataFrame:
        key = (table, "old")
        if key not in self._cache:
            self._cache[key] = self._snap(table, self._vidx_old(table))
        return self._cache[key]

    def scan_delta(self, table: str) -> DataFrame:
        key = (table, "delta")
        if key not in self._cache:
            t = self.e.store.table(table)
            i0, i1 = self._vidx_old(table), self._vidx_new(table)
            parts = [t.versions[k].delta for k in range(i0 + 1, i1 + 1)]
            if parts:
                pdf = cdc.consolidate(pd.concat(parts, ignore_index=True))
            else:
                pdf = t.current.snapshot.iloc[0:0].copy()
                pdf[SIGN] = pd.Series(dtype="int64")
            schema = with_field(t.schema, SIGN, T.LongType())
            self._cache[key] = to_spark(self.e.spark, pdf, schema)
        return self._cache[key]


class DTEngine:
    """Orchestrates Dynamic Tables over a :class:`VersionedStore` + Spark."""

    def __init__(
        self,
        spark: SparkSession,
        store: VersionedStore | None = None,
        *,
        semantics: str = "DVS",
        init_heuristic: bool = True,
    ) -> None:
        if semantics not in ("DVS", "PTS"):
            raise ValueError("semantics must be 'DVS' or 'PTS'")
        self.spark = spark
        self.store = store or VersionedStore()
        self.semantics = semantics
        #: §3.1.2 initialization-timestamp heuristic; disable to reproduce the
        #: quadratic refresh behaviour the heuristic avoids (T4).
        self.init_heuristic = init_heuristic
        self.dts: dict[str, DTRecord] = {}
        #: (table, version index, generation) → materialized Spark snapshot.
        #: Pandas→Arrow→JVM conversion of a large snapshot costs ~O(|table|)
        #: per refresh otherwise; keeping the last few versions per table
        #: makes repeated refreshes pay only for what changed.
        self._snap_cache: dict[tuple[str, int, int], DataFrame] = {}

    def materialized_snapshot(self, table: str, vidx: int) -> DataFrame:
        t = self.store.table(table)
        key = (table, vidx, t.generation)
        if key not in self._snap_cache:
            # evict older versions of the same table, keeping the 2 newest
            mine = sorted(k for k in self._snap_cache if k[0] == table)
            for k in mine[:-1]:
                del self._snap_cache[k]
            self._snap_cache[key] = to_spark(
                self.spark, t.versions[vidx].snapshot, t.schema
            )
        return self._snap_cache[key]

    # -- base tables -----------------------------------------------------
    def create_base_table(self, name: str, pdf: pd.DataFrame, *, now: float) -> None:
        """Create a base table from pandas contents at simulated time ``now``."""
        self.store.create_table(name, pdf, now)

    def replace_base_table(self, name: str, pdf: pd.DataFrame, *, now: float) -> None:
        """CREATE OR REPLACE a base table (bumps generation → REINITIALIZE)."""
        self.store.replace_table(name, pdf, now)

    def txn(self, *, now: float) -> Transaction:
        """Open a DML transaction at simulated time ``now``."""
        return Transaction(self.store, now)

    # -- catalog ---------------------------------------------------------
    def is_dt(self, name: str) -> bool:
        return name in self.dts

    def upstream_dts(self, name: str) -> list[str]:
        """Direct upstream DTs of a DT (its scanned tables that are DTs)."""
        return [t for t in sorted(self.dts[name].defining_plan.tables()) if self.is_dt(t)]

    def upstream_closure(self, name: str) -> list[str]:
        """All DTs upstream of ``name`` (exclusive), topologically sorted."""
        graph: dict[str, set[str]] = {}
        stack = [name]
        while stack:
            n = stack.pop()
            ups = set(self.upstream_dts(n))
            graph[n] = ups
            stack.extend(u for u in ups if u not in graph)
        order = list(TopologicalSorter(graph).static_order())
        return [n for n in order if n != name]

    def topo_order(self, names: list[str] | None = None) -> list[str]:
        """All (or the given) DTs in upstream-first topological order."""
        names = list(self.dts) if names is None else names
        graph = {n: set(self.upstream_dts(n)) & set(names) for n in names}
        return list(TopologicalSorter(graph).static_order())

    def effective_target_lag(self, name: str) -> float:
        """Resolve DOWNSTREAM target lags (§3.2): min over downstream DTs."""
        dt = self.dts[name]
        if dt.target_lag != DOWNSTREAM:
            return float(dt.target_lag)
        downs = [n for n in self.dts if name in self.upstream_dts(n)]
        lags = [self.effective_target_lag(n) for n in downs]
        return min(lags) if lags else float("inf")

    # -- DT lifecycle ----------------------------------------------------
    def create_dynamic_table(
        self,
        name: str,
        defining_plan: P.Plan,
        *,
        target_lag: float | str = 60.0,
        refresh_mode: str = "AUTO",
        warehouse: str = "default_wh",
        now: float,
        initialize: bool = True,
    ) -> DTRecord:
        """CREATE DYNAMIC TABLE — resolves refresh mode, picks the
        initialization timestamp per §3.1.2, and initializes."""
        if name in self.store:
            raise ValueError(f"table {name} already exists")
        if refresh_mode == "AUTO":
            refresh_mode = INCREMENTAL if P.incremental_supported(defining_plan) else FULL
        if refresh_mode == INCREMENTAL and not P.incremental_supported(defining_plan):
            raise ValueError(
                f"plan not incrementally supported: {P.unsupported_reason(defining_plan)}"
            )
        dt = DTRecord(
            name=name,
            defining_plan=defining_plan,
            target_lag=target_lag,
            refresh_mode=refresh_mode,
            warehouse=warehouse,
            created_at=now,
        )
        self.dts[name] = dt
        if initialize:
            self.initialize(name, now=now)
        return dt

    def _init_timestamp(self, name: str, now: float) -> float:
        """§3.1.2: most recent upstream-DT data timestamp within the target
        lag, else the creation time."""
        dt = self.dts[name]
        if not self.init_heuristic:
            return now
        lag = self.effective_target_lag(name)
        ups = [self.dts[u].data_timestamp for u in self.upstream_dts(name)]
        candidates = [t for t in ups if t is not None and now - t <= lag]
        return max(candidates) if candidates else now

    def initialize(self, name: str, *, now: float) -> list[RefreshResult]:
        """Initialize a DT (and any upstream DTs missing the chosen timestamp)."""
        dt = self.dts[name]
        ts0 = self._init_timestamp(name, now)
        results: list[RefreshResult] = []
        # Ensure every upstream DT has a version at ts0 (may cascade).
        for u in self.upstream_closure(name):
            ut = self.store.table(u)
            if self.semantics == "DVS" and ts0 not in ut.refresh_map:
                results.append(self.refresh(u, ts=ts0))
        results.append(self._do_refresh(dt, ts0, initializing=True))
        return results

    def alter_definition(self, name: str, new_plan: P.Plan, *, now: float) -> None:
        """Replace a DT's defining query; next refresh REINITIALIZEs (§5.4
        query evolution, conservatively)."""
        dt = self.dts[name]
        dt.defining_plan = new_plan
        dt.frontier = {}  # forces REINITIALIZE
        if dt.refresh_mode in (INCREMENTAL, FULL):
            supported = P.incremental_supported(new_plan)
            dt.refresh_mode = INCREMENTAL if supported else FULL

    def resume(self, name: str) -> None:
        """Clear suspension + error counter after the root cause is fixed."""
        self.dts[name].suspended = False
        self.dts[name].error_count = 0

    # -- queries ---------------------------------------------------------
    def query(self, name: str, *, at: float | None = None) -> DataFrame:
        """Read a DT like a table. Single-DT reads get snapshot isolation."""
        dt = self.dts[name]
        if not dt.initialized:
            raise RuntimeError(f"DT {name} not yet initialized (§3.1)")
        t = self.store.table(name)
        snap = t.resolve_at(at).snapshot if at is not None else t.current.snapshot
        return to_spark(self.spark, snap, t.schema).drop(RID)

    def query_pdf(self, name: str) -> pd.DataFrame:
        t = self.store.table(name)
        return t.current.snapshot.drop(columns=[RID])

    # -- refresh orchestration ------------------------------------------
    def refresh(self, name: str, *, ts: float) -> RefreshResult:
        """Refresh one DT at data timestamp ``ts``.

        Under DVS the caller (scheduler / manual refresh) must have refreshed
        upstream DTs at ``ts`` first; otherwise validation #1 fails.
        """
        dt = self.dts[name]
        if dt.suspended:
            raise DTSuspendedError(f"DT {name} is suspended after repeated errors")
        if not dt.initialized:
            return self._do_refresh(dt, ts, initializing=True)
        return self._do_refresh(dt, ts)

    def refresh_graph(self, *, ts: float, names: list[str] | None = None) -> list[RefreshResult]:
        """Refresh a set of DTs (default: all) at one shared data timestamp,
        upstream-first — the scheduled-refresh pattern of §3.1.2."""
        out = []
        for n in self.topo_order(names):
            if not self.dts[n].suspended:
                out.append(self.refresh(n, ts=ts))
        return out

    def manual_refresh(self, name: str, *, now: float) -> list[RefreshResult]:
        """§3.1.2 manual refresh: a timestamp after the command, refreshing
        all upstream DTs at that timestamp first."""
        chain = self.upstream_closure(name) + [name]
        return [self.refresh(n, ts=now) for n in chain]

    # -- the refresh itself ----------------------------------------------
    def _sources(self, dt: DTRecord) -> list[str]:
        return sorted(dt.defining_plan.tables())

    def _new_vidx(self, table: str, ts: float) -> int:
        t = self.store.table(table)
        if t.is_dynamic and self.semantics == "DVS":
            t.resolve_exact(ts)
            return t.refresh_map[ts]
        return t.version_index_at(ts)

    def _decide_action(self, dt: DTRecord, ts: float) -> str:
        if not dt.initialized:
            return REINITIALIZE
        srcs = self._sources(dt)
        if set(dt.frontier) != set(srcs):
            return REINITIALIZE  # definition changed (query evolution, §5.4)
        for s in srcs:
            t = self.store.table(s)
            if t.generation != dt.frontier[s]["generation"]:
                return REINITIALIZE  # upstream replaced (§3.3.2)
        changed = any(
            self._new_vidx(s, ts) != dt.frontier[s]["vidx"] for s in srcs
        )
        if not changed:
            return NO_DATA
        return FULL if dt.refresh_mode == FULL else INCREMENTAL

    def _do_refresh(self, dt: DTRecord, ts: float, *, initializing: bool = False) -> RefreshResult:
        t0 = time.perf_counter()
        try:
            action = REINITIALIZE if initializing else self._decide_action(dt, ts)
            res = self._execute(dt, ts, action)
        except Exception as e:  # user errors + validation failures (§3.3.3)
            dt.error_count += 1
            if dt.error_count >= MAX_CONSECUTIVE_ERRORS:
                dt.suspended = True
            res = RefreshResult(dt.name, "ERROR", ts, error=f"{type(e).__name__}: {e}")
            res.wall_s = time.perf_counter() - t0
            dt.refresh_log.append(res)
            raise
        dt.error_count = 0
        res.wall_s = time.perf_counter() - t0
        dt.refresh_log.append(res)
        return res

    def _execute(self, dt: DTRecord, ts: float, action: str) -> RefreshResult:
        resolver = _Resolver(self, dt, ts)
        store_t = self.store.table(dt.name) if dt.name in self.store else None

        if action == NO_DATA:
            store_t.mark_no_data(ts)
            self._advance_frontier(dt, ts)
            return RefreshResult(dt.name, NO_DATA, ts, dt_size=len(store_t.current.snapshot))

        if action in (FULL, REINITIALIZE):
            new_df = compile_full(dt.defining_plan, resolver)
            if store_t is None:
                store_t = self.store.create_dynamic_storage(dt.name, new_df.schema)
            elif [(f.name, f.dataType) for f in store_t.schema.fields] != [
                (f.name, f.dataType) for f in new_df.schema.fields
            ]:
                # Query evolution changed the output schema (§5.4): swap the
                # stored schema and bump the generation so downstream DTs
                # REINITIALIZE instead of consuming incompatible CDC.
                store_t.schema = new_df.schema
                store_t.generation += 1
            new_pdf = coerce(new_df.toPandas(), store_t.schema)
            old_pdf = (
                store_t.current.snapshot
                if store_t.versions and store_t.current.generation == store_t.generation
                else new_pdf.iloc[0:0]
            )
            delta = diff_snapshots(old_pdf, new_pdf, store_t.schema)
            store_t.commit_version(
                ts, self.store.hlc.tick(ts), new_pdf, delta, refresh_ts=ts
            )
            self._advance_frontier(dt, ts)
            dt.data_timestamp = ts
            dt.initialized = True
            return RefreshResult(
                dt.name,
                action,
                ts,
                rows_inserted=int((delta[SIGN] > 0).sum()),
                rows_deleted=int((delta[SIGN] < 0).sum()),
                dt_size=len(new_pdf),
            )

        # INCREMENTAL
        delta_df = consolidate_delta(compile_delta(dt.defining_plan, resolver))
        m = merge(self.spark, store_t.current.snapshot, store_t.schema, delta_df)
        store_t.commit_version(
            ts, self.store.hlc.tick(ts), m.new_snapshot, m.recorded_delta, refresh_ts=ts
        )
        self._advance_frontier(dt, ts)
        dt.data_timestamp = ts
        return RefreshResult(
            dt.name,
            INCREMENTAL,
            ts,
            rows_inserted=m.rows_inserted,
            rows_deleted=m.rows_deleted,
            dt_size=len(m.new_snapshot),
        )

    def _advance_frontier(self, dt: DTRecord, ts: float) -> None:
        new_frontier = {}
        for s in self._sources(dt):
            t = self.store.table(s)
            new_frontier[s] = {"vidx": self._new_vidx(s, ts), "generation": t.generation}
        dt.frontier = new_frontier
        dt.data_timestamp = ts
