"""The refresh scheduler: a simulated-time event loop over a DT graph.

Reproduces §5.2/§3.3.3 behaviour:

- each DT refreshes at multiples of its canonical period (constant phase),
  so data timestamps align across the graph;
- a refresh of a DT at timestamp T starts only after all upstream DTs have
  committed their refresh at T (``w_i ≥ max(w_j + d_j)``);
- a DT still busy with the previous refresh **skips** the scheduled one
  ("Snowflake chooses to skip the later refresh, relying on the subsequent
  refresh to bring the DT's data timestamp up to date"); the next refresh
  covers the skipped interval, so DVS is preserved. Under DVS a skipped
  upstream forces downstream skips at that timestamp (no exact version);
- user errors increment the error counter; after the threshold the DT is
  suspended (§3.3.3).

Two executors:

- :class:`ModelExecutor` — a pure cost model (fixed + variable·changed_rows),
  for fleet-scale simulations (T4/T6);
- :class:`EngineExecutor` — drives a real :class:`~repro.core.engine.DTEngine`
  (Spark refreshes on real data) with a configurable mapping from refresh
  telemetry to simulated duration.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from graphlib import TopologicalSorter

from repro.core.refresh import FULL, INCREMENTAL, NO_DATA, REINITIALIZE
from repro.scheduler.lag import RefreshSpan
from repro.scheduler.periods import choose_periods

SKIPPED_BUSY = "SKIPPED_BUSY"
SKIPPED_UPSTREAM = "SKIPPED_UPSTREAM"

#: Consecutive-failure threshold before suspension (§3.3.3), mirrored from
#: the engine so pure simulations behave identically.
MAX_CONSECUTIVE_ERRORS = 5


@dataclass
class DTSpec:
    """Scheduler-facing description of one DT.

    The cost-model fields are only used by :class:`ModelExecutor`; with
    :class:`EngineExecutor` the engine's own catalog drives behaviour.
    """

    name: str
    target_lag: float
    upstreams: tuple[str, ...] = ()
    refresh_mode: str = INCREMENTAL
    #: how often this DT's base sources commit new data (leaf DTs only)
    source_update_period: float = 60.0
    rows_per_update: int = 100
    #: incremental cost model: duration = fixed + var · changed_rows
    fixed_cost_s: float = 2.0
    var_cost_s_per_row: float = 0.001
    #: full-refresh duration (also used for REINITIALIZE)
    full_cost_s: float = 30.0
    no_data_cost_s: float = 0.05
    #: simulated user-error timestamps (refresh at data_ts in this set fails)
    error_at: frozenset = frozenset()


@dataclass
class ExecResult:
    action: str
    duration: float
    changed_rows: int = 0


class ModelExecutor:
    """Pure cost-model execution — no Spark, fleet-scale."""

    def __init__(self, specs: dict[str, DTSpec]) -> None:
        self.specs = specs
        #: action of the latest processed refresh per (dt, data_ts), so
        #: downstream NO_DATA detection can chain through the graph.
        self._last_action: dict[tuple[str, float], str] = {}

    def _source_changed(self, spec: DTSpec, t0: float, t1: float) -> int:
        """Number of base-source update events in (t0, t1]."""
        import math

        u = spec.source_update_period
        return max(0, math.floor(t1 / u) - math.floor(t0 / u))

    def refresh(self, name: str, data_ts: float, prev_data_ts: float | None) -> ExecResult:
        spec = self.specs[name]
        if data_ts in spec.error_at:
            raise RuntimeError(f"simulated user error in {name} at {data_ts}")
        if prev_data_ts is None:
            return ExecResult(REINITIALIZE, spec.full_cost_s, spec.rows_per_update)
        if spec.upstreams:
            changed = any(
                self._last_action.get((u, data_ts)) not in (NO_DATA, None)
                for u in spec.upstreams
            )
            events = 1 if changed else 0
        else:
            events = self._source_changed(spec, prev_data_ts, data_ts)
        if events == 0:
            res = ExecResult(NO_DATA, spec.no_data_cost_s, 0)
        elif spec.refresh_mode == FULL:
            res = ExecResult(FULL, spec.full_cost_s, events * spec.rows_per_update)
        else:
            rows = events * spec.rows_per_update
            res = ExecResult(
                INCREMENTAL, spec.fixed_cost_s + spec.var_cost_s_per_row * rows, rows
            )
        self._last_action[(name, data_ts)] = res.action
        return res


class EngineExecutor:
    """Drives a real DTEngine; simulated duration derived from telemetry."""

    def __init__(self, engine, *, duration_fn=None) -> None:
        self.engine = engine
        self.duration_fn = duration_fn or (
            lambda res: 0.05
            if res.action == NO_DATA
            else 2.0 + 0.001 * res.rows_changed
        )

    def refresh(self, name: str, data_ts: float, prev_data_ts: float | None) -> ExecResult:
        res = self.engine.refresh(name, ts=data_ts)
        return ExecResult(res.action, self.duration_fn(res), res.rows_changed)


@dataclass
class SchedulerState:
    """Per-DT mutable scheduling state."""

    busy_until: float = -1.0
    data_ts: float | None = None
    #: wall-clock commit time of each refreshed data_ts (upstream waits)
    commit_at: dict[float, float] = field(default_factory=dict)
    spans: list[RefreshSpan] = field(default_factory=list)
    skips: list[tuple[float, str]] = field(default_factory=list)
    error_count: int = 0
    suspended: bool = False
    errors: list[float] = field(default_factory=list)


class Scheduler:
    """Simulated-time scheduler over a DT graph."""

    def __init__(
        self,
        specs: dict[str, DTSpec],
        executor,
        *,
        phase: float = 0.0,
        dvs: bool = True,
    ) -> None:
        self.specs = specs
        self.executor = executor
        self.phase = phase
        self.dvs = dvs
        self.periods = choose_periods(
            {n: s.target_lag for n, s in specs.items()},
            {n: s.upstreams for n, s in specs.items()},
        )
        self.order = list(
            TopologicalSorter({n: set(s.upstreams) for n, s in specs.items()}).static_order()
        )
        self.state = {n: SchedulerState() for n in specs}

    # -- event loop ------------------------------------------------------
    def run(self, until: float) -> None:
        """Advance the simulation from the phase to ``until`` seconds."""
        ticks = sorted(
            {
                self.phase + k * p
                for n, p in self.periods.items()
                for k in range(1, int((until - self.phase) / p) + 1)
            }
        )
        for ts in ticks:
            due = [n for n in self.order if self._due(n, ts)]
            skipped_here: set[str] = set()
            for n in due:
                st = self.state[n]
                if st.suspended:
                    continue
                # Upstream periods divide downstream periods (canonical grid),
                # so every upstream is due whenever n is due and — processed
                # earlier in topo order — must have committed data_ts == ts by
                # now. Anything else (skip, error, suspension) means no exact
                # upstream version exists at ts.
                if self.dvs and any(
                    self.state[u].data_ts != ts for u in self.specs[n].upstreams
                ):
                    # upstream skipped/failed at this timestamp: no exact
                    # version exists, DVS forces a skip here too
                    st.skips.append((ts, SKIPPED_UPSTREAM))
                    skipped_here.add(n)
                    continue
                if st.busy_until > ts:
                    st.skips.append((ts, SKIPPED_BUSY))
                    skipped_here.add(n)
                    continue
                self._execute(n, ts, skipped_here)

    def _due(self, name: str, ts: float) -> bool:
        p = self.periods[name]
        k = (ts - self.phase) / p
        return abs(k - round(k)) < 1e-9 and round(k) >= 1

    def _execute(self, name: str, ts: float, skipped_here: set[str]) -> None:
        st = self.state[name]
        spec = self.specs[name]
        upstream_ready = max(
            (self.state[u].commit_at.get(ts, ts) for u in spec.upstreams),
            default=ts,
        )
        start = max(ts, upstream_ready, st.busy_until)
        try:
            res = self.executor.refresh(name, ts, st.data_ts)
        except Exception:
            st.error_count += 1
            st.errors.append(ts)
            skipped_here.add(name)  # downstreams cannot see a version at ts
            if st.error_count >= MAX_CONSECUTIVE_ERRORS:
                st.suspended = True
            return
        st.error_count = 0
        end = start + res.duration
        st.spans.append(RefreshSpan(ts, start, end, res.action, res.changed_rows))
        st.busy_until = end
        st.data_ts = ts
        st.commit_at[ts] = end

    # -- reporting -------------------------------------------------------
    def spans(self, name: str) -> list[RefreshSpan]:
        return self.state[name].spans

    def skip_count(self, name: str) -> int:
        return len(self.state[name].skips)

    def total_busy_seconds(self, name: str) -> float:
        return sum(s.end - s.start for s in self.state[name].spans)
