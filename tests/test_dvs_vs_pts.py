"""Delayed view semantics vs persisted table semantics at the engine level
(§3.1.1, §4): the application invariant "account total == 100" survives DVS
refreshes but can be violated under PTS — the engine-level counterpart of
the Figure 1/2 read-skew example."""
import pandas as pd
import pytest

from repro.core import plan as P
from repro.core.engine import DTEngine
from repro.substrate.versioned_store import VersionNotFound

BAL_A = P.Filter(P.Scan("acct"), "kind = 'A'")
BAL_B = P.Filter(P.Scan("acct"), "kind = 'B'")
TOTAL = P.Aggregate(
    P.UnionAll(
        P.Project(P.Scan("u_a"), (("bal", "bal"),)),
        P.Project(P.Scan("u_b"), (("bal", "bal"),)),
    ),
    (),
    (("total", "sum(bal)"),),
)


def build(spark, semantics: str) -> DTEngine:
    e = DTEngine(spark, semantics=semantics)
    e.create_base_table(
        "acct",
        pd.DataFrame({"id": [1, 2], "kind": ["A", "B"], "bal": [60.0, 40.0]}),
        now=0.0,
    )
    e.create_dynamic_table("u_a", BAL_A, now=0.0)
    e.create_dynamic_table("u_b", BAL_B, now=0.0)
    e.create_dynamic_table("total_dt", TOTAL, now=0.0)  # scalar agg → FULL mode
    return e


def transfer(e: DTEngine, ts: float, amount: float = 10.0) -> None:
    """Move balance from A to B — preserves the application invariant."""
    txn = e.txn(now=ts)
    txn.update("acct", "kind == 'A'", {"bal": lambda d: d["bal"] - amount})
    txn.update("acct", "kind == 'B'", {"bal": lambda d: d["bal"] + amount})
    txn.commit()


class TestDVS:
    def test_invariant_holds_through_refreshes(self, spark):
        e = build(spark, "DVS")
        assert e.query_pdf("total_dt")["total"].iloc[0] == 100.0
        transfer(e, 5.0)
        e.refresh_graph(ts=10.0)
        assert e.query_pdf("total_dt")["total"].iloc[0] == 100.0

    def test_validation_blocks_mixed_epoch_refresh(self, spark):
        """§6.1 validation #1: refreshing downstream without exact upstream
        versions fails rather than mixing epochs."""
        e = build(spark, "DVS")
        transfer(e, 5.0)
        e.refresh("u_b", ts=10.0)
        with pytest.raises(VersionNotFound):
            e.refresh("total_dt", ts=10.0)  # u_a has no version at 10.0

    def test_dt_contents_always_a_past_view(self, spark):
        """DVS: at all times, the DT equals its query at *some* single past
        timestamp — never a mix."""
        e = build(spark, "DVS")
        for i in range(1, 4):
            transfer(e, 10.0 * i - 5)
            e.refresh_graph(ts=10.0 * i)
            assert e.query_pdf("total_dt")["total"].iloc[0] == 100.0


class TestPTS:
    def test_mixed_epoch_refresh_violates_invariant(self, spark):
        """Under persisted table semantics the same refresh succeeds and
        materializes a state (total=110) that never existed — read skew the
        traditional model cannot name (Figure 1)."""
        e = build(spark, "PTS")
        transfer(e, 5.0)
        e.refresh("u_b", ts=10.0)  # u_b sees post-transfer B=50
        e.refresh("total_dt", ts=10.0)  # u_a still pre-transfer A=60
        assert e.query_pdf("total_dt")["total"].iloc[0] == 110.0

    def test_pts_consistent_when_graph_refreshed_together(self, spark):
        """Refreshing the whole graph at one timestamp hides the issue —
        PTS and DVS agree when upstreams happen to be aligned."""
        e = build(spark, "PTS")
        transfer(e, 5.0)
        e.refresh_graph(ts=10.0)
        assert e.query_pdf("total_dt")["total"].iloc[0] == 100.0

    def test_skew_window_quantified(self, spark):
        """Count skewed observable states across staggered refreshes — the
        T5 measurement: PTS exposes invariant-violating states, DVS exposes
        none."""
        violations = 0
        e = build(spark, "PTS")
        for i in range(1, 5):
            transfer(e, 10.0 * i - 5)
            e.refresh("u_b", ts=10.0 * i)  # u_a intentionally lags
            e.refresh("total_dt", ts=10.0 * i)
            if e.query_pdf("total_dt")["total"].iloc[0] != 100.0:
                violations += 1
        assert violations == 4


class TestIsolationLevels:
    def test_single_dt_read_is_snapshot(self, spark):
        """§4: a transaction reading a single DT gets snapshot isolation —
        the contents are one consistent past view."""
        e = build(spark, "DVS")
        transfer(e, 5.0)
        # u_a and u_b are stale but each individually consistent at ts=0
        assert e.query_pdf("u_a")["bal"].sum() == 60.0
        assert e.query_pdf("u_b")["bal"].sum() == 40.0

    def test_multi_dt_read_is_read_committed(self, spark):
        """Reading multiple DTs whose data timestamps diverge yields only
        read-committed: the combined view can violate app invariants."""
        e = build(spark, "DVS")
        transfer(e, 5.0)
        e.refresh("u_b", ts=10.0)  # data timestamps now diverge: 0 vs 10
        combined = e.query_pdf("u_a")["bal"].sum() + e.query_pdf("u_b")["bal"].sum()
        assert combined == 110.0  # != 100: the §4 'weakened isolation' case
