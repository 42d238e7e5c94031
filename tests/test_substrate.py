"""Unit tests for the substrate: HLC, versioned store, transactions, CDC."""
import pandas as pd
import pytest

from repro.substrate.cdc import changes_between, consolidate, has_changes
from repro.substrate.hlc import HLC, HLCTimestamp
from repro.substrate.txn import Transaction
from repro.substrate.versioned_store import (
    RID,
    SIGN,
    VersionNotFound,
    VersionedStore,
    schema_for,
    to_spark,
)


# ---------------------------------------------------------------------------
# HLC
# ---------------------------------------------------------------------------
class TestHLC:
    def test_tick_uses_physical_time_when_ahead(self):
        c = HLC()
        assert c.tick(10.0) == HLCTimestamp(10.0, 0)

    def test_tick_monotone_when_physical_stalls(self):
        c = HLC()
        a = c.tick(10.0)
        b = c.tick(10.0)
        d = c.tick(9.0)
        assert a < b < d
        assert b == HLCTimestamp(10.0, 1)
        assert d == HLCTimestamp(10.0, 2)

    def test_tick_sequence_strictly_increasing(self):
        c = HLC()
        ts = [c.tick(t) for t in [1.0, 1.0, 2.0, 1.5, 3.0, 3.0, 3.0]]
        assert all(a < b for a, b in zip(ts, ts[1:]))

    def test_observe_merges_remote_ahead(self):
        c = HLC()
        c.tick(5.0)
        got = c.observe(HLCTimestamp(50.0, 3), now=6.0)
        assert got > HLCTimestamp(50.0, 3)

    def test_observe_local_ahead(self):
        c = HLC()
        c.tick(100.0)
        got = c.observe(HLCTimestamp(5.0, 0), now=6.0)
        assert got > HLCTimestamp(100.0, 0)

    def test_observe_physical_ahead_of_both(self):
        c = HLC()
        c.tick(5.0)
        got = c.observe(HLCTimestamp(6.0, 2), now=100.0)
        assert got == HLCTimestamp(100.0, 0)

    def test_total_order(self):
        assert HLCTimestamp(1.0, 5) < HLCTimestamp(2.0, 0)
        assert HLCTimestamp(1.0, 0) < HLCTimestamp(1.0, 1)
        assert HLCTimestamp(1.0, 1) == HLCTimestamp(1.0, 1)


# ---------------------------------------------------------------------------
# Versioned store
# ---------------------------------------------------------------------------
def _pdf(**cols):
    return pd.DataFrame(cols)


class TestVersionedStore:
    def test_create_assigns_rids(self):
        s = VersionedStore()
        t = s.create_table("t", _pdf(a=[1, 2, 3]), ts=0.0)
        snap = t.current.snapshot
        assert list(snap[RID]) == ["t:0", "t:1", "t:2"]

    def test_initial_delta_is_all_inserts(self):
        s = VersionedStore()
        t = s.create_table("t", _pdf(a=[1, 2]), ts=0.0)
        assert list(t.versions[0].delta[SIGN]) == [1, 1]

    def test_resolve_at_picks_latest_leq(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1]), ts=0.0)
        txn = Transaction(s, ts=5.0)
        txn.insert("t", _pdf(a=[2]))
        txn.commit()
        assert len(s.table("t").resolve_at(4.9).snapshot) == 1
        assert len(s.table("t").resolve_at(5.0).snapshot) == 2
        assert len(s.table("t").resolve_at(99.0).snapshot) == 2

    def test_resolve_before_first_version_raises(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1]), ts=10.0)
        with pytest.raises(VersionNotFound):
            s.table("t").resolve_at(9.0)

    def test_replace_bumps_generation(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1]), ts=0.0)
        assert s.table("t").generation == 0
        s.replace_table("t", _pdf(a=[9, 9]), ts=1.0)
        assert s.table("t").generation == 1
        assert len(s.table("t").current.snapshot) == 2

    def test_version_monotonicity_enforced(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1]), ts=5.0)
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[2]))
        with pytest.raises(ValueError):
            txn.commit()

    def test_dynamic_refresh_map_exact_resolution(self):
        s = VersionedStore()
        t = s.create_dynamic_storage("d", schema_for(_pdf(a=[1])))
        t.commit_version(10.0, s.hlc.tick(10.0), _pdf(a=[1], **{RID: ["d:0"]}), _pdf(a=[1], **{RID: ["d:0"], SIGN: [1]}), refresh_ts=10.0)
        t.mark_no_data(20.0)
        assert t.resolve_exact(10.0) is t.resolve_exact(20.0)
        with pytest.raises(VersionNotFound):
            t.resolve_exact(15.0)

    def test_schema_for_maps_dtypes(self):
        pdf = _pdf(i=[1], f=[1.5], s=["x"], b=[True], t=[pd.Timestamp("2020-01-01")])
        sch = {f.name: type(f.dataType).__name__ for f in schema_for(pdf).fields}
        assert sch == {
            "i": "LongType",
            "f": "DoubleType",
            "s": "StringType",
            "b": "BooleanType",
            "t": "TimestampType",
        }

    def test_schema_for_array_column(self):
        pdf = pd.DataFrame({"a": [[1, 2], [3]]})
        f = schema_for(pdf).fields[0]
        assert type(f.dataType).__name__ == "ArrayType"

    def test_to_spark_roundtrip_with_nullable_ints(self, spark):
        pdf = pd.DataFrame({"a": [1.0, None], "s": ["x", None]})
        sch = schema_for(_pdf(a=[1], s=["x"]))
        df = to_spark(spark, pdf, sch)
        back = df.toPandas()
        assert back["a"].tolist()[0] == 1
        assert pd.isna(back["a"].tolist()[1])

    def test_to_spark_empty(self, spark):
        sch = schema_for(_pdf(a=[1]))
        df = to_spark(spark, _pdf(a=[1]).iloc[0:0], sch)
        assert df.count() == 0
        assert df.schema == sch


# ---------------------------------------------------------------------------
# Transactions
# ---------------------------------------------------------------------------
class TestTransaction:
    def _store(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1, 2, 3], b=["x", "y", "z"]), ts=0.0)
        return s

    def test_insert_appends_and_records_delta(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[4], b=["w"]))
        txn.commit()
        t = s.table("t")
        assert len(t.current.snapshot) == 4
        assert list(t.versions[-1].delta[SIGN]) == [1]

    def test_delete_removes_and_records(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        assert txn.delete("t", "a >= 2") == 2
        txn.commit()
        t = s.table("t")
        assert list(t.current.snapshot["a"]) == [1]
        d = t.versions[-1].delta
        assert sorted(d["a"]) == [2, 3] and set(d[SIGN]) == {-1}

    def test_update_is_delete_plus_insert_with_fresh_rid(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        assert txn.update("t", "a == 2", {"b": "Q"}) == 1
        txn.commit()
        t = s.table("t")
        snap = t.current.snapshot.sort_values("a")
        assert list(snap["b"]) == ["x", "Q", "z"]
        d = t.versions[-1].delta
        del_row = d[d[SIGN] == -1].iloc[0]
        ins_row = d[d[SIGN] == 1].iloc[0]
        assert del_row["b"] == "y" and ins_row["b"] == "Q"
        assert del_row[RID] != ins_row[RID]

    def test_update_with_callable(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.update("t", "a > 1", {"a": lambda d: d["a"] * 10})
        txn.commit()
        assert sorted(s.table("t").current.snapshot["a"]) == [1, 20, 30]

    def test_reads_your_writes_within_txn(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[100], b=["n"]))
        assert txn.delete("t", "a == 100") == 1
        txn.commit()
        assert len(s.table("t").current.snapshot) == 3

    def test_rollback_discards(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[4], b=["w"]))
        txn.rollback()
        assert len(s.table("t").current.snapshot) == 3
        assert len(s.table("t").versions) == 1

    def test_multi_table_atomic_commit_shares_hlc(self):
        s = self._store()
        s.create_table("u", _pdf(a=[9]), ts=0.0)
        txn = Transaction(s, ts=2.0)
        txn.insert("t", _pdf(a=[4], b=["w"]))
        txn.insert("u", _pdf(a=[10]))
        txn.commit()
        assert s.table("t").current.hlc == s.table("u").current.hlc

    def test_commit_twice_raises(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[4], b=["w"]))
        txn.commit()
        with pytest.raises(RuntimeError):
            txn.commit()

    def test_locked_table_blocks_commit(self):
        s = self._store()
        s.table("t").locked = True
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[4], b=["w"]))
        from repro.substrate.txn import TableLockedError

        with pytest.raises(TableLockedError):
            txn.commit()


# ---------------------------------------------------------------------------
# CDC
# ---------------------------------------------------------------------------
class TestCDC:
    def _store(self):
        s = VersionedStore()
        s.create_table("t", _pdf(a=[1, 2, 3]), ts=0.0)
        return s

    def test_no_changes_is_empty(self):
        s = self._store()
        assert len(changes_between(s, "t", 0.0, 10.0)) == 0
        assert not has_changes(s, "t", 0.0, 10.0)

    def test_insert_then_delete_cancels(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.insert("t", _pdf(a=[7]))
        txn.commit()
        txn = Transaction(s, ts=2.0)
        txn.delete("t", "a == 7")
        txn.commit()
        assert len(changes_between(s, "t", 0.0, 2.0)) == 0
        # but each half-interval sees one change
        assert len(changes_between(s, "t", 0.0, 1.0)) == 1
        assert len(changes_between(s, "t", 1.0, 2.0)) == 1

    def test_update_survives_as_pair(self):
        s = self._store()
        txn = Transaction(s, ts=1.0)
        txn.update("t", "a == 2", {"a": 20})
        txn.commit()
        d = changes_between(s, "t", 0.0, 1.0)
        assert sorted(d[SIGN]) == [-1, 1]
        assert set(d["a"]) == {2, 20}

    def test_interval_is_left_open_right_closed(self):
        s = self._store()
        txn = Transaction(s, ts=5.0)
        txn.insert("t", _pdf(a=[9]))
        txn.commit()
        assert len(changes_between(s, "t", 5.0, 10.0)) == 0
        assert len(changes_between(s, "t", 4.9, 5.0)) == 1

    def test_consolidate_detects_duplicate_rids(self):
        bad = pd.DataFrame({"a": [1, 1], RID: ["t:0", "t:0"], SIGN: [1, 1]})
        with pytest.raises(AssertionError):
            consolidate(bad)

    def test_consolidate_keeps_value_distinct_rows_same_rid(self):
        # update of a group row: same rid, different values -> both survive
        d = pd.DataFrame({"a": [5, 6], RID: ["g:k", "g:k"], SIGN: [-1, 1]})
        out = consolidate(d)
        assert len(out) == 2

    def test_consolidate_nan_rows_cancel(self):
        d = pd.DataFrame({"a": [float("nan"), float("nan")], RID: ["r", "r"], SIGN: [1, -1]})
        assert len(consolidate(d)) == 0
