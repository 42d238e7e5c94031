"""Merge operator + §6.1 production validations + snapshot diffing."""
import pandas as pd
import pytest
from pyspark.sql import types as T

from repro.core.differentiation import consolidate_delta
from repro.core.refresh import (
    RefreshValidationError,
    diff_snapshots,
    merge,
    validate_change_set,
)
from repro.substrate.versioned_store import RID, SIGN, schema_for, to_spark, with_field


def _schema():
    return with_field(
        schema_for(pd.DataFrame({"k": [1], "v": ["a"]})), RID, T.StringType()
    )


def _stored():
    return pd.DataFrame({"k": [1, 2, 3], "v": ["a", "b", "c"], RID: ["t:0", "t:1", "t:2"]})


def _delta_df(spark, rows):
    pdf = pd.DataFrame(rows, columns=["k", "v", RID, SIGN])
    schema = with_field(_schema(), SIGN, T.LongType())
    return to_spark(spark, pdf, schema)


class TestMerge:
    def test_insert_and_delete_applied(self, spark):
        delta = _delta_df(spark, [[4, "d", "t:3", 1], [2, "b", "t:1", -1]])
        m = merge(spark, _stored(), _schema(), delta)
        assert sorted(m.new_snapshot["k"]) == [1, 3, 4]
        assert m.rows_inserted == 1 and m.rows_deleted == 1

    def test_update_same_rid(self, spark):
        delta = _delta_df(spark, [[2, "b", "t:1", -1], [2, "B", "t:1", 1]])
        m = merge(spark, _stored(), _schema(), delta)
        got = m.new_snapshot.sort_values("k")
        assert list(got["v"]) == ["a", "B", "c"]

    def test_empty_delta_is_noop(self, spark):
        m = merge(spark, _stored(), _schema(), _delta_df(spark, []))
        assert len(m.new_snapshot) == 3 and m.rows_inserted == 0 and m.rows_deleted == 0

    def test_duplicate_rid_action_pair_rejected(self, spark):
        delta = _delta_df(spark, [[4, "d", "t:9", 1], [5, "e", "t:9", 1]])
        with pytest.raises(RefreshValidationError, match="duplicate"):
            merge(spark, _stored(), _schema(), delta)

    def test_delete_nonexistent_rejected(self, spark):
        delta = _delta_df(spark, [[9, "x", "t:404", -1]])
        with pytest.raises(RefreshValidationError, match="nonexistent"):
            merge(spark, _stored(), _schema(), delta)

    def test_validation_can_be_disabled(self, spark):
        delta = _delta_df(spark, [[9, "x", "t:404", -1]])
        m = merge(spark, _stored(), _schema(), delta, validate=False)
        assert len(m.new_snapshot) == 3

    def test_recorded_delta_uses_stored_values(self, spark):
        # the delete side of the recorded delta must carry the *stored* row
        # values so downstream CDC cancels binary-exactly
        delta = _delta_df(spark, [[2, "DIFFERENT", "t:1", -1]])
        m = merge(spark, _stored(), _schema(), delta)
        d_rows = m.recorded_delta[m.recorded_delta[SIGN] == -1]
        assert list(d_rows["v"]) == ["b"]

    def test_validate_change_set_passes_clean(self, spark):
        validate_change_set(_delta_df(spark, [[4, "d", "t:3", 1], [2, "b", "t:1", -1]]))


class TestDiffSnapshots:
    def test_identical_snapshots_empty_diff(self):
        assert len(diff_snapshots(_stored(), _stored(), _schema())) == 0

    def test_added_row(self):
        new = pd.concat(
            [_stored(), pd.DataFrame({"k": [4], "v": ["d"], RID: ["t:3"]})],
            ignore_index=True,
        )
        d = diff_snapshots(_stored(), new, _schema())
        assert list(d[SIGN]) == [1] and d.iloc[0]["k"] == 4

    def test_removed_row(self):
        old = _stored()
        d = diff_snapshots(old, old.iloc[:2], _schema())
        assert list(d[SIGN]) == [-1] and d.iloc[0]["k"] == 3

    def test_changed_value_same_rid_is_update_pair(self):
        new = _stored()
        new.loc[1, "v"] = "B"
        d = diff_snapshots(_stored(), new, _schema())
        assert sorted(d[SIGN]) == [-1, 1]
        assert set(d["v"]) == {"b", "B"}

    def test_from_empty_all_inserts(self):
        d = diff_snapshots(_stored().iloc[0:0], _stored(), _schema())
        assert list(d[SIGN]) == [1, 1, 1]


class TestConsolidateDelta:
    def test_exact_pairs_cancel(self, spark):
        delta = _delta_df(spark, [[1, "a", "r", 1], [1, "a", "r", -1]])
        assert consolidate_delta(delta).count() == 0

    def test_update_pairs_survive(self, spark):
        delta = _delta_df(spark, [[1, "a", "r", -1], [1, "A", "r", 1]])
        assert consolidate_delta(delta).count() == 2

    def test_distinct_rids_kept(self, spark):
        delta = _delta_df(spark, [[1, "a", "r1", 1], [2, "b", "r2", 1]])
        assert consolidate_delta(delta).count() == 2
