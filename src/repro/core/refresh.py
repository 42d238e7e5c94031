"""Refresh actions and the merge operator (§3.3.2, §5.4), plus the
production validations of §6.1.

A refresh takes one of four actions:

- ``NO_DATA`` — no source changed in the interval; only the data timestamp
  advances (zero compute).
- ``FULL`` — INSERT OVERWRITE with the defining query at the new timestamp.
- ``INCREMENTAL`` — compute Δ_I Q and merge it into the stored contents.
- ``REINITIALIZE`` — like FULL, used when an upstream change (generation
  bump, replaced table, altered definition) invalidated stored results.

The merge enforces the two §6.1 invariants on every incremental refresh and
fails the refresh if violated: (a) never more than one row per
``($ROW_ID, $ACTION)`` pair; (b) never delete a row that does not exist.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.substrate.cdc import _row_hash
from repro.substrate.versioned_store import RID, SIGN, coerce

NO_DATA = "NO_DATA"
FULL = "FULL"
INCREMENTAL = "INCREMENTAL"
REINITIALIZE = "REINITIALIZE"


def coerce_delta(pdf: pd.DataFrame, schema: T.StructType) -> pd.DataFrame:
    """Coerce a collected change set to the DT schema, preserving ``SIGN``."""
    out = coerce(pdf, schema)
    out[SIGN] = pdf[SIGN].to_numpy()
    return out


class RefreshValidationError(AssertionError):
    """An incremental refresh violated a §6.1 invariant; the refresh fails
    instead of corrupting the DT."""


@dataclass
class MergeResult:
    """Outcome of merging a change set into stored contents."""

    new_snapshot: pd.DataFrame
    recorded_delta: pd.DataFrame
    rows_inserted: int
    rows_deleted: int


def validate_change_set(delta: DataFrame) -> None:
    """§6.1 invariant (a): at most one row per ($ROW_ID, $ACTION) pair."""
    dup = (
        delta.groupBy(RID, SIGN)
        .count()
        .filter(F.col("count") > 1)
        .limit(1)
        .collect()
    )
    if dup:
        raise RefreshValidationError(
            f"change set has duplicate ($ROW_ID, $ACTION): {dup[0][RID]!r}"
        )


def merge(
    spark: SparkSession,
    stored: pd.DataFrame,
    schema: T.StructType,
    delta: DataFrame,
    *,
    validate: bool = True,
) -> MergeResult:
    """Apply a consolidated change set to the stored DT contents.

    DELETE actions remove rows by row id; INSERT actions append. The recorded
    delta (for downstream CDC) takes DELETE values from the *stored* snapshot
    so that a later insert/delete of the same row cancels binary-exactly in
    consolidation (floating-point recomputation may differ in final bits).
    """
    # The differentiated plan (Catalyst) produced the change set; collecting
    # it is O(|Δ|). The merge itself is targeted DML against the storage
    # layer — O(|Δ| + |DT|) with a vectorized row-id lookup, never a full
    # Spark materialization of the stored table (which would add an O(|DT|)
    # fixed cost to every incremental refresh and erase its advantage —
    # Snowflake's merge likewise touches only affected micro-partitions).
    # Validations run on the collected set so the delta plan evaluates once.
    dpdf = coerce_delta(delta.toPandas(), schema)
    if validate and dpdf.duplicated(subset=[RID, SIGN]).any():
        dup = dpdf[dpdf.duplicated(subset=[RID, SIGN])].iloc[0][RID]
        raise RefreshValidationError(
            f"change set has duplicate ($ROW_ID, $ACTION): {dup!r}"
        )
    del_rids = set(dpdf.loc[dpdf[SIGN] < 0, RID])
    ins = dpdf[dpdf[SIGN] > 0].drop(columns=[SIGN])

    if validate and del_rids:
        missing = del_rids - set(stored[RID])
        if missing:
            raise RefreshValidationError(
                f"change set deletes nonexistent rows: {sorted(missing)[:3]}"
            )
    kept = stored[~stored[RID].isin(del_rids)] if del_rids else stored
    inserted_rows = coerce(ins, schema)
    new_snapshot = (
        pd.concat([kept, inserted_rows], ignore_index=True)
        if len(inserted_rows)
        else kept.reset_index(drop=True).copy()
    )

    deleted_rows = stored[stored[RID].isin(del_rids)]
    inserted_rows = inserted_rows.copy()
    inserted_rows[SIGN] = 1
    recorded = pd.concat(
        [coerce(deleted_rows, schema).assign(**{SIGN: -1}), inserted_rows],
        ignore_index=True,
    )
    return MergeResult(
        new_snapshot=new_snapshot,
        recorded_delta=recorded,
        rows_inserted=len(ins),
        rows_deleted=len(del_rids),
    )


def diff_snapshots(
    old: pd.DataFrame, new: pd.DataFrame, schema: T.StructType
) -> pd.DataFrame:
    """Change set between two full snapshots (used to record CDC for FULL /
    REINITIALIZE refreshes so downstream incremental DTs keep working).

    Rows are matched on (row id, value hash): unchanged rows cancel; changed
    rows appear as DELETE(old) + INSERT(new) for the same row id.
    """
    o = coerce(old, schema)
    n = coerce(new, schema)
    vcols = [f.name for f in schema.fields if f.name != RID]
    o["__h__"] = _row_hash(o, vcols)
    n["__h__"] = _row_hash(n, vcols)
    import numpy as np

    okeys = set(zip(o[RID], o["__h__"]))
    nkeys = set(zip(n[RID], n["__h__"]))
    d_mask = np.array([k not in nkeys for k in zip(o[RID], o["__h__"])], dtype=bool)
    i_mask = np.array([k not in okeys for k in zip(n[RID], n["__h__"])], dtype=bool)
    d = o.loc[d_mask].drop(columns="__h__").copy()
    i = n.loc[i_mask].drop(columns="__h__").copy()
    d[SIGN] = -1
    i[SIGN] = 1
    return pd.concat([d, i], ignore_index=True)
