"""Change queries between table versions — the "Streams" substrate (§5.5).

``changes_between(store, table, t0, t1)`` returns the consolidated change set
of a table over the interval ``(t0, t1]`` as a pandas frame with ``RID``,
all value columns, and ``SIGN`` (±1). Consolidation groups by row id *and*
row values and sums signs, so a row inserted then deleted within the interval
cancels out, while an update survives as a DELETE(old values) + INSERT(new
values) pair for the same values-differing rid — the framework's guarantee
that a change set "never contains more than 1 row for each unique
($ROW_ID, $ACTION) pair".
"""
from __future__ import annotations

import pandas as pd

from repro.substrate.versioned_store import RID, SIGN, VersionedStore, VersionedTable


def _row_hash(pdf: pd.DataFrame, value_cols: list[str]) -> pd.Series:
    """A per-row hash over value columns (NaN-stable, list-safe)."""
    def canon(v: object) -> object:
        if isinstance(v, (list, tuple)):
            return tuple(v)
        return v

    cols = []
    for c in value_cols:
        s = pdf[c]
        if s.dtype == object:
            s = s.map(canon)
        cols.append(s)
    if not cols:
        return pd.Series(0, index=pdf.index, dtype="uint64")
    base = pd.util.hash_pandas_object(pd.concat(cols, axis=1), index=False)
    return base


def consolidate(delta: pd.DataFrame) -> pd.DataFrame:
    """Sum signs per (rid, row values); drop net-zero rows.

    Net signs are clamped to ±1 never exceeding it: with unique row ids per
    logical row, |net| > 1 indicates a bug upstream and is surfaced.
    """
    if len(delta) == 0:
        return delta
    value_cols = [c for c in delta.columns if c not in (RID, SIGN)]
    work = delta.copy()
    work["__h__"] = _row_hash(work, value_cols)
    net = work.groupby([RID, "__h__"], dropna=False, sort=False)[SIGN].sum()
    keep = net[net != 0]
    if (keep.abs() > 1).any():
        raise AssertionError("consolidation produced |multiplicity| > 1 — duplicate row ids?")
    first = work.drop_duplicates(subset=[RID, "__h__"]).set_index([RID, "__h__"])
    out = first.loc[keep.index].copy()
    out[SIGN] = keep
    return out.reset_index().drop(columns="__h__")


def deltas_in_interval(t: VersionedTable, t0: float, t1: float) -> list[pd.DataFrame]:
    """Raw recorded deltas of versions with ``t0 < version.ts <= t1``."""
    return [v.delta for v in t.versions if t0 < v.ts <= t1]


def changes_between(store: VersionedStore, table: str, t0: float, t1: float) -> pd.DataFrame:
    """Consolidated change set of ``table`` over ``(t0, t1]`` (base tables)."""
    t = store.table(table)
    parts = deltas_in_interval(t, t0, t1)
    if not parts:
        empty = t.current.snapshot.iloc[0:0].copy()
        empty[SIGN] = pd.Series(dtype="int64")
        return empty
    return consolidate(pd.concat(parts, ignore_index=True))


def dt_changes_between(store: VersionedStore, table: str, rts0: float, rts1: float) -> pd.DataFrame:
    """Consolidated change set of a DT between two *refresh* timestamps.

    Uses the refresh-timestamp → version mapping (§5.3): NO_DATA refreshes map
    onto existing versions, so equal mapped indices ⇒ empty change set.
    """
    t = store.table(table)
    i0 = t.refresh_map[rts0]
    i1 = t.refresh_map[rts1]
    parts = [t.versions[k].delta for k in range(i0 + 1, i1 + 1)]
    if not parts:
        empty = t.current.snapshot.iloc[0:0].copy()
        empty[SIGN] = pd.Series(dtype="int64")
        return empty
    return consolidate(pd.concat(parts, ignore_index=True))


def has_changes(store: VersionedStore, table: str, t0: float, t1: float) -> bool:
    """True if any version of ``table`` committed in ``(t0, t1]``."""
    return len(deltas_in_interval(store.table(table), t0, t1)) > 0
