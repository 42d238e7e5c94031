"""Staged DML transactions over the versioned store.

Models the slice of Snowflake's transaction engine that Dynamic Tables
depends on (§5.3): table locks, staged changes, atomic commit with an HLC
commit timestamp, and recording of the change set (delta) each commit
produced so CDC can replay it.

Updates are represented as DELETE(old row) + INSERT(new row) with a fresh
row id — exactly the ``$ROW_ID/$ACTION`` pair representation the
differentiation framework consumes (§5.5).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

import pandas as pd

from repro.substrate.versioned_store import RID, SIGN, VersionedStore


class TableLockedError(RuntimeError):
    """Raised when a commit would touch a table locked by another operation."""


@dataclass
class _Staged:
    """Per-table staged state: working snapshot + accumulated delta rows."""

    snapshot: pd.DataFrame
    delta_parts: list[pd.DataFrame] = field(default_factory=list)


class Transaction:
    """A single DML transaction at simulated time ``ts``.

    Usage::

        txn = Transaction(store, ts=10.0)
        txn.insert("orders", new_rows_pdf)
        txn.delete("orders", "o_totalprice < 0")
        txn.update("orders", "o_orderstatus == 'P'", {"o_orderstatus": "F"})
        txn.commit()

    Predicates are pandas ``DataFrame.query`` expressions evaluated against
    the staged snapshot (reads-your-writes within the transaction).
    """

    def __init__(self, store: VersionedStore, ts: float) -> None:
        self.store = store
        self.ts = ts
        self._staged: dict[str, _Staged] = {}
        self._done = False

    def _stage(self, table: str) -> _Staged:
        if table not in self._staged:
            current = self.store.table(table).current.snapshot
            self._staged[table] = _Staged(snapshot=current.copy())
        return self._staged[table]

    # -- DML --------------------------------------------------------------
    def insert(self, table: str, pdf: pd.DataFrame) -> None:
        """Stage an INSERT of ``pdf`` (user columns only; rids are allocated)."""
        st = self._stage(table)
        t = self.store.table(table)
        rows = pdf.reset_index(drop=True).copy()
        rows[RID] = t.allocate_rids(len(rows))
        st.snapshot = pd.concat([st.snapshot, rows], ignore_index=True)
        ins = rows.copy()
        ins[SIGN] = 1
        st.delta_parts.append(ins)

    def delete(self, table: str, predicate: str) -> int:
        """Stage a DELETE of rows matching ``predicate``; returns the count."""
        st = self._stage(table)
        hit = st.snapshot.query(predicate)
        if len(hit) == 0:
            return 0
        st.snapshot = st.snapshot.drop(index=hit.index).reset_index(drop=True)
        dels = hit.reset_index(drop=True).copy()
        dels[SIGN] = -1
        st.delta_parts.append(dels)
        return len(hit)

    def update(
        self, table: str, predicate: str, assignments: dict[str, object | Callable[[pd.DataFrame], pd.Series]]
    ) -> int:
        """Stage an UPDATE as DELETE(old) + INSERT(new, fresh rid); returns count."""
        st = self._stage(table)
        t = self.store.table(table)
        hit = st.snapshot.query(predicate)
        if len(hit) == 0:
            return 0
        st.snapshot = st.snapshot.drop(index=hit.index).reset_index(drop=True)
        dels = hit.reset_index(drop=True).copy()
        dels[SIGN] = -1
        new = hit.reset_index(drop=True).copy()
        for col, val in assignments.items():
            new[col] = val(new) if callable(val) else val
        new[RID] = t.allocate_rids(len(new))
        ins = new.copy()
        ins[SIGN] = 1
        st.delta_parts.append(dels)
        st.delta_parts.append(ins)
        st.snapshot = pd.concat([st.snapshot, new], ignore_index=True)
        return len(hit)

    # -- commit -----------------------------------------------------------
    def commit(self) -> None:
        """Atomically commit all staged tables at one HLC commit timestamp."""
        if self._done:
            raise RuntimeError("transaction already finished")
        for name in self._staged:
            if self.store.table(name).locked:
                raise TableLockedError(f"table {name} is locked")
        hlc = self.store.hlc.tick(self.ts)
        for name, st in self._staged.items():
            t = self.store.table(name)
            if st.delta_parts:
                delta = pd.concat(st.delta_parts, ignore_index=True)
            else:
                delta = st.snapshot.iloc[0:0].copy()
                delta[SIGN] = pd.Series(dtype="int64")
            t.commit_version(self.ts, hlc, st.snapshot, delta)
        self._done = True

    def rollback(self) -> None:
        """Discard all staged changes."""
        self._staged.clear()
        self._done = True
