"""Substrate subsystems the paper's Dynamic Tables depend on.

The paper builds on Snowflake's catalog, transaction engine, and versioned
table storage. This package reimplements the observable behaviour of those
components for a single-process reproduction:

- :mod:`repro.substrate.hlc` — Hybrid Logical Clock (commit timestamps, §5.3)
- :mod:`repro.substrate.versioned_store` — MVCC versioned tables with
  time-travel reads, per-version recorded deltas, and the refresh-timestamp →
  commit-timestamp mapping (§5.3)
- :mod:`repro.substrate.txn` — staged DML transactions with table locks
- :mod:`repro.substrate.cdc` — change queries between two table versions
  (the "Streams" substrate that query differentiation consumes)
"""
from repro.substrate.hlc import HLC, HLCTimestamp
from repro.substrate.versioned_store import (
    RID,
    SIGN,
    TableNotFound,
    Version,
    VersionNotFound,
    VersionedStore,
    VersionedTable,
)
from repro.substrate.txn import Transaction, TableLockedError
from repro.substrate import cdc

__all__ = [
    "HLC",
    "HLCTimestamp",
    "RID",
    "SIGN",
    "TableNotFound",
    "Version",
    "VersionNotFound",
    "VersionedStore",
    "VersionedTable",
    "Transaction",
    "TableLockedError",
    "cdc",
]
