"""MVCC versioned table store — the reproduction's stand-in for Snowflake's
table storage and transaction metadata (§5.3 of the paper).

Every table (base table or Dynamic Table) is a :class:`VersionedTable`: an
ordered sequence of :class:`Version` objects, each holding

- a full **snapshot** of the table contents (pandas, with the hidden
  ``__rid__`` row-id column of §5.5),
- the recorded **delta** versus the previous version (rows + ``__sign__``,
  +1 insert / −1 delete) — this is what CDC/"Streams" reads,
- the **commit timestamp** issued by the account-wide HLC, and
- the logical **timestamp** the version is indexed by (commit time for base
  tables; *refresh timestamp* for DTs).

Snapshots live in driver memory as pandas frames (SF ≤ 0.1 ⇒ tens of MB) and
are materialized to Spark DataFrames with a pinned schema on demand, so all
query *computation* runs through Catalyst while version bookkeeping stays
cheap and deterministic.

DTs additionally carry the refresh-timestamp → version mapping of §5.3
("we store a mapping from refresh timestamp to commit timestamp"): a NO_DATA
refresh adds a mapping entry without creating a new version, and DVS reads
resolve an upstream DT through this mapping — failing loudly if the exact
version is absent (the paper's production validation #1, §6.1).
"""
from __future__ import annotations

import bisect
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

#: Hidden row-identifier column (§5.5: ``$ROW_ID``). Plaintext-prefixed strings.
RID = "__rid__"
#: Signed-multiplicity column used in delta frames (+1 insert, −1 delete).
#: The user-facing ``$ACTION`` column of §5.5 is a rendering of this sign.
SIGN = "__sign__"

from repro.substrate.hlc import HLC, HLCTimestamp  # noqa: E402  (after constants)


class TableNotFound(KeyError):
    """Raised when resolving a table that does not exist in the store."""


class VersionNotFound(LookupError):
    """Raised when no table version exists at/for the requested timestamp.

    For DTs under delayed view semantics this is the paper's production
    validation #1: "it looks for an exact version corresponding to the data
    timestamp of the refresh. If this version cannot be found, we fail the
    refresh" (§6.1).
    """


def with_field(schema: T.StructType, name: str, dtype: T.DataType) -> T.StructType:
    """A *new* StructType with one extra field (``StructType.add`` mutates!)."""
    return T.StructType(list(schema.fields) + [T.StructField(name, dtype)])


def schema_for(pdf: pd.DataFrame) -> T.StructType:
    """Derive an explicit Spark schema from a pandas frame's dtypes.

    Explicit schemas keep empty deltas constructible and make Spark ↔ DuckDB
    comparisons deterministic (no sampling-based inference).
    """
    fields = []
    for col in pdf.columns:
        dtype = pdf[col].dtype
        if pd.api.types.is_datetime64_any_dtype(dtype):
            spark_t: T.DataType = T.TimestampType()
        elif pd.api.types.is_bool_dtype(dtype):
            spark_t = T.BooleanType()
        elif pd.api.types.is_integer_dtype(dtype):
            spark_t = T.LongType()
        elif pd.api.types.is_float_dtype(dtype):
            spark_t = T.DoubleType()
        else:
            sample = pdf[col].dropna()
            first = sample.iloc[0] if len(sample) else None
            if isinstance(first, (list, np.ndarray)):
                inner = first[0] if len(first) else 0.0
                if isinstance(inner, (int, np.integer)):
                    elem: T.DataType = T.LongType()
                elif isinstance(inner, (float, np.floating)):
                    elem = T.DoubleType()
                else:
                    elem = T.StringType()
                spark_t = T.ArrayType(elem)
            else:
                spark_t = T.StringType()
        fields.append(T.StructField(col, spark_t))
    return T.StructType(fields)


def coerce(pdf: pd.DataFrame, schema: T.StructType) -> pd.DataFrame:
    """Normalize pandas dtypes to match a pinned Spark schema.

    ``toPandas`` renders nullable BIGINT columns as float64 (NaN for NULL) and
    booleans as object; re-materializing those against a Long/Boolean schema
    needs the nullable pandas extension dtypes. Run the same coercion before
    hashing snapshots so row hashes are dtype-stable across refreshes.
    """
    out = pdf[[f.name for f in schema.fields]].copy()
    for f in schema.fields:
        s = out[f.name]
        if isinstance(f.dataType, (T.LongType, T.IntegerType)):
            if not pd.api.types.is_integer_dtype(s.dtype) or s.dtype != "Int64":
                out[f.name] = s.astype("Int64")
        elif isinstance(f.dataType, T.DoubleType):
            if s.dtype != "float64":
                out[f.name] = s.astype("float64")
        elif isinstance(f.dataType, T.BooleanType):
            if s.dtype != "boolean":
                out[f.name] = s.astype("boolean")
        elif isinstance(f.dataType, T.TimestampType):
            if not pd.api.types.is_datetime64_any_dtype(s.dtype):
                out[f.name] = pd.to_datetime(s)
        elif isinstance(f.dataType, T.StringType):
            if s.dtype != object:
                out[f.name] = s.astype(object)
            out[f.name] = out[f.name].where(pd.notna(out[f.name]), None)
    return out


def to_spark(spark: SparkSession, pdf: pd.DataFrame, schema: T.StructType) -> DataFrame:
    """Materialize a pandas frame as a Spark DataFrame with a pinned schema."""
    if len(pdf) == 0:
        return spark.createDataFrame([], schema)
    return spark.createDataFrame(coerce(pdf, schema), schema=schema)


def empty_like(schema: T.StructType) -> pd.DataFrame:
    """An empty pandas frame with columns matching ``schema`` (dtypes loose)."""
    return pd.DataFrame({f.name: pd.Series(dtype="object") for f in schema.fields})


@dataclass
class Version:
    """One committed version of a table.

    ``ts`` is the logical index timestamp (simulated seconds): the commit time
    for base tables, the refresh/data timestamp for DTs. ``hlc`` is the
    account-wide commit timestamp. ``delta`` holds this version's change set
    versus the previous version (``SIGN`` ±1); the initial version's delta is
    all-inserts.
    """

    ts: float
    hlc: HLCTimestamp
    snapshot: pd.DataFrame
    delta: pd.DataFrame
    generation: int


@dataclass
class VersionedTable:
    """An MVCC table: ordered versions plus row-id allocation state."""

    name: str
    schema: T.StructType
    versions: list[Version] = field(default_factory=list)
    generation: int = 0
    rid_seq: int = 0
    is_dynamic: bool = False
    #: refresh timestamp -> index into ``versions`` (DTs only, §5.3). NO_DATA
    #: refreshes map a new timestamp onto an existing version.
    refresh_map: dict[float, int] = field(default_factory=dict)
    locked: bool = False

    # -- timestamps -------------------------------------------------------
    def _ts_list(self) -> list[float]:
        return [v.ts for v in self.versions]

    def version_index_at(self, ts: float) -> int:
        """Index of the latest version with ``version.ts <= ts`` (persisted read)."""
        i = bisect.bisect_right(self._ts_list(), ts) - 1
        if i < 0:
            raise VersionNotFound(f"{self.name}: no version at or before ts={ts}")
        return i

    def resolve_at(self, ts: float) -> Version:
        """Persisted-table read: latest committed version as of ``ts``."""
        return self.versions[self.version_index_at(ts)]

    def resolve_exact(self, refresh_ts: float) -> Version:
        """DVS read: the version a DT produced *for* ``refresh_ts`` exactly.

        Uses the refresh-timestamp mapping for DTs; base tables fall back to
        an exact match on the version index timestamp.
        """
        if self.is_dynamic:
            if refresh_ts not in self.refresh_map:
                raise VersionNotFound(
                    f"{self.name}: no refresh at data timestamp {refresh_ts} "
                    "(delayed view semantics validation)"
                )
            return self.versions[self.refresh_map[refresh_ts]]
        for v in self.versions:
            if v.ts == refresh_ts:
                return v
        raise VersionNotFound(f"{self.name}: no version with ts={refresh_ts}")

    @property
    def current(self) -> Version:
        if not self.versions:
            raise VersionNotFound(f"{self.name}: table has no versions")
        return self.versions[-1]

    # -- row ids ----------------------------------------------------------
    def allocate_rids(self, n: int) -> list[str]:
        """Allocate ``n`` fresh plaintext-prefixed row ids (§5.5.2)."""
        start = self.rid_seq
        self.rid_seq += n
        return [f"{self.name}:{i}" for i in range(start, start + n)]

    # -- commits ----------------------------------------------------------
    def commit_version(
        self,
        ts: float,
        hlc: HLCTimestamp,
        snapshot: pd.DataFrame,
        delta: pd.DataFrame,
        *,
        refresh_ts: float | None = None,
    ) -> Version:
        """Append a new version; DTs also record the refresh-ts mapping."""
        if self.versions and ts < self.versions[-1].ts:
            raise ValueError(
                f"{self.name}: version timestamps must be monotone "
                f"({ts} < {self.versions[-1].ts})"
            )
        v = Version(ts, hlc, snapshot.reset_index(drop=True), delta.reset_index(drop=True), self.generation)
        self.versions.append(v)
        if self.is_dynamic:
            self.refresh_map[refresh_ts if refresh_ts is not None else ts] = len(self.versions) - 1
        return v

    def mark_no_data(self, refresh_ts: float) -> None:
        """NO_DATA refresh: map ``refresh_ts`` to the current version (§5.4)."""
        if not self.is_dynamic:
            raise ValueError("mark_no_data only applies to dynamic tables")
        self.refresh_map[refresh_ts] = len(self.versions) - 1


class VersionedStore:
    """The account: a set of versioned tables plus the account-wide HLC."""

    def __init__(self) -> None:
        self.tables: dict[str, VersionedTable] = {}
        self.hlc = HLC()

    def __contains__(self, name: str) -> bool:
        return name in self.tables

    def table(self, name: str) -> VersionedTable:
        try:
            return self.tables[name]
        except KeyError as e:
            raise TableNotFound(name) from e

    # -- creation / replacement ------------------------------------------
    def _with_rids(self, t: VersionedTable, pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.reset_index(drop=True).copy()
        pdf[RID] = t.allocate_rids(len(pdf))
        return pdf

    def create_table(self, name: str, pdf: pd.DataFrame, ts: float) -> VersionedTable:
        """Create a base table whose initial contents are ``pdf``."""
        if name in self.tables:
            raise ValueError(f"table {name} already exists")
        schema = with_field(schema_for(pdf), RID, T.StringType())
        t = VersionedTable(name=name, schema=schema)
        self.tables[name] = t
        snap = self._with_rids(t, pdf)
        delta = snap.copy()
        delta[SIGN] = 1
        t.commit_version(ts, self.hlc.tick(ts), snap, delta)
        return t

    def create_dynamic_storage(self, name: str, schema: T.StructType) -> VersionedTable:
        """Create the storage slot for a DT (contents arrive at initialization)."""
        if name in self.tables:
            raise ValueError(f"table {name} already exists")
        if RID not in [f.name for f in schema.fields]:
            schema = with_field(schema, RID, T.StringType())
        t = VersionedTable(name=name, schema=schema, is_dynamic=True)
        self.tables[name] = t
        return t

    def replace_table(self, name: str, pdf: pd.DataFrame, ts: float) -> VersionedTable:
        """CREATE OR REPLACE: new contents, new generation.

        Downstream DT refreshes detect the generation bump and REINITIALIZE
        (§3.3.2: "some change upstream, such as replacing an upstream table,
        may have invalidated the results already stored in the DT").
        """
        t = self.table(name)
        t.generation += 1
        snap = self._with_rids(t, pdf)
        delta = snap.copy()
        delta[SIGN] = 1  # generation bump invalidates CDC anyway
        t.commit_version(ts, self.hlc.tick(ts), snap, delta)
        return t

    def drop_table(self, name: str) -> None:
        self.table(name)  # raise if missing
        del self.tables[name]

    # -- reads ------------------------------------------------------------
    def snapshot_pdf(self, name: str, ts: float, *, exact: bool = False) -> pd.DataFrame:
        v = self.table(name).resolve_exact(ts) if exact else self.table(name).resolve_at(ts)
        return v.snapshot

    def spark_snapshot(
        self, spark: SparkSession, name: str, ts: float, *, exact: bool = False
    ) -> DataFrame:
        """Materialize a versioned read as a Spark DataFrame (incl. ``RID``)."""
        t = self.table(name)
        return to_spark(spark, self.snapshot_pdf(name, ts, exact=exact), t.schema)
