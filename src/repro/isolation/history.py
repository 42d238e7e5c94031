"""Transaction histories in the style of Adya et al. [2], extended with the
paper's *derivation* operation (§4).

A history is an ordered list of events over versioned objects:

- ``Read(txn, obj, version)`` — ``r_t(x_v)``
- ``Write(txn, obj, version)`` — ``w_t(x_v)``; installs version ``v`` of ``x``
- ``Derive(txn, obj, version, sources)`` — ``d_t(x_v | y_j, …)``: installs a
  *derived* value computed purely from the named source versions (§4). This
  is the new operation: it represents pure computation (a DT refresh) whose
  provenance is explicit in the history.
- ``Commit(txn)`` / ``Abort(txn)``

The version order of each object is the order in which versions are
installed (by writes or derivations). ``derives_from`` is the transitive
closure over derivation provenance.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class Read:
    txn: str
    obj: str
    version: int


@dataclass(frozen=True)
class Write:
    txn: str
    obj: str
    version: int


@dataclass(frozen=True)
class Derive:
    txn: str
    obj: str
    version: int
    sources: tuple[tuple[str, int], ...]


@dataclass(frozen=True)
class Commit:
    txn: str


@dataclass(frozen=True)
class Abort:
    txn: str


Event = Read | Write | Derive | Commit | Abort


@dataclass
class History:
    """An ordered event list plus derived indexes."""

    events: list[Event] = field(default_factory=list)

    # -- construction ----------------------------------------------------
    def add(self, *events: Event) -> "History":
        self.events.extend(events)
        return self

    # -- basic indexes ---------------------------------------------------
    @property
    def txns(self) -> list[str]:
        seen: list[str] = []
        for e in self.events:
            if e.txn not in seen:
                seen.append(e.txn)
        return seen

    def committed(self) -> set[str]:
        return {e.txn for e in self.events if isinstance(e, Commit)}

    def aborted(self) -> set[str]:
        return {e.txn for e in self.events if isinstance(e, Abort)}

    def installer(self, obj: str, version: int) -> str | None:
        """The transaction that installed (wrote or derived) a version."""
        for e in self.events:
            if isinstance(e, (Write, Derive)) and e.obj == obj and e.version == version:
                return e.txn
        return None

    def writes_of(self, obj: str) -> list[Write]:
        return [e for e in self.events if isinstance(e, Write) and e.obj == obj]

    def installs_of(self, obj: str) -> list[Write | Derive]:
        return [e for e in self.events if isinstance(e, (Write, Derive)) and e.obj == obj]

    def version_order(self, obj: str) -> list[int]:
        """Install order of an object's versions (Adya's total order <<)."""
        return [e.version for e in self.installs_of(obj)]

    def next_version(self, obj: str, version: int) -> int | None:
        order = self.version_order(obj)
        if version in order:
            i = order.index(version)
            if i + 1 < len(order):
                return order[i + 1]
        return None

    # -- derivations -----------------------------------------------------
    def derivation(self, obj: str, version: int) -> Derive | None:
        for e in self.events:
            if isinstance(e, Derive) and e.obj == obj and e.version == version:
                return e
        return None

    def derives_from(self, obj: str, version: int) -> set[tuple[str, int]]:
        """All (object, version) pairs reachable through derivation paths —
        the paper's 'x derives from z' relation (reflexive closure excluded)."""
        out: set[tuple[str, int]] = set()
        stack = [(obj, version)]
        while stack:
            o, v = stack.pop()
            d = self.derivation(o, v)
            if d is None:
                continue
            for src in d.sources:
                if src not in out:
                    out.add(src)
                    stack.append(src)
        return out

    def base_writers_of(self, obj: str, version: int) -> set[tuple[str, int]]:
        """The *written* (non-derived) versions a value ultimately rests on.

        For a written version this is the version itself; for a derived one,
        the written versions in its derives-from closure.
        """
        if self.derivation(obj, version) is None:
            return {(obj, version)}
        return {
            (o, v)
            for (o, v) in self.derives_from(obj, version)
            if self.derivation(o, v) is None
        }
