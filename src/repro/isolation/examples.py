"""The paper's worked examples (§4, Figures 1–2) and the history
transformations behind Theorem 1 (Transaction Invariance) and Corollary 2
(Encapsulation).

Scenario: base table ``bt`` holds object ``x`` with versions x1 (written by
T1) and x2 (written by T2). A dynamic table ``dt`` holds object ``y``
computed from ``x``. Refresh 3 produces y3 from x1; refresh 4 produces y4
from x2. Finally T5 reads y3 *and* x2 — application-level read skew.
"""
from __future__ import annotations

from repro.isolation.history import Abort, Commit, Derive, History, Read, Write


def figure1_pts_history() -> History:
    """Figure 1: refreshes modeled as ordinary transactions (persisted table
    semantics). T3/T4 read x and write y; the refresh transactions *mask* the
    conflict, so the DSG is serializable despite the read skew T5 observes."""
    return History().add(
        Write("T1", "x", 1),
        Commit("T1"),
        Read("T3", "x", 1),
        Write("T3", "y", 3),
        Commit("T3"),
        Write("T2", "x", 2),
        Commit("T2"),
        Read("T4", "x", 2),
        Write("T4", "y", 4),
        Commit("T4"),
        Read("T5", "y", 3),
        Read("T5", "x", 2),
        Commit("T5"),
    )


def figure2_dvs_history() -> History:
    """Figure 2: the same events with refreshes expressed as *derivations*.

    The refresh transactions consist solely of derivations and drop out of
    the DSG; T5's read of y3 (which derives from x1) generates the
    anti-dependency T5 →rw→ T2, closing the cycle T2 →wr→ T5 →rw→ T2 (G2):
    the read skew is revealed.
    """
    return History().add(
        Write("T1", "x", 1),
        Commit("T1"),
        Derive("T3", "y", 3, (("x", 1),)),
        Commit("T3"),
        Write("T2", "x", 2),
        Commit("T2"),
        Derive("T4", "y", 4, (("x", 2),)),
        Commit("T4"),
        Read("T5", "y", 3),
        Read("T5", "x", 2),
        Commit("T5"),
    )


def aborted_base_history() -> History:
    """G1a through a derivation: a DT refresh derived from a version written
    by a transaction that later aborted, and a committed reader saw it."""
    return History().add(
        Write("T1", "x", 1),
        Derive("T2", "y", 1, (("x", 1),)),
        Commit("T2"),
        Read("T3", "y", 1),
        Commit("T3"),
        Abort("T1"),
    )


def intermediate_base_history() -> History:
    """G1b through a derivation: the refresh consumed an intermediate
    version (T1 wrote x twice; the derivation read the first)."""
    return History().add(
        Write("T1", "x", 1),
        Write("T1", "x", 2),
        Commit("T1"),
        Derive("T2", "y", 1, (("x", 1),)),
        Commit("T2"),
        Read("T3", "y", 1),
        Commit("T3"),
    )


# ---------------------------------------------------------------------------
# Theorem 1 / Corollary 2 transformations
# ---------------------------------------------------------------------------


def move_derivation(h: History, obj: str, version: int, to_txn: str, new_version: int) -> History:
    """Theorem 1's H → H' transformation: move the derivation of
    ``obj@version`` into ``to_txn`` as ``obj@new_version`` and redirect all
    reads of the old derived version to the new one. The theorem asserts H
    and H' have exactly the same dependencies."""
    out = History()
    committed_to = False
    for e in h.events:
        if isinstance(e, Derive) and e.obj == obj and e.version == version:
            out.add(Derive(to_txn, obj, new_version, e.sources))
            if not committed_to:
                out.add(Commit(to_txn))
                committed_to = True
        elif isinstance(e, Read) and e.obj == obj and e.version == version:
            out.add(Read(e.txn, obj, new_version))
        else:
            out.add(e)
    return out


def is_encapsulated(h: History, obj: str, version: int) -> bool:
    """Corollary 2: a derivation is encapsulated by its transaction if it
    only reads values written by that transaction and its value is only read
    within that transaction."""
    d = h.derivation(obj, version)
    if d is None:
        return False
    t = d.txn
    for (so, sv) in d.sources:
        if h.installer(so, sv) != t:
            return False
    for e in h.events:
        from repro.isolation.history import Read as _R

        if isinstance(e, _R) and e.obj == obj and e.version == version and e.txn != t:
            return False
    return True


def drop_derivation(h: History, obj: str, version: int) -> History:
    """Remove a derivation (and reads of its value inside the same txn) —
    legal without changing dependencies iff it is encapsulated."""
    d = h.derivation(obj, version)
    out = History()
    for e in h.events:
        if isinstance(e, Derive) and e.obj == obj and e.version == version:
            continue
        if isinstance(e, Read) and e.obj == obj and e.version == version and d and e.txn == d.txn:
            continue
        out.add(e)
    return out
