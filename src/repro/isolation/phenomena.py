"""Isolation phenomena G0–G2, generalized to derivations (§4 of the paper).

All but G1b keep Adya's definitions verbatim; derivations simply induce new
edge instances in the DSG. G1b additionally covers reads of values *deriving
from* an intermediate version.
"""
from __future__ import annotations

from repro.isolation.dsg import build_dsg
from repro.isolation.history import Derive, History, Read, Write


def g0_write_cycle(h: History) -> bool:
    """G0: a cycle of write-dependencies in the DSG."""
    return build_dsg(h).has_cycle({"ww"})


def g1a_aborted_read(h: History) -> bool:
    """G1a: a committed transaction read a value written (possibly through a
    derivation path) by an aborted transaction."""
    committed, aborted = h.committed(), h.aborted()
    for e in h.events:
        if isinstance(e, Read) and e.txn in committed:
            for (obj, ver) in h.base_writers_of(e.obj, e.version):
                w = h.installer(obj, ver)
                if w in aborted:
                    return True
    return False


def g1b_intermediate_read(h: History) -> bool:
    """G1b: a committed transaction read a version that is not the final one
    its writer installed for that object — or a value deriving from such an
    intermediate version (the paper's extension)."""
    committed = h.committed()

    def is_intermediate(obj: str, ver: int) -> bool:
        w = h.installer(obj, ver)
        if w is None:
            return False
        later = [
            e
            for e in h.events
            if isinstance(e, (Write, Derive)) and e.obj == obj and e.txn == w
        ]
        return bool(later) and later[-1].version != ver

    for e in h.events:
        if isinstance(e, Read) and e.txn in committed:
            if is_intermediate(e.obj, e.version):
                return True
            for (obj, ver) in h.derives_from(e.obj, e.version):
                if is_intermediate(obj, ver):
                    return True
    return False


def g1c_circular_information_flow(h: History) -> bool:
    """G1c: a cycle of only read- and write-dependencies."""
    return build_dsg(h).has_cycle({"ww", "wr"})


def g2_anti_dependency_cycle(h: History) -> bool:
    """G2: any DSG cycle (read-, write-, and anti-dependencies)."""
    return build_dsg(h).has_cycle({"ww", "wr", "rw"})


def serializable(h: History) -> bool:
    """PL-3: none of G0/G1/G2 (ignoring predicate variants)."""
    return not (
        g0_write_cycle(h)
        or g1a_aborted_read(h)
        or g1b_intermediate_read(h)
        or g1c_circular_information_flow(h)
        or g2_anti_dependency_cycle(h)
    )
