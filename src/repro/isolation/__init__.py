"""Delayed view semantics & transaction isolation (§4 of the paper).

An implementation of Adya's generalized isolation model extended with the
paper's *derivation* operation ``d_i(x_i | y_j, …)``:

- :mod:`repro.isolation.history` — events, histories, version orders, the
  derives-from closure
- :mod:`repro.isolation.dsg` — Direct Serialization Graphs with the
  derivation-extended read/anti/write dependencies
- :mod:`repro.isolation.phenomena` — G0, G1a, G1b, G1c, G2 detectors
- :mod:`repro.isolation.examples` — the paper's Figure 1 (persisted table
  semantics: serializable DSG hiding read skew) and Figure 2 (DVS:
  derivations expose the G2 cycle)
"""
from repro.isolation.history import Abort, Commit, Derive, History, Read, Write
from repro.isolation.dsg import DSG, Edge, build_dsg
from repro.isolation import phenomena
from repro.isolation import examples

__all__ = [
    "Abort",
    "Commit",
    "Derive",
    "History",
    "Read",
    "Write",
    "DSG",
    "Edge",
    "build_dsg",
    "phenomena",
    "examples",
]
