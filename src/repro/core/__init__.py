"""The paper's primary contribution: Dynamic Tables with delayed view
semantics, implemented as

- :mod:`repro.core.plan` — relational IR for DT defining queries
- :mod:`repro.core.compile` — IR → Spark DataFrame (full refresh plans)
- :mod:`repro.core.differentiation` — IR → delta DataFrame (§5.5 rewrite rules)
- :mod:`repro.core.refresh` — refresh actions, merge, production validations
- :mod:`repro.core.engine` — the DT engine: catalog, DAG, timestamps, DVS
"""
from repro.core import plan
from repro.core.engine import DTEngine, RefreshResult

__all__ = ["plan", "DTEngine", "RefreshResult"]
