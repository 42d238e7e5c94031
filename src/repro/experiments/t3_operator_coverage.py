"""T3 — Incremental operator coverage over a Fig. 6-distributed population.

Paper claims (§6.3, Fig. 6):

- "almost 70% of active DTs have an incremental refresh mode, a fraction
  that grows as we add support for more operators";
- joins, aggregates, and window functions are common in incremental DT
  definitions.

We draw a population of defining queries from the Fig. 6 operator mix and
measure which fraction our differentiation framework covers (refresh mode
AUTO → INCREMENTAL), broken down by the §3.3.2 unsupported-operator reasons.
"""
from __future__ import annotations

from repro.experiments.common import render_table
from repro.workload.population import operator_coverage

PAPER_INCREMENTAL_SHARE = 0.70


def run(*, n_queries: int = 400, seed: int = 0) -> dict:
    cov = operator_coverage(n_queries, seed=seed)
    cov["paper_incremental_share"] = PAPER_INCREMENTAL_SHARE
    return cov


def format_table(result: dict) -> str:
    rows = [
        ["incremental share", f"{result['frac_incremental']:.1%}", "~70% (§6.3)"],
    ]
    for reason, n in sorted(result["unsupported_by_reason"].items()):
        rows.append([f"FULL-only: {reason}", str(n), "listed unsupported in §3.3.2"])
    t1 = render_table(
        f"T3: incremental coverage over {result['n_queries']} generated DTs",
        ["metric", "measured", "paper"],
        rows,
    )
    freq_rows = [[op, f"{f:.1%}"] for op, f in result["operator_frequency"].items()]
    t2 = render_table(
        "T3b: operator frequency in the generated population (cf. Fig. 6)",
        ["operator", "share of DTs"],
        freq_rows,
    )
    return t1 + "\n\n" + t2
