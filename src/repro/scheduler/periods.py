"""Canonical refresh periods (§5.2).

Snowflake defines canonical periods ``48·2^n`` seconds (integer ``n``) and,
for each DT, picks one that keeps the DT within its target lag, clamped to be
≥ every upstream period. Because powers of two divide each other and the
phase is constant per account, data timestamps of DTs with different periods
are guaranteed to align — the property the DVS same-timestamp constraint
relies on.
"""
from __future__ import annotations

import math
from graphlib import TopologicalSorter

#: Base of the canonical period grid (seconds).
CANONICAL_BASE = 48.0
#: Smallest supported exponent: 48·2⁻⁴ = 3 s ("support for lower values is in
#: early testing" — §3.2).
MIN_EXPONENT = -4
#: Largest exponent: 48·2¹² ≈ 2.3 days.
MAX_EXPONENT = 12


def canonical_periods() -> list[float]:
    """All canonical periods, ascending."""
    return [CANONICAL_BASE * 2**n for n in range(MIN_EXPONENT, MAX_EXPONENT + 1)]


def canonical_period_for(target_lag: float) -> float:
    """Largest canonical period with ``p ≤ target_lag / 2``.

    The ``/2`` leaves headroom for waiting time ``w`` and refresh duration
    ``d`` in the §5.2 constraint ``p + w + d < t``. The result is clamped into
    the canonical range, so very small targets map to the minimum period —
    matching the paper's observation that "the refresh period Snowflake
    chooses can be substantially smaller than the provided target lag".
    """
    if target_lag == float("inf"):
        return CANONICAL_BASE * 2**MAX_EXPONENT
    budget = max(target_lag, 0.0) / 2.0
    lo = CANONICAL_BASE * 2**MIN_EXPONENT
    if budget <= lo:
        return lo
    n = math.floor(math.log2(budget / CANONICAL_BASE))
    n = max(MIN_EXPONENT, min(MAX_EXPONENT, n))
    return CANONICAL_BASE * 2**n


def choose_periods(
    target_lags: dict[str, float], upstreams: dict[str, tuple[str, ...]]
) -> dict[str, float]:
    """Per-DT canonical periods with the upstream clamp.

    ``p[dt] = max(canonical(target), max(p[up]))`` in topological order —
    "we also ensure that the choice of refresh period for each DT is greater
    than or equal to those upstream" (§5.2). Since all values are canonical,
    the upstream period always divides the downstream period.
    """
    order = list(TopologicalSorter({n: set(upstreams.get(n, ())) for n in target_lags}).static_order())
    periods: dict[str, float] = {}
    for name in order:
        p = canonical_period_for(target_lags[name])
        for up in upstreams.get(name, ()):
            p = max(p, periods[up])
        periods[name] = p
    return periods
