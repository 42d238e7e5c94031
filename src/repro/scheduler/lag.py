"""Lag measurement (§5.2, Figure 4).

Given a DT's sequence of refreshes, lag is a sawtooth rising at 1 s/s and
dropping when a refresh commits. The *trough* lag of refresh i is
``e_i − v_i`` (end time minus own data timestamp); the *peak* lag is
``e_i − v_{i−1}`` — until refresh i commits, the table is only as fresh as
the *preceding* data timestamp. Attainment is the fraction of peaks within
the target.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class RefreshSpan:
    """One committed refresh: data timestamp, wall-clock start/end, action."""

    data_ts: float
    start: float
    end: float
    action: str
    changed_rows: int = 0

    @property
    def p_w_d(self) -> tuple[float, float, float]:
        """The §5.2 decomposition for this refresh: (period p is computed
        across spans, so only w and d are local): w = start − data_ts,
        d = end − start."""
        return (float("nan"), self.start - self.data_ts, self.end - self.start)


def trough_lags(spans: list[RefreshSpan]) -> list[float]:
    """``e_i − v_i`` per refresh."""
    return [s.end - s.data_ts for s in spans]


def peak_lags(spans: list[RefreshSpan], *, initial_data_ts: float | None = None) -> list[float]:
    """``e_i − v_{i−1}`` per refresh (the sawtooth peaks of Figure 4)."""
    out = []
    prev = initial_data_ts if initial_data_ts is not None else (spans[0].data_ts if spans else 0.0)
    for s in spans:
        out.append(s.end - prev)
        prev = s.data_ts
    return out


def attainment(spans: list[RefreshSpan], target_lag: float, *, initial_data_ts: float | None = None) -> float:
    """Fraction of sawtooth peaks within the target lag (1.0 if no refreshes)."""
    peaks = peak_lags(spans, initial_data_ts=initial_data_ts)
    if not peaks:
        return 1.0
    return sum(1 for p in peaks if p <= target_lag) / len(peaks)


def max_peak_lag(spans: list[RefreshSpan], *, initial_data_ts: float | None = None) -> float:
    peaks = peak_lags(spans, initial_data_ts=initial_data_ts)
    return max(peaks) if peaks else 0.0
