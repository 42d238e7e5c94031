"""Refresh scheduling (§5.2): canonical periods ``48·2^n``, the lag
sawtooth (p + w + d < t), and a simulated-time scheduler with the skip /
error / suspend behaviour of §3.3.3."""
from repro.scheduler.periods import CANONICAL_BASE, canonical_period_for, choose_periods
from repro.scheduler.lag import RefreshSpan, attainment, peak_lags, trough_lags
from repro.scheduler.scheduler import (
    DTSpec,
    EngineExecutor,
    ModelExecutor,
    Scheduler,
    SKIPPED_BUSY,
    SKIPPED_UPSTREAM,
)

__all__ = [
    "CANONICAL_BASE",
    "canonical_period_for",
    "choose_periods",
    "RefreshSpan",
    "attainment",
    "peak_lags",
    "trough_lags",
    "DTSpec",
    "EngineExecutor",
    "ModelExecutor",
    "Scheduler",
    "SKIPPED_BUSY",
    "SKIPPED_UPSTREAM",
]
