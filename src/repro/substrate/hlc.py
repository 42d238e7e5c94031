"""Hybrid Logical Clock (Kulkarni et al. 2014), as used by Snowflake for
commit timestamps (§5.3 of the paper).

An HLC timestamp is a ``(physical, logical)`` pair. Timestamps are totally
ordered, never move backwards, and stay close to physical time. The paper
uses HLC commit timestamps to order table versions within an account; we use
them the same way in :mod:`repro.substrate.versioned_store`.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import total_ordering


@total_ordering
@dataclass(frozen=True)
class HLCTimestamp:
    """A totally ordered hybrid timestamp: physical seconds + logical counter."""

    physical: float
    logical: int

    def _key(self) -> tuple[float, int]:
        return (self.physical, self.logical)

    def __lt__(self, other: "HLCTimestamp") -> bool:
        return self._key() < other._key()

    def __eq__(self, other: object) -> bool:
        return isinstance(other, HLCTimestamp) and self._key() == other._key()

    def __hash__(self) -> int:
        return hash(self._key())


class HLC:
    """A hybrid logical clock driven by an external physical-time source.

    ``now`` is passed explicitly on every call so the clock composes with the
    simulated time used by the scheduler (the reproduction runs on simulated
    seconds, not wall-clock time).
    """

    def __init__(self) -> None:
        self._last = HLCTimestamp(float("-inf"), 0)

    @property
    def last(self) -> HLCTimestamp:
        """The most recent timestamp issued or observed."""
        return self._last

    def tick(self, now: float) -> HLCTimestamp:
        """Issue a new timestamp for a local event at physical time ``now``."""
        if now > self._last.physical:
            ts = HLCTimestamp(now, 0)
        else:
            ts = HLCTimestamp(self._last.physical, self._last.logical + 1)
        self._last = ts
        return ts

    def observe(self, remote: HLCTimestamp, now: float) -> HLCTimestamp:
        """Merge a timestamp received from another clock (causality merge)."""
        candidates = [
            HLCTimestamp(now, 0) if now > max(self._last.physical, remote.physical) else None,
            HLCTimestamp(self._last.physical, self._last.logical + 1),
            HLCTimestamp(remote.physical, remote.logical + 1),
        ]
        ts = max(c for c in candidates if c is not None)
        self._last = ts
        return ts
