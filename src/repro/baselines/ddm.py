"""DDM — Drift Detection Method (Gama et al., SBIA 2004).

Monitors the error rate ``p`` of a model over a stream of binary errors
and its standard deviation ``s = sqrt(p(1-p)/n)``.  While learning, the
pair ``(p + s)`` decreases; DDM records the minimum ``p_min + s_min``
and signals drift when ``p + s`` rises ``drift_level`` standard
deviations above the recorded minimum (paper Table 2: O(1) update).

The paper tunes the "amount of issued drifts" parameter to 20 — the
``drift_level`` multiplier here (the classic default is 3); it is
re-tuned on the dev split for our corpus.  The binary error stream
comes from :class:`~repro.baselines.base.ErrorStream` (DESIGN.md S4),
which resets on drift so the model relearns the new concept.
"""
from __future__ import annotations

from repro.baselines.base import ErrorStream, StreamingDetector

__all__ = ["DDM"]


class DDM(StreamingDetector):
    def __init__(self, drift_level: float = 20.0, min_n: int = 30,
                 z_thresh: float = 2.0, excl: int = 30) -> None:
        super().__init__()
        self.drift_level = drift_level
        self.min_n = min_n
        self.excl = excl
        self.errors = ErrorStream(z_thresh=z_thresh)
        self._reset()
        self._last_cp = -10**18

    def _reset(self) -> None:
        self.n = 0
        self.p = 1.0
        self.s = 0.0
        self.psmin = float("inf")
        self.pmin = 1.0
        self.smin = 0.0

    def _step(self, x: float) -> int | None:
        e = self.errors.push(x)
        self.n += 1
        self.p += (e - self.p) / self.n
        self.s = (self.p * (1 - self.p) / self.n) ** 0.5
        if self.n < self.min_n:
            return None
        if self.p + self.s <= self.psmin:
            self.psmin = self.p + self.s
            self.pmin, self.smin = self.p, self.s
        if (self.p + self.s > self.pmin + self.drift_level * self.smin
                and self.pos - self._last_cp > self.excl):
            self._reset()
            self.errors.reset()
            self._last_cp = self.pos
            return self.pos
        return None
