"""Regime generators for the synthetic segmentation corpus.

Each ground-truth segment is drawn from one temporal-pattern *family*
(periodic shapes, pulse trains, autocorrelated or plain noise) with a
period and amplitude; a change point is a switch of family or a large
parameter change — the "state change of the observed process" of the
paper's Definition 5.  Families mimic the sensor modalities of the
paper's archives: sine/triangle (motion, respiration), square (device
states), Gaussian pulse trains (ECG beats), AR(1) (EEG-like coloured
noise), white noise (rest states).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

__all__ = ["Regime", "FAMILIES", "gen_segment", "sample_regime", "distinct_regime"]

FAMILIES = ("sine", "square", "sawtooth", "triangle", "pulse", "ar1", "noise")


@dataclass(frozen=True)
class Regime:
    """One latent process state: a pattern family plus its parameters."""

    family: str
    period: int = 25
    amplitude: float = 1.0
    param: float = 0.0  # family-specific (AR coefficient, pulse width...)


def gen_segment(regime: Regime, n: int, rng: np.random.Generator,
                noise: float = 0.1) -> np.ndarray:
    """Generate ``n`` points of the regime plus observation noise."""
    t = np.arange(n)
    p, a = regime.period, regime.amplitude
    f = regime.family
    if f == "sine":
        x = a * np.sin(2 * np.pi * t / p)
    elif f == "square":
        x = a * np.sign(np.sin(2 * np.pi * t / p))
    elif f == "sawtooth":
        x = a * (2 * ((t / p) % 1.0) - 1.0)
    elif f == "triangle":
        x = a * (2 * np.abs(2 * ((t / p) % 1.0) - 1.0) - 1.0)
    elif f == "pulse":
        # ECG-like: narrow Gaussian pulse once per period.
        width = max(1.0, regime.param or p / 12.0)
        phase = (t % p) - p / 2.0
        x = a * np.exp(-0.5 * (phase / width) ** 2)
    elif f == "ar1":
        phi = regime.param or 0.8
        e = rng.standard_normal(n)
        x = np.empty(n)
        acc = 0.0
        for i in range(n):
            acc = phi * acc + e[i]
            x[i] = acc
        x *= a * np.sqrt(max(1 - phi * phi, 1e-3))
    elif f == "noise":
        x = a * rng.standard_normal(n)
    else:
        raise ValueError(f"unknown family {regime.family!r}")
    return x + noise * rng.standard_normal(n)


def sample_regime(rng: np.random.Generator,
                  families: tuple[str, ...] = FAMILIES) -> Regime:
    f = str(rng.choice(families))
    period = int(rng.integers(15, 46))
    amp = float(rng.uniform(0.8, 2.0))
    param = {"ar1": float(rng.uniform(0.6, 0.95)),
             "pulse": float(rng.uniform(1.5, 4.0))}.get(f, 0.0)
    return Regime(f, period, amp, param)


def distinct_regime(prev: Regime, rng: np.random.Generator,
                    families: tuple[str, ...] = FAMILIES) -> Regime:
    """A regime guaranteed to differ from ``prev``: different family, or
    same family with a period ratio >= 1.6 (so the CP is detectable in
    principle, mirroring the curated benchmarks)."""
    for _ in range(100):
        cand = sample_regime(rng, families)
        if cand.family != prev.family:
            return cand
        ratio = max(cand.period, prev.period) / max(1, min(cand.period, prev.period))
        if ratio >= 1.6:
            return cand
    # Fall back: force a family switch.
    others = tuple(f for f in families if f != prev.family)
    return sample_regime(rng, others)
