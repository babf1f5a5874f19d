"""Benchmark: Table 3 — the per-series segmentation+scoring pipeline.

One benchmark per method: stream a fixed 2-CP series through the
detector and compute its Covering, i.e. exactly one cell's worth of the
Table 3 workload (the full table is this, fanned out over the corpus by
Spark — see jobs/table3_covering.py).
"""
import numpy as np
import pytest

from repro.baselines.base import make_detector
from repro.harness.throughput import _test_stream
from repro.metrics.covering import covering

PARAMS = {
    "class": {"d": 1000},
    "floss": {"d": 1000, "w": 25},
    "window": {"w": 25, "threshold": 0.2},
    "changefinder": {"threshold": 2.0},
    "newma": {"w": 25},
    "bocd": {"drop_threshold": 150},
    "ddm": {"drift_level": 3.0},
    "hddm": {"drift_confidence": 1e-10},
    "adwin": {"delta": 0.01},
}

SERIES, TRUE_CPS = _test_stream(5000, seed=0)


@pytest.mark.parametrize("method", sorted(PARAMS))
def test_bench_series_covering(benchmark, method):
    def run():
        det = make_detector(method, **PARAMS[method])
        cps = det.run(SERIES)
        return covering(TRUE_CPS, cps, len(SERIES))

    score = benchmark.pedantic(run, rounds=2, iterations=1)
    assert 0.0 <= score <= 1.0
