"""End-to-end tests of the ClaSS state machine (paper Algorithm 1)."""
import pickle

import numpy as np
import pytest

from repro.core.class_stream import ClaSS, ClaSSConfig


def _wave(kind, n, period, rng, noise=0.05):
    t = np.arange(n)
    base = {
        "sine": np.sin(2 * np.pi * t / period),
        "square": np.sign(np.sin(2 * np.pi * t / period)),
        "saw": 2 * ((t / period) % 1) - 1,
    }[kind]
    return base + noise * rng.standard_normal(n)


@pytest.mark.parametrize("pair,tol", [
    (("sine", 20, "square", 20), 150),
    (("sine", 20, "sine", 45), 150),
    (("square", 25, "saw", 25), 200),
])
def test_detects_planted_shape_change(pair, tol):
    rng = np.random.default_rng(42)
    k1, p1, k2, p2 = pair
    a = _wave(k1, 2500, p1, rng)
    b = _wave(k2, 2500, p2, rng)
    cls = ClaSS(ClaSSConfig(d=1000))
    cps = cls.run(np.concatenate([a, b]))
    assert len(cps) >= 1
    assert min(abs(c - 2500) for c in cps) <= tol
    # no spurious CP far from the truth
    assert all(abs(c - 2500) <= 400 for c in cps)


def test_multiple_change_points():
    rng = np.random.default_rng(7)
    segs = [_wave("sine", 2000, 20, rng), _wave("square", 2000, 30, rng),
            _wave("saw", 2000, 55, rng)]
    cls = ClaSS(ClaSSConfig(d=1000))
    cps = cls.run(np.concatenate(segs))
    assert len(cps) >= 2
    for truth in (2000, 4000):
        assert min(abs(c - truth) for c in cps) <= 200


def test_silent_on_stationary_noise():
    rng = np.random.default_rng(3)
    cls = ClaSS(ClaSSConfig(d=1000))
    assert cls.run(rng.standard_normal(5000)) == []


def test_silent_on_homogeneous_periodic():
    rng = np.random.default_rng(4)
    cls = ClaSS(ClaSSConfig(d=1000))
    assert cls.run(_wave("sine", 6000, 24, rng)) == []


def test_short_stream_below_d_yields_nothing():
    rng = np.random.default_rng(5)
    cls = ClaSS(ClaSSConfig(d=2000))
    assert cls.run(rng.standard_normal(1500)) == []
    assert cls.width is None  # warm-up never completed


def test_width_learned_once_after_warmup():
    rng = np.random.default_rng(6)
    cls = ClaSS(ClaSSConfig(d=500))
    cls.run(_wave("sine", 600, 20, rng))
    assert cls.width is not None
    assert 3 <= cls.width <= 125  # clamped to d/4


def test_explicit_width_is_respected():
    cls = ClaSS(ClaSSConfig(d=500, w=17))
    rng = np.random.default_rng(8)
    cls.run(rng.standard_normal(600))
    assert cls.width == 17


def test_pickle_roundtrip_matches_uninterrupted_run():
    """The Structured Streaming operator pickles the machine between
    micro-batches; a mid-stream pickle/unpickle must not change any
    detection."""
    rng = np.random.default_rng(9)
    series = np.concatenate([
        _wave("sine", 2000, 20, rng), _wave("square", 2000, 35, rng)])
    ref = ClaSS(ClaSSConfig(d=800))
    ref_cps = ref.run(series)

    cls = ClaSS(ClaSSConfig(d=800))
    for i, x in enumerate(series):
        cls.update(float(x))
        if i % 700 == 699:
            cls = pickle.loads(pickle.dumps(cls))
    assert cls.change_points == ref_cps


def test_change_points_strictly_increasing_and_in_range():
    rng = np.random.default_rng(10)
    segs = [_wave("sine", 1500, 18, rng), _wave("saw", 1500, 40, rng),
            _wave("square", 1500, 22, rng)]
    series = np.concatenate(segs)
    cls = ClaSS(ClaSSConfig(d=900))
    cps = cls.run(series)
    assert cps == sorted(cps)
    assert all(0 < c < len(series) for c in cps)


def test_stride_reduces_work_but_keeps_detection():
    rng = np.random.default_rng(11)
    series = np.concatenate([
        _wave("sine", 2500, 20, rng), _wave("square", 2500, 30, rng)])
    cls = ClaSS(ClaSSConfig(d=1000, stride=4))
    cps = cls.run(series)
    assert any(abs(c - 2500) <= 250 for c in cps)


def test_accuracy_score_variant_runs():
    rng = np.random.default_rng(12)
    series = np.concatenate([
        _wave("sine", 2500, 20, rng), _wave("square", 2500, 30, rng)])
    cls = ClaSS(ClaSSConfig(d=1000, score="accuracy"))
    cps = cls.run(series)
    assert any(abs(c - 2500) <= 250 for c in cps)
