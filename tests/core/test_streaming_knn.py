"""Exactness tests for the streaming k-NN (paper Algorithm 2)."""
import numpy as np
import pytest

from repro.core.streaming_knn import (StreamingKNN, batch_knn,
                                      pairwise_pearson)


def _signals(n, seed=0):
    rng = np.random.default_rng(seed)
    t = np.arange(n)
    return {
        "noise": rng.standard_normal(n),
        "sine": np.sin(2 * np.pi * t / 17) + 0.05 * rng.standard_normal(n),
        "walk": np.cumsum(rng.standard_normal(n)),
        "mix": np.concatenate([
            np.sin(2 * np.pi * np.arange(n // 2) / 11),
            np.sign(np.sin(2 * np.pi * np.arange(n - n // 2) / 23)),
        ]) + 0.05 * rng.standard_normal(n),
    }


@pytest.mark.parametrize("signal", ["noise", "sine", "walk", "mix"])
@pytest.mark.parametrize("w,k", [(8, 1), (8, 3), (15, 3), (25, 5)])
def test_streaming_equals_batch_no_egress(signal, w, k):
    """While nothing egresses, every row must hold the exact top-k
    neighbours (correlations and indices) of the batch oracle."""
    T = _signals(180)[signal]
    s = StreamingKNN(d=400, w=w, k=k)
    for x in T:
        s.update(x)
    C_b, N_b = batch_knn(T, w, k)
    np.testing.assert_allclose(s.C, C_b, atol=1e-8)
    # Indices may differ only where correlations tie; require value
    # equality of the correlations implied by the chosen indices.
    assert s.N.shape == N_b.shape
    mism = s.relative_offsets() != N_b
    if mism.any():
        corr = pairwise_pearson(T, w)
        rows, cols = np.nonzero(mism)
        for j, c in zip(rows, cols):
            got = s.relative_offsets()[j, c]
            exp = N_b[j, c]
            assert got >= 0 and np.isclose(
                corr[j, got], corr[j, exp], atol=1e-8)


@pytest.mark.parametrize("w,k", [(8, 3), (15, 3)])
def test_newest_row_exact_after_egress(w, k):
    """With a sliding (full) window, the newest row must still be the
    exact top-k among in-window older candidates at every step."""
    T = _signals(300, seed=1)["mix"]
    d = 120
    s = StreamingKNN(d=d, w=w, k=k)
    for i, x in enumerate(T):
        s.update(x)
        m = s.n_subseqs
        if i < d + 10 or m < 3 * w:
            continue
        corr = pairwise_pearson(s.win, w)
        j = m - 1
        cand = np.arange(0, m - 1 - s.excl)
        if cand.size < k:
            continue
        best = np.sort(corr[j, cand])[::-1][:k]
        np.testing.assert_allclose(s.C[j], best, atol=1e-8)


def test_stored_correlations_consistent_after_egress():
    """Stored C entries must equal the recomputed correlation between
    the row and its stored neighbour whenever both are in-window."""
    T = _signals(260, seed=2)["sine"]
    w, k, d = 10, 3, 100
    s = StreamingKNN(d=d, w=w, k=k)
    for x in T:
        s.update(x)
    corr = pairwise_pearson(s.win, w)
    rel = s.relative_offsets()
    m = s.n_subseqs
    for j in range(m):
        for c in range(k):
            o = rel[j, c]
            if 0 <= o < m and np.isfinite(s.C[j, c]):
                assert np.isclose(s.C[j, c], corr[j, o], atol=1e-8)


def test_exclusion_zone_respected():
    T = _signals(200, seed=3)["sine"]
    w, k = 12, 3
    s = StreamingKNN(d=400, w=w, k=k)
    for x in T:
        s.update(x)
    rel = s.relative_offsets()
    m = s.n_subseqs
    for j in range(m):
        for o in rel[j]:
            if o >= 0:
                assert abs(o - j) > s.excl


def test_incremental_dot_products_exact():
    """The maintained Q must equal naive dot products at every step."""
    rng = np.random.default_rng(4)
    T = rng.standard_normal(120)
    w, d = 7, 50
    s = StreamingKNN(d=d, w=w, k=1)
    for i, x in enumerate(T):
        corr = s.update(x)
        if corr is None:
            continue
        win = s.win
        L = len(win)
        m = L - w + 1
        # After update, _q holds dot(win[i+1:i+w], win[L-w+1:L]).
        for j in range(m):
            expect = float(win[j + 1:j + w] @ win[L - w + 1:L])
            assert np.isclose(s._q[j], expect, atol=1e-8), (i, j)


def test_correlations_in_range_and_flat_handling():
    s = StreamingKNN(d=100, w=6, k=2)
    vals = np.concatenate([np.zeros(30), np.sin(np.arange(40))])
    last = None
    for x in vals:
        last = s.update(x)
    assert last is not None
    assert np.all(last <= 1.0 + 1e-12) and np.all(last >= -1.0 - 1e-12)
    assert np.isfinite(s.C[np.isfinite(s.C)]).all()


def test_window_capacity_and_positions():
    s = StreamingKNN(d=50, w=5, k=2)
    for i in range(130):
        s.update(float(i % 7))
    assert len(s.win) == 50
    assert s.pos == 130
    assert s.start_abs == 80
    assert s.n_subseqs == 46


@pytest.mark.parametrize("bad", [dict(d=10, w=2), dict(d=8, w=5)])
def test_invalid_params_raise(bad):
    with pytest.raises(ValueError):
        StreamingKNN(k=1, **bad)


def test_pairwise_pearson_matches_numpy_corrcoef():
    rng = np.random.default_rng(5)
    T = rng.standard_normal(60)
    w = 9
    corr = pairwise_pearson(T, w)
    m = len(T) - w + 1
    for i in range(0, m, 7):
        for j in range(0, m, 11):
            expect = np.corrcoef(T[i:i + w], T[j:j + w])[0, 1]
            assert np.isclose(corr[i, j], expect, atol=1e-8)
