"""ClaSS — Classification Score Stream (paper Algorithm 1).

The per-point state machine: maintain the streaming k-NN over the
sliding window, score every hypothetical split of the unsegmented window
suffix with self-supervised cross-validation, and report the global
profile maximum as a change point when the Wilcoxon rank-sum test on the
predicted labels is significant.

The object is deliberately free of any Spark dependency so the same
state machine drives the standalone evaluation (paper Section 4.3), the
batch-parallel ``applyInPandas`` harness, and the Structured Streaming
stateful operator (the paper's Flink window operator, Section 4.4) — it
is picklable between micro-batches.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.scoring import cross_val_scores, split_label_counts
from repro.core.significance import resampled_rank_sum_test
from repro.core.streaming_knn import StreamingKNN
from repro.core.suss import learn_width

__all__ = ["ClaSS", "ClaSSConfig"]


@dataclass
class ClaSSConfig:
    """Hyper- and model-parameters of ClaSS (paper Section 4.2 defaults).

    ``d`` is the only true hyper-parameter (sliding window size); ``w``
    is learned from the first ``d`` observations unless given.
    """

    d: int = 10_000
    k: int = 3
    w: int | None = None              # None -> learn via `wss` on warm-up
    wss: str = "suss"
    score: str = "f1"
    p_threshold: float = 1e-50
    sample_size: int | None = 1000
    seed: int = 2357
    # CP candidates must keep `excl_factor * w` subsequences on each
    # side of the split.  The ClaSP family uses an exclusion radius of
    # 5 subsequence widths around candidate CPs; without it, the first
    # few rows (whose neighbours are biased to low offsets while the
    # k-NN warms up) manufacture statistically significant but
    # meaningless splits right at the region border.
    excl_factor: int = 5
    # Score the window only every `stride` points (1 = paper-exact).
    stride: int = 1
    w_lbound: int = 10
    w_ubound: int | None = None       # None -> d // 10


@dataclass
class ClaSS:
    """Streaming segmentation state machine.

    Call :meth:`update` once per arriving value; it returns the absolute
    stream position of a newly detected change point, or ``None``.
    """

    config: ClaSSConfig = field(default_factory=ClaSSConfig)

    def __post_init__(self) -> None:
        cfg = self.config
        self._warmup: list[float] = []
        self._knn: StreamingKNN | None = None
        self._w: int | None = cfg.w
        # Window-relative subsequence index where the unsegmented region
        # starts (the last CP); 0 = the whole window is unsegmented.
        self._region_start = 0
        self._pos = 0
        self._rng = np.random.default_rng(cfg.seed)
        self._pending_cp: int | None = None
        self.change_points: list[int] = []

    # ------------------------------------------------------------------
    @property
    def width(self) -> int | None:
        """The learned (or configured) subsequence width."""
        return self._w

    def run(self, series: np.ndarray) -> list[int]:
        """Convenience: stream a finite series, return all CPs."""
        for x in np.asarray(series, dtype=np.float64):
            self.update(float(x))
        return list(self.change_points)

    # ------------------------------------------------------------------
    def update(self, x: float) -> int | None:
        cfg = self.config
        if self._knn is None:
            # Warm-up: buffer the first d points, learn w, then replay
            # them through the pipeline (paper Section 3.4: "processes
            # the stream from the first observation onward").
            self._warmup.append(float(x))
            if len(self._warmup) < cfg.d:
                return None
            sample = np.asarray(self._warmup, dtype=np.float64)
            if self._w is None:
                ubound = cfg.w_ubound or max(cfg.w_lbound + 1, cfg.d // 10)
                self._w = max(3, learn_width(
                    sample, method=cfg.wss,
                    lbound=cfg.w_lbound, ubound=ubound))
            self._w = min(self._w, max(3, cfg.d // 4))
            self._knn = StreamingKNN(cfg.d, self._w, cfg.k)
            cp = None
            for v in self._warmup:
                got = self._ingest(v)
                if got is not None:
                    cp = got  # only the latest matters for the caller
            self._warmup = []
            return cp
        return self._ingest(float(x))

    # ------------------------------------------------------------------
    def _ingest(self, x: float) -> int | None:
        cfg = self.config
        knn = self._knn
        assert knn is not None and self._w is not None
        w = self._w
        at_capacity = len(knn.win) == knn.d
        knn.update(x)
        self._pos += 1
        if at_capacity and self._region_start > 0:
            # Account for the shift of the window (paper Alg. 1 line 6).
            self._region_start -= 1
        m_total = knn.n_subseqs
        region = m_total - self._region_start
        # Valid splits keep excl_factor*w subsequences on both sides.
        margin = cfg.excl_factor * w
        valid_lo, valid_hi = margin, region - margin  # s in [lo, hi]
        if valid_hi < valid_lo or m_total < 2:
            return None
        if cfg.stride > 1 and self._pos % cfg.stride:
            return None

        offsets = knn.relative_offsets()[self._region_start:]
        offsets = offsets - self._region_start  # region-relative
        profile = cross_val_scores(offsets, score=cfg.score)
        if profile.size == 0:
            return None
        window_scores = profile[valid_lo - 1:valid_hi]
        if window_scores.size == 0:
            return None
        s_best = valid_lo + int(np.argmax(window_scores))

        l0, l1, r0, r1 = split_label_counts(offsets, s_best)
        p = resampled_rank_sum_test(
            l0, l1, r0, r1, sample_size=cfg.sample_size, rng=self._rng)
        if p > cfg.p_threshold:
            return None
        # CP in window time coordinates: region_start + s + w - 1
        cp_window = self._region_start + s_best + w - 1
        cp_abs = knn.start_abs + cp_window
        self._region_start = cp_window
        self.change_points.append(cp_abs)
        return cp_abs
