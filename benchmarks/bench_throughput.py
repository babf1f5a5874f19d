"""Benchmark: Section 4.4 throughput — ClaSS kernels and end-to-end.

``test_bench_class_end_to_end`` corresponds to the paper's standalone
throughput (points/second = N / round time); the kernel benches isolate
the two bespoke components whose speed the paper's Section 4.4 runtime
breakdown credits (streaming k-NN updates, cross-validation scoring).
"""
import numpy as np
import pytest

from repro.core.class_stream import ClaSS, ClaSSConfig
from repro.core.scoring import cross_val_scores
from repro.core.streaming_knn import StreamingKNN
from repro.harness.throughput import _test_stream

N = 5000
SERIES, _ = _test_stream(N, seed=1)


def test_bench_class_end_to_end(benchmark):
    def run():
        cls = ClaSS(ClaSSConfig(d=1000))
        cls.run(SERIES)
        return cls

    cls = benchmark.pedantic(run, rounds=2, iterations=1)
    assert cls.width is not None


def test_bench_streaming_knn_updates(benchmark):
    d, w = 1000, 20
    knn = StreamingKNN(d, w, 3)
    for x in SERIES[:d]:
        knn.update(float(x))
    chunk = SERIES[d:d + 1000]

    def run():
        for x in chunk:
            knn.update(float(x))

    benchmark.pedantic(run, rounds=3, iterations=1)


def test_bench_cross_val_scoring(benchmark):
    rng = np.random.default_rng(0)
    m = 1000
    offsets = rng.integers(-50, m, size=(m, 3))
    result = benchmark(cross_val_scores, offsets)
    assert len(result) == m - 1


def test_bench_operator_roundtrip(benchmark, spark, tmp_path):
    """Structured Streaming operator throughput (paper: Flink ~1k pts/s)."""
    from repro.streaming.operator import run_file_stream, write_stream_chunks

    write_stream_chunks("b", SERIES, str(tmp_path / "in"), n_chunks=4)

    def run(i=[0]):
        i[0] += 1
        return run_file_stream(spark, str(tmp_path / "in"),
                               str(tmp_path / f"ckpt{i[0]}"), d=1000)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert not out.empty
