"""Benchmark: Table 1 regeneration (corpus generation + statistics)."""
import pytest

from repro.datasets.archives import make_corpus, table1_stats


def test_bench_corpus_generation(benchmark):
    corpus = benchmark.pedantic(make_corpus, kwargs={"seed": 0},
                                rounds=3, iterations=1)
    assert len(corpus) == 79


def test_bench_table1_stats(benchmark):
    corpus = make_corpus()
    out = benchmark(table1_stats, corpus)
    assert len(out) == 8
