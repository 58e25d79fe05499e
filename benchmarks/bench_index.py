"""Benchmark for the §3.1 index build: derivation-sketch explosion +
distributed inverted-index aggregation + thresholded collect.

This is the pipeline the paper reports as "<5 minutes for all datasets";
EXPERIMENTS.md records our measured time next to that claim.
"""
from repro.corpora.datasets import directions
from repro.corpora.generator import build_corpus
from repro.index.inverted import HeuristicIndex
from repro.index.sketch import SketchConfig, sketch_df


def test_bench_index_build_15k(benchmark, spark):
    corpus = build_corpus(spark, directions()).cache()
    n = corpus.count()  # materialize outside the timed region

    def build():
        sk = sketch_df(corpus, SketchConfig(max_len=5, max_gap=3))
        return HeuristicIndex.from_sketch(sk, n, min_count=2)

    idx = benchmark.pedantic(build, rounds=3, iterations=1)
    assert len(idx) > 5_000
