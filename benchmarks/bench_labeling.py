"""Benchmark for distributed weak-label production: rule application as
a DataFrame transformation over the 50K professions corpus (the repro
band's distributed_dataflow path, scaled ×20 by jobs/scale_1m.py)."""
from pyspark.sql import functions as F

from repro.core.labeling import apply_rules
from repro.grammar import tokensregex as tr


RULES = [
    tr.key_of(("works", "as", "a")),
    tr.key_of(("is", "a")),
    tr.key_of(("job",)),
    tr.key_of(("hired", "a", "new")),
]


def test_bench_apply_rules_50k(benchmark, professions_corpus_50k):
    corpus = professions_corpus_50k
    corpus.count()

    def label():
        out = apply_rules(corpus, RULES)
        return out.agg(F.sum(F.col("weak_label").cast("long"))).collect()[0][0]

    n_weak = benchmark.pedantic(label, rounds=3, iterations=1)
    assert n_weak > 100
