"""Benchmark for Table 1: dataset-statistics aggregation over a
paper-scale corpus (the Spark scan+agg behind every Table 1 row)."""
from pyspark.sql import functions as F


def test_bench_table1_stats(benchmark, professions_corpus_50k):
    corpus = professions_corpus_50k
    corpus.count()  # materialize cache outside the timed region

    def stats():
        return corpus.agg(
            F.count("sid").alias("sentences"),
            (100.0 * F.avg("label")).alias("pct_positives"),
        ).collect()

    row = benchmark(stats)[0]
    assert row["sentences"] == 50_000
    assert 0.8 < row["pct_positives"] < 1.5
