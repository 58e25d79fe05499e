"""Benchmark for Table 2: the Darwin(HS) interactive loop plus the
snorkel-lite label model on the paper-scale directions corpus."""
import numpy as np

from repro.core.darwin import run_darwin
from repro.core.labeling import dedupe_rules, label_matrix
from repro.core.oracle_sim import GroundTruthOracle
from repro.eval.metrics import coverage_of_ids
from repro.snorkel_lite.label_model import LabelModel


def test_bench_darwin_hybrid(benchmark, prep_directions_full):
    prep = prep_directions_full

    def run():
        return run_darwin(
            prep.index,
            prep.make_classifier(),
            GroundTruthOracle(prep.labels),
            seed_rule=prep.seed_rule_key(),
            budget=100,
            strategy="hybrid",
            true_labels=prep.labels,
        )

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert coverage_of_ids(res.positives, prep.labels) > 0.6


def test_bench_label_model(benchmark, prep_directions_full):
    prep = prep_directions_full
    res = run_darwin(
        prep.index,
        prep.make_classifier(),
        GroundTruthOracle(prep.labels),
        seed_rule=prep.seed_rule_key(),
        budget=100,
        strategy="hybrid",
    )
    L = label_matrix(prep.index, dedupe_rules(prep.index, res.rules), prep.n)

    lm = benchmark(lambda: LabelModel().fit(L))
    assert 0 < lm.pi < 1
