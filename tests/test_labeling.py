"""Tests for weak-label production, incl. Spark-vs-index agreement."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.labeling import apply_rules, dedupe_rules, label_matrix
from repro.index.inverted import HeuristicIndex
from repro.oracle import assert_equivalent


def test_label_matrix_shape_and_content(toy_index):
    L = label_matrix(toy_index, ["tr:a", "tr:c"], 10)
    assert L.shape == (10, 2)
    assert set(np.nonzero(L[:, 0])[0]) == set(toy_index.coverage("tr:a"))
    assert set(np.nonzero(L[:, 1])[0]) == set(toy_index.coverage("tr:c"))


def test_label_matrix_empty_rules(toy_index):
    L = label_matrix(toy_index, [], 10)
    assert L.shape == (10, 0)


def test_dedupe_drops_subset(toy_index):
    # cov('tr:a b') ⊂ cov('tr:a'), cov('tr:c d') ⊂ cov('tr:c').
    kept = dedupe_rules(toy_index, ["tr:a", "tr:a b", "tr:c", "tr:c d"])
    assert kept == ["tr:a", "tr:c"]


def test_dedupe_keeps_overlapping_non_subsets(toy_index):
    kept = dedupe_rules(toy_index, ["tr:a", "tr:b"])  # overlap but no containment
    assert kept == ["tr:a", "tr:b"]


def test_dedupe_drops_exact_duplicates():
    cov = {"tr:x": frozenset({1, 2}), "tr:y": frozenset({1, 2})}
    idx = HeuristicIndex(cov, 5)
    assert dedupe_rules(idx, ["tr:x", "tr:y"]) == ["tr:x"]


def test_apply_rules_matches_index(spark, prep_directions):
    """Distributed rule application and the inverted index must agree
    sentence-by-sentence (two independent code paths)."""
    prep = prep_directions
    rules = [prep.seed_rule_key(), "tr:shuttle"]
    out = apply_rules(prep.corpus_df, rules, prep.cfg).orderBy("sid")
    rows = out.collect()
    for j, rule in enumerate(rules):
        got = {r["sid"] for r in rows if r[f"rule_{j}"]}
        assert got == set(prep.index.coverage(rule)), rule


def test_apply_rules_weak_label_is_union(spark, prep_directions):
    prep = prep_directions
    rules = [prep.seed_rule_key(), "tr:shuttle"]
    out = apply_rules(prep.corpus_df, rules, prep.cfg)
    assert_equivalent(
        out.groupBy().agg(F.sum(F.col("weak_label").cast("int")).alias("n_weak")),
        "SELECT sum(CASE WHEN rule_0 OR rule_1 THEN 1 ELSE 0 END) AS n_weak FROM t",
        t=out,
    )


def test_apply_rules_precision_vs_truth(spark, prep_directions):
    """The seed rule's weak labels are ≥0.8 precise vs ground truth —
    checked through the Spark path with a DuckDB aggregation."""
    prep = prep_directions
    out = apply_rules(prep.corpus_df, [prep.seed_rule_key()], prep.cfg)
    assert_equivalent(
        out.filter("rule_0").groupBy().agg(
            F.count("*").alias("n"), F.sum("label").alias("n_pos")
        ),
        "SELECT count(*) AS n, sum(label) AS n_pos FROM t WHERE rule_0",
        t=out,
    )
    row = out.filter("rule_0").agg(F.avg("label")).collect()[0][0]
    assert row >= 0.8
