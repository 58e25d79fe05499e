"""Tests for evaluation metrics."""
import numpy as np
import pytest

from repro.eval.metrics import coverage_of_ids, precision_of_ids, precision_recall_f1

TRUTH = np.array([1, 1, 1, 0, 0, 0, 0, 0])


def test_perfect_prediction():
    p, r, f1 = precision_recall_f1(TRUTH, TRUTH)
    assert (p, r, f1) == (1.0, 1.0, 1.0)


def test_no_predictions():
    p, r, f1 = precision_recall_f1(np.zeros(8), TRUTH)
    assert (p, r, f1) == (0.0, 0.0, 0.0)


def test_half_precision():
    pred = np.array([1, 1, 0, 1, 1, 0, 0, 0])
    p, r, f1 = precision_recall_f1(pred, TRUTH)
    assert p == pytest.approx(0.5)
    assert r == pytest.approx(2 / 3)
    assert f1 == pytest.approx(2 * 0.5 * (2 / 3) / (0.5 + 2 / 3))


def test_coverage_of_ids():
    assert coverage_of_ids({0, 1}, TRUTH) == pytest.approx(2 / 3)
    assert coverage_of_ids(set(), TRUTH) == 0.0
    assert coverage_of_ids({3, 4}, TRUTH) == 0.0


def test_coverage_no_positives():
    assert coverage_of_ids({0}, np.zeros(4)) == 0.0


def test_precision_of_ids():
    assert precision_of_ids({0, 3}, TRUTH) == pytest.approx(0.5)
    assert precision_of_ids(set(), TRUTH) == 0.0
    assert precision_of_ids({0, 1, 2}, TRUTH) == 1.0
