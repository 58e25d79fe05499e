"""Benchmark fixtures: paper-scale prepared corpora, built once."""
from __future__ import annotations

import pytest

from repro.corpora.datasets import directions, professions
from repro.corpora.generator import build_corpus
from repro.eval.pipeline import prepare


@pytest.fixture(scope="session")
def prep_directions_full(spark):
    """directions at the paper's 15.3K sentences."""
    return prepare(spark, directions())


@pytest.fixture(scope="session")
def professions_corpus_50k(spark):
    """professions at the default 50K scale (1M lives in jobs/scale_1m.py)."""
    return build_corpus(spark, professions()).cache()
