"""End-to-end wiring: corpus spec → Spark corpus → sketch/index →
features → ready-to-run Darwin inputs.

This is the distributed-ETL part of the reproduction: corpus
annotation, derivation-sketch explosion, inverted-index aggregation and
embedding training all run as DataFrame transformations; the driver
receives the thresholded index, the feature matrix and the ground
truth needed to simulate the oracle.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core.classifier import EmbeddingClassifier
from repro.corpora.generator import CorpusSpec, build_corpus
from repro.grammar import tokensregex
from repro.index.inverted import HeuristicIndex
from repro.index.sketch import SketchConfig, sketch_df
from repro.text import embeddings as emb


@dataclass
class Prepared:
    """Everything Darwin and the baselines need for one corpus."""

    spec: CorpusSpec
    corpus_df: DataFrame
    index: HeuristicIndex
    features: np.ndarray          # (n, dim) sentence vectors, sid-ordered
    labels: np.ndarray            # ground truth, sid-ordered
    token_lists: list[list[str]]  # sid-ordered tokens (baselines, display)
    cfg: SketchConfig

    @property
    def n(self) -> int:
        return len(self.labels)

    def seed_rule_key(self) -> str:
        """The spec's default seed rule as an index key."""
        return tokensregex.key_of(self.spec.seed_rule)

    def make_classifier(self, seed: int = 0, **kwargs) -> EmbeddingClassifier:
        return EmbeddingClassifier(self.features, seed=seed, **kwargs)


def prepare(
    spark: SparkSession,
    spec: CorpusSpec,
    *,
    cfg: SketchConfig | None = None,
    min_count: int = 2,
    top_k: int | None = None,
    embedding: str = "word2vec",
    dim: int = emb.DEFAULT_DIM,
    partitions: int | None = None,
) -> Prepared:
    """Build and collect all per-corpus artifacts (see module docstring)."""
    cfg = cfg or SketchConfig(max_len=5)
    corpus = build_corpus(spark, spec, partitions=partitions).cache()

    index = HeuristicIndex.from_sketch(
        sketch_df(corpus, cfg), spec.n, min_count=min_count, top_k=top_k
    )

    rows = (
        corpus.select("sid", "label", "tokens").orderBy("sid").collect()
    )
    labels = np.array([r["label"] for r in rows], dtype=np.int64)
    token_lists = [list(r["tokens"]) for r in rows]

    if embedding == "word2vec":
        vocab = emb.word2vec_embeddings(corpus, dim=dim)
    else:
        vocab = emb.hashing_embeddings((t for ts in token_lists for t in ts), dim=dim)
    features = emb.combined_matrix(token_lists, vocab, dim)

    return Prepared(
        spec=spec,
        corpus_df=corpus,
        index=index,
        features=features,
        labels=labels,
        token_lists=token_lists,
        cfg=cfg,
    )
