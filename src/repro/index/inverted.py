"""Inverted heuristic index (§3.1): counts + inverted lists, then a
driver-side structure with O(1) parent/child navigation.

Two layers:

1. :func:`index_df` — Spark aggregation of the sketch rows into
   ``(key, count, ids)``. This is the distributed merge of the
   per-sentence derivation sketches (the paper's index build, linear in
   corpus size and "highly parallelizable").
2. :class:`HeuristicIndex` — the collected (thresholded) index on the
   driver: ``key → frozenset(sid)`` plus a reverse-adjacency children
   map derived from each grammar's ``parents_of``. The interactive
   search loop (Algorithms 2–5) navigates this structure; Spark is the
   machinery that produced it.

For large corpora the collect is bounded two ways: ``min_count`` drops
singleton heuristics (never precise-and-useful at scale) and
``top_k`` keeps the most frequent keys (the paper caps candidate
generation at 10K candidates per iteration, §D).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.grammar.base import ROOT, parents_of


def index_df(
    sketch: DataFrame,
    *,
    min_count: int = 1,
    with_ids: bool = True,
    top_k: int | None = None,
) -> DataFrame:
    """Aggregate ``(sid, key)`` sketch rows into the inverted index.

    When thresholding (``min_count``/``top_k``) the build is two-phase:
    counts first, survivors selected, then a semi-join collects the
    inverted lists only for surviving keys. At 1M sentences the sketch
    holds ~10⁸ rows over tens of millions of distinct keys, most of
    them singletons — collecting their id-lists before filtering blows
    the heap.
    """
    counts = sketch.groupBy("key").agg(F.count("sid").alias("count"))
    if min_count > 1:
        counts = counts.filter(F.col("count") >= min_count)
    if top_k is not None:
        counts = counts.orderBy(F.desc("count"), "key").limit(top_k)
    if not with_ids:
        return counts
    return (
        sketch.join(counts.select("key"), "key")
        .groupBy("key")
        .agg(F.count("sid").alias("count"), F.collect_list("sid").alias("ids"))
    )


class HeuristicIndex:
    """Driver-side index over (a thresholded slice of) all heuristics."""

    def __init__(self, coverage: dict[str, frozenset[int]], n_sentences: int):
        self.n_sentences = n_sentences
        self._cov = coverage
        self._children: dict[str, list[str]] = {}
        for key in coverage:
            for p in parents_of(key):
                self._children.setdefault(p, []).append(key)
        for kids in self._children.values():
            kids.sort()  # determinism

    # -- construction -------------------------------------------------
    @classmethod
    def from_sketch(
        cls,
        sketch: DataFrame,
        n_sentences: int,
        *,
        min_count: int = 2,
        top_k: int | None = None,
    ) -> "HeuristicIndex":
        df = index_df(sketch, min_count=min_count, top_k=top_k)
        rows = df.collect()
        cov = {r["key"]: frozenset(r["ids"]) for r in rows}
        return cls(cov, n_sentences)

    # -- lookups -------------------------------------------------------
    def __contains__(self, key: str) -> bool:
        return key == ROOT or key in self._cov

    def __len__(self) -> int:
        return len(self._cov)

    def keys(self) -> list[str]:
        return list(self._cov)

    def coverage(self, key: str) -> frozenset[int]:
        """Sentence ids matching ``key`` (root covers everything)."""
        if key == ROOT:
            return frozenset(range(self.n_sentences))
        return self._cov.get(key, frozenset())

    def count(self, key: str) -> int:
        return self.n_sentences if key == ROOT else len(self._cov.get(key, ()))

    def children(self, key: str) -> list[str]:
        """Keys one derivation step stricter that exist in the corpus (O(1))."""
        return self._children.get(key, [])

    def parents(self, key: str) -> list[str]:
        """Keys one derivation step more general, restricted to the index."""
        return [p for p in parents_of(key) if p in self]
