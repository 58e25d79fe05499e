"""Keyword Sampling baseline (§4.1): an expert provides 10 keywords;
the corpus is filtered to sentences containing any of them; the budget
is spent labeling random sentences from the filtered pool; a classifier
is trained on those labels.
"""
from __future__ import annotations

import numpy as np

from repro.eval.metrics import precision_recall_f1


def keyword_filter(token_lists: list[list[str]], keywords: tuple[str, ...]) -> np.ndarray:
    """Ids of sentences containing at least one expert keyword."""
    kw = set(keywords)
    return np.array(
        [i for i, ts in enumerate(token_lists) if kw & set(ts)], dtype=np.int64
    )


def run_keyword_sampling(
    classifier,
    labels: np.ndarray,
    token_lists: list[list[str]],
    keywords: tuple[str, ...],
    *,
    budget: int = 100,
    eval_every: int = 5,
    threshold: float = 0.5,
    seed: int = 0,
) -> dict:
    """Label ``budget`` random sentences from the keyword-filtered pool."""
    labels = np.asarray(labels, dtype=np.int64)
    rng = np.random.default_rng(seed)
    pool = keyword_filter(token_lists, keywords)
    order = rng.permutation(pool)
    labeled: set[int] = set()
    history: list[dict] = []
    for q in range(1, budget + 1):
        if q - 1 >= len(order):
            break
        labeled.add(int(order[q - 1]))
        pos = {i for i in labeled if labels[i] == 1}
        neg = {i for i in labeled if labels[i] == 0}
        if pos and (q % eval_every == 0 or q == budget):
            classifier.fit(pos, neg or None)
            pred = classifier.scores() >= threshold
            p, r, f1 = precision_recall_f1(pred, labels)
            history.append({"query": q, "precision": p, "recall": r, "f1": f1})
    return {"labeled": labeled, "history": history}
