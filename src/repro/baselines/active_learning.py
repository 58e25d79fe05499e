"""Active Learning baseline (§4.1): entropy sampling with per-query
retraining. Each oracle query labels a *single sentence* (vs Darwin's
rule-level queries), which is why AL's curves are jittery and slow in
Fig 9 — it accumulates a handful of labels where Darwin accumulates
whole coverage sets.
"""
from __future__ import annotations

import numpy as np

from repro.eval.metrics import precision_recall_f1


def run_active_learning(
    classifier,
    labels: np.ndarray,
    *,
    seed_ids: list[int],
    budget: int = 100,
    eval_every: int = 5,
    threshold: float = 0.5,
) -> dict:
    """Entropy-sampling AL; returns the queried ids and the F1 trace."""
    labels = np.asarray(labels, dtype=np.int64)
    n = len(labels)
    labeled: set[int] = set(int(i) for i in seed_ids)
    history: list[dict] = []

    def _retrain():
        pos = {i for i in labeled if labels[i] == 1}
        neg = {i for i in labeled if labels[i] == 0}
        if pos:
            classifier.fit(pos, neg or None)
        return classifier.scores()

    scores = _retrain()
    for q in range(1, budget + 1):
        # Highest-entropy unlabeled instance == score closest to 0.5.
        unl = np.array([i for i in range(n) if i not in labeled], dtype=np.int64)
        if len(unl) == 0:
            break
        pick = int(unl[np.argmin(np.abs(scores[unl] - 0.5))])
        labeled.add(pick)
        scores = _retrain()
        if q % eval_every == 0 or q == budget:
            pred = scores >= threshold
            p, r, f1 = precision_recall_f1(pred, labels)
            history.append({"query": q, "precision": p, "recall": r, "f1": f1})
    return {"labeled": labeled, "history": history}
