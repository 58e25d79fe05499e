"""Hierarchy-traversal strategies (§3.3–3.6, Algorithms 3–5) plus the
HighP/HighC baseline pickers of §4.3.

Shared vocabulary (§3.3): the *benefit* of heuristic ``r`` is
``Σ_{s ∈ C_r \\ P} p_s`` — the classifier's expected number of new
positives — and the *average benefit* is the same sum divided by
``|C_r \\ P|``. UniversalSearch drops candidates whose average benefit
is ≤ 0.5 ("majority of the instances in C_r are expected to be
negatives", Alg 4 line 8).

Each strategy exposes ``select(hierarchy, P, scores, asked)`` → key (or
``None`` when out of moves) and ``feedback(key, yes, hierarchy)``.
The Darwin driver owns the oracle budget and the asked-set.
"""
from __future__ import annotations

import numpy as np

from repro.core.hierarchy import Hierarchy


def _benefit_pair(hierarchy: Hierarchy, key: str, positives: set[int], scores: np.ndarray) -> tuple[float, float]:
    """(benefit, avg benefit), cached on the hierarchy instance.

    Valid because a Hierarchy is rebuilt whenever P (and hence the
    classifier scores) changes — within one instance both are frozen.
    """
    cache: dict[str, tuple[float, float]] = hierarchy.__dict__.setdefault("_benefit_cache", {})
    hit = cache.get(key)
    if hit is not None:
        return hit
    new = hierarchy.index.coverage(key) - positives
    if not new:
        out = (0.0, 0.0)
    else:
        vals = scores[np.fromiter(new, dtype=np.int64)]
        out = (float(vals.sum()), float(vals.mean()))
    cache[key] = out
    return out


def benefit(hierarchy: Hierarchy, key: str, positives: set[int], scores: np.ndarray) -> float:
    """Expected gain in P upon accepting ``key`` (§3.3)."""
    return _benefit_pair(hierarchy, key, positives, scores)[0]


def avg_benefit(hierarchy: Hierarchy, key: str, positives: set[int], scores: np.ndarray) -> float:
    """Benefit per *new* instance; 0 when the rule adds nothing."""
    return _benefit_pair(hierarchy, key, positives, scores)[1]


def _argmax(keys, score_fn) -> str | None:
    """Deterministic argmax (ties → lexicographically smallest key).
    ``score_fn`` may return a float or a comparable tuple."""
    best, best_s = None, None
    for k in sorted(keys):
        s = score_fn(k)
        if best_s is None or s > best_s:
            best, best_s = k, s
    return best


class LocalSearch:
    """Algorithm 3: explore the neighborhood of oracle-verified rules.

    YES → replace the rule with its parents (generalize); NO → with its
    children (specialize). Needs no precomputed hierarchy — neighbors
    come from the index on the fly (§3.4 "Efficient Implementation").
    """

    name = "local"

    def __init__(self, seed_rule: str):
        self.cands: set[str] = {seed_rule}

    def prime(self, keys) -> None:
        """Seed the neighborhood when Darwin starts from labeled
        sentences instead of a seed rule (Alg 1's alternative input)."""
        self.cands.update(keys)

    def select(self, hierarchy, positives, scores, asked) -> str | None:
        pool = [k for k in self.cands if k not in asked and k != "*"]
        if not pool:
            # Graph neighborhood exhausted (e.g. a unigram seed whose
            # only parent is the root): refill with candidates that are
            # local in *coverage* space — rules overlapping the
            # positives found so far.
            self.cands.update(
                k for k in hierarchy.nodes
                if k not in asked and hierarchy.index.coverage(k) & positives
            )
            pool = [k for k in self.cands if k not in asked and k != "*"]
            if not pool:
                return None
        return _argmax(pool, lambda k: benefit(hierarchy, k, positives, scores))

    def feedback(self, key, yes, hierarchy) -> None:
        self.cands.discard(key)
        self.cands.update(hierarchy.parents(key) if yes else hierarchy.children(key))


class UniversalSearch:
    """Algorithm 4: global argmax-benefit over the whole hierarchy,
    filtered by average benefit > 0.5. When the filter empties the pool
    we fall back to the unfiltered argmax so the budget is spent on
    oracle queries rather than silently burned (deviation from the
    pseudocode's query-count-on-skip; noted in EXPERIMENTS.md)."""

    name = "universal"

    def __init__(self, seed_rule: str):
        self.seed = seed_rule

    def select(self, hierarchy, positives, scores, asked) -> str | None:
        pool = [k for k in hierarchy.nodes if k not in asked]
        if not pool:
            return None
        passing = [
            k for k in pool if avg_benefit(hierarchy, k, positives, scores) > 0.5
        ]
        if passing:
            return _argmax(passing, lambda k: benefit(hierarchy, k, positives, scores))
        # Nothing clears the 0.5 bar (weak early classifier, §3.5's
        # noted failure mode): prefer expected precision over raw mass
        # so the budget is not burned on huge junk rules.
        return _argmax(
            pool,
            lambda k: (
                avg_benefit(hierarchy, k, positives, scores),
                benefit(hierarchy, k, positives, scores),
            ),
        )

    def prime(self, keys) -> None:
        pass

    def feedback(self, key, yes, hierarchy) -> None:  # stateless
        pass


class HybridSearch:
    """Algorithm 5: start in universal mode; after τ consecutive
    unsuccessful attempts switch modes, resetting the counter (τ=5 by
    default, §3.6). A YES resets the failure counter."""

    name = "hybrid"

    def __init__(self, seed_rule: str, *, tau: int = 5):
        self.local = LocalSearch(seed_rule)
        self.universal = UniversalSearch(seed_rule)
        self.universal_mode = True
        self.tau = tau
        self.attempt = 0

    def prime(self, keys) -> None:
        self.local.prime(keys)

    def _mode(self):
        return self.universal if self.universal_mode else self.local

    def select(self, hierarchy, positives, scores, asked) -> str | None:
        q = self._mode().select(hierarchy, positives, scores, asked)
        if q is None:  # current mode exhausted → toggle once
            self.universal_mode = not self.universal_mode
            self.attempt = 0
            q = self._mode().select(hierarchy, positives, scores, asked)
        return q

    def feedback(self, key, yes, hierarchy) -> None:
        # Both sub-strategies observe every answer so a mode switch
        # resumes from an informed state.
        self.local.feedback(key, yes, hierarchy)
        self.universal.feedback(key, yes, hierarchy)
        if yes:
            self.attempt = 0
        else:
            self.attempt += 1
            if self.attempt > self.tau:
                self.universal_mode = not self.universal_mode
                self.attempt = 0


class HighP:
    """§4.3 baseline: query the rule the classifier deems most precise
    (max mean score over its full coverage set) — tends to pick rules
    with very small coverage, as the paper observes."""

    name = "highp"

    def __init__(self, seed_rule: str):
        pass

    def prime(self, keys) -> None:
        pass

    def select(self, hierarchy, positives, scores, asked) -> str | None:
        pool = [k for k in hierarchy.nodes if k not in asked]
        if not pool:
            return None

        cache: dict[str, float] = hierarchy.__dict__.setdefault("_prec_cache", {})

        def expected_precision(k: str) -> float:
            if k in cache:
                return cache[k]
            cov = hierarchy.index.coverage(k)
            v = float(scores[np.fromiter(cov, dtype=np.int64)].mean()) if cov else 0.0
            cache[k] = v
            return v

        return _argmax(pool, expected_precision)

    def feedback(self, key, yes, hierarchy) -> None:
        pass


class HighC:
    """§4.3 baseline: query the maximum-coverage rule "irrespective of
    their expected precision" — over the *whole index*, not Darwin's
    curated candidates. Its suggestions are mostly rejected by the
    oracle, which is why the paper omits it from the plots."""

    name = "highc"

    def __init__(self, seed_rule: str):
        self._order: list[str] | None = None

    def prime(self, keys) -> None:
        pass

    def select(self, hierarchy, positives, scores, asked) -> str | None:
        if self._order is None:
            idx = hierarchy.index
            self._order = sorted(idx.keys(), key=lambda k: (-idx.count(k), k))
        for k in self._order:
            if k not in asked:
                return k
        return None

    def feedback(self, key, yes, hierarchy) -> None:
        pass


STRATEGIES = {
    "local": LocalSearch,
    "universal": UniversalSearch,
    "hybrid": HybridSearch,
    "highp": HighP,
    "highc": HighC,
}
