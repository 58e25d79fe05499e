"""Traversal-strategy tests with a scripted classifier, pinning each
branch of Algorithms 3–5."""
import numpy as np
import pytest

from repro.core.classifier import ScriptedClassifier
from repro.core.hierarchy import Hierarchy
from repro.core.traversal import (
    STRATEGIES,
    HighC,
    HighP,
    HybridSearch,
    LocalSearch,
    UniversalSearch,
    avg_benefit,
    benefit,
)


@pytest.fixture()
def setup(toy_index):
    nodes = ["tr:a", "tr:b", "tr:a b", "tr:c", "tr:c d", "tr:d"]
    h = Hierarchy(nodes, toy_index)
    scores = np.array([0.9, 0.9, 0.9, 0.9, 0.9, 0.1, 0.1, 0.9, 0.1, 0.1])
    return h, scores


def test_benefit_excludes_covered(setup):
    h, scores = setup
    # cov('tr:a') = {0..4}; P = {0,1} → new = {2,3,4} each scored 0.9.
    assert benefit(h, "tr:a", {0, 1}, scores) == pytest.approx(2.7)
    assert avg_benefit(h, "tr:a", {0, 1}, scores) == pytest.approx(0.9)


def test_benefit_zero_when_fully_covered(setup):
    h, scores = setup
    assert benefit(h, "tr:a", {0, 1, 2, 3, 4}, scores) == 0.0
    assert avg_benefit(h, "tr:a", {0, 1, 2, 3, 4}, scores) == 0.0


def test_benefit_cache_consistent(setup):
    h, scores = setup
    a = benefit(h, "tr:b", set(), scores)
    b = benefit(h, "tr:b", set(), scores)
    assert a == b


def test_local_search_yes_adds_parents(setup):
    h, scores = setup
    ls = LocalSearch("tr:a b")
    ls.feedback("tr:a b", True, h)
    assert ls.cands == {"tr:a", "tr:b"}


def test_local_search_no_adds_children(setup):
    h, scores = setup
    ls = LocalSearch("tr:a")
    ls.feedback("tr:a", False, h)
    assert ls.cands == {"tr:a b"}


def test_local_search_selects_max_benefit(setup):
    h, scores = setup
    ls = LocalSearch("seed")
    ls.cands = {"tr:a", "tr:c"}
    # benefit(a)=4*0.9+0.1 vs benefit(c)=0.9+0.1 → picks 'tr:a'.
    assert ls.select(h, set(), scores, asked=set()) == "tr:a"


def test_local_search_skips_asked_and_refills(setup):
    h, scores = setup
    ls = LocalSearch("tr:a")
    # Neighborhood exhausted → refills with rules overlapping P.
    got = ls.select(h, {7}, scores, asked={"tr:a"})
    assert got in {"tr:c", "tr:c d", "tr:d"}


def test_local_search_returns_none_when_nothing_overlaps():
    from repro.index.inverted import HeuristicIndex

    idx = HeuristicIndex({"tr:x": frozenset({0})}, n_sentences=2)
    h = Hierarchy(["tr:x"], idx)
    ls = LocalSearch("tr:x")
    assert ls.select(h, {1}, np.array([0.5, 0.5]), asked={"tr:x"}) is None


def test_universal_filters_avg_benefit(setup):
    h, scores = setup
    us = UniversalSearch("seed")
    # 'tr:d' new = {7,9} avg (0.9+0.1)/2 = 0.5 → filtered (≤ 0.5).
    # 'tr:a' avg 0.9 passes and has the largest benefit.
    assert us.select(h, set(), scores, asked=set()) == "tr:a"


def test_universal_fallback_prefers_precision(setup):
    h, _ = setup
    low = np.full(10, 0.3)
    low[7] = 0.45
    us = UniversalSearch("seed")
    # Nothing passes 0.5 → falls back to argmax (avg, benefit):
    # 'tr:c d' covers {7} only → avg 0.45, the maximum.
    assert us.select(h, set(), low, asked=set()) == "tr:c d"


def test_universal_respects_asked(setup):
    h, scores = setup
    us = UniversalSearch("seed")
    first = us.select(h, set(), scores, asked=set())
    second = us.select(h, set(), scores, asked={first})
    assert second != first


def test_universal_none_when_exhausted(setup):
    h, scores = setup
    assert UniversalSearch("s").select(h, set(), scores, asked=set(h.nodes)) is None


def test_hybrid_starts_universal(setup):
    h, scores = setup
    hs = HybridSearch("tr:a b", tau=2)
    assert hs.universal_mode
    assert hs.select(h, set(), scores, asked=set()) == "tr:a"


def test_hybrid_switches_after_tau_failures(setup):
    h, scores = setup
    hs = HybridSearch("tr:a b", tau=2)
    for key in ("k1", "k2", "k3"):
        hs.feedback(key, False, h)
    assert not hs.universal_mode  # 3 failures > τ=2 → toggled
    assert hs.attempt == 0


def test_hybrid_yes_resets_attempts(setup):
    h, scores = setup
    hs = HybridSearch("tr:a b", tau=2)
    hs.feedback("tr:a", False, h)
    hs.feedback("tr:a b", True, h)
    assert hs.attempt == 0
    assert hs.universal_mode


def test_hybrid_toggles_when_mode_exhausted(setup):
    h, scores = setup
    hs = HybridSearch("tr:a", tau=5)
    got = hs.select(h, {7}, scores, asked=set(h.nodes))
    # Universal pool empty → toggles to local, which refills from
    # P-overlap but everything is asked → None.
    assert got is None
    assert not hs.universal_mode


def test_highp_picks_expected_precision(setup):
    h, scores = setup
    hp = HighP("seed")
    # mean score over full coverage: 'tr:a'=0.9 (5×0.9);
    # 'tr:c d'={7}→0.9; tie broken lexicographically → 'tr:a'.
    assert hp.select(h, set(), scores, asked=set()) == "tr:a"


def test_highc_ignores_scores_and_uses_whole_index(setup):
    h, scores = setup
    hc = HighC("seed")
    assert hc.select(h, set(), np.zeros(10), asked=set()) == "tr:a"  # count 5, lexical tie-break vs 'tr:b'
    # Next by count: 'tr:a b' (3) — drawn from the whole index even if
    # a curated hierarchy were smaller.
    assert hc.select(h, set(), np.zeros(10), asked={"tr:a", "tr:b"}) == "tr:a b"


def test_strategy_registry():
    assert set(STRATEGIES) == {"local", "universal", "hybrid", "highp", "highc"}


def test_scripted_classifier_counts_fits():
    sc = ScriptedClassifier(np.array([0.1, 0.9]))
    sc.fit({1})
    assert sc.fit_calls == 1
    assert np.allclose(sc.scores(), [0.1, 0.9])
    assert np.allclose(sc.scores(np.array([1])), [0.9])
