"""Candidate-heuristic generation — Algorithm 2 (§3.2).

Greedy best-first descent through the index: start at the root ``*``,
repeatedly expose the children of the most recently selected heuristic
and pick the candidate with the highest coverage over the positives
discovered so far. Ties are broken by total corpus coverage (the index
count) and then lexically, keeping the run deterministic.

The diversity constraint the paper mentions ("avoid having to evaluate
many similar candidate heuristics") is realized by capping how many
selected candidates may share an identical positive-overlap signature.
"""
from __future__ import annotations

from repro.grammar.base import ROOT
from repro.index.inverted import HeuristicIndex


def generate_candidates(
    index: HeuristicIndex,
    positives: set[int],
    k: int,
    *,
    max_duplicate_signature: int = 3,
) -> list[str]:
    """Return up to ``k`` candidate heuristic keys (Algorithm 2)."""
    import heapq

    results: list[str] = []
    recent = ROOT
    seen: set[str] = {ROOT}
    # Min-heap on (-overlap, -count, key): CoverageSort is overlap with
    # P desc, then corpus coverage desc, then key asc (determinism).
    # P is fixed for the duration of the call, so each candidate's
    # priority is computed once, on insertion.
    heap: list[tuple[int, int, str]] = []
    sig_count: dict[frozenset[int], int] = {}

    while len(results) < k:
        for c in index.children(recent):
            if c not in seen:
                seen.add(c)
                overlap = len(index.coverage(c) & positives)
                heapq.heappush(heap, (-overlap, -index.count(c), c))
        if not heap:
            break
        _, _, best = heapq.heappop(heap)
        recent = best
        sig = frozenset(index.coverage(best) & positives)
        if sig_count.get(sig, 0) >= max_duplicate_signature:
            continue  # diversity cap: skip near-duplicate candidates
        sig_count[sig] = sig_count.get(sig, 0) + 1
        results.append(best)
    return results
