"""Deterministic dependency parser (SpaCy substitute).

Head-attachment rules over POS tags produce a single-rooted tree as a
parent-index array (``parent[i]`` is the head of token ``i``; the root
has parent ``-1``). The TreeMatch grammar (§2 Def 3) only needs stable
child/descendant relations between terminals, which any deterministic
tree over consistent tags provides (DESIGN.md §2).

Attachment scheme (simple but linguistically shaped):
- the root is the first main VERB, else the first AUX, else token 0;
- AUX/VERB attach to the root (clause chain);
- ADP attaches to the nearest VERB/AUX to its left (else root) and
  becomes the head of the following noun phrase;
- DET/ADJ/NUM/ADV attach to the next NOUN to the right (else root);
- NOUN/PRON attach to the nearest ADP to the left if one occurs after
  the previous verb, else to the root;
- everything else attaches to the previous token (else root).
"""
from __future__ import annotations

from repro.text.pos import tag


def parse(tokens: list[str], tags: list[str] | None = None) -> list[int]:
    """Return the parent-index array for ``tokens``."""
    n = len(tokens)
    if n == 0:
        return []
    tags = tags or tag(tokens)

    root = next((i for i, t in enumerate(tags) if t == "VERB"),
                next((i for i, t in enumerate(tags) if t == "AUX"), 0))
    parent = [root] * n
    parent[root] = -1

    last_verb = -1
    last_adp_after_verb = -1
    for i, t in enumerate(tags):
        if i == root:
            last_verb = i
            continue
        if t in ("VERB", "AUX"):
            parent[i] = root
            last_verb = i
            last_adp_after_verb = -1
        elif t == "ADP":
            parent[i] = last_verb if last_verb >= 0 else root
            last_adp_after_verb = i
        elif t in ("DET", "ADJ", "NUM", "ADV"):
            nxt = next((j for j in range(i + 1, n) if tags[j] == "NOUN"), root)
            parent[i] = nxt if nxt != i else root
        elif t in ("NOUN", "PRON"):
            parent[i] = last_adp_after_verb if last_adp_after_verb >= 0 else root
        else:
            parent[i] = i - 1 if i > 0 else root
    # A token must never head itself (possible when a modifier's NOUN
    # search lands back on it via the root fallback).
    for i in range(n):
        if parent[i] == i:
            parent[i] = root if i != root else -1
    return parent


def children_of(parent: list[int]) -> dict[int, list[int]]:
    """Adjacency (head → ordered child indices) for a parent array."""
    out: dict[int, list[int]] = {}
    for i, p in enumerate(parent):
        if p >= 0:
            out.setdefault(p, []).append(i)
    return out


def descendants_of(parent: list[int], i: int) -> set[int]:
    """All strict descendants of node ``i`` in the parent array."""
    kids = children_of(parent)
    out: set[int] = set()
    stack = list(kids.get(i, []))
    while stack:
        j = stack.pop()
        if j not in out:
            out.add(j)
            stack.extend(kids.get(j, []))
    return out


def is_tree(parent: list[int]) -> bool:
    """True iff ``parent`` encodes a single-rooted acyclic tree."""
    if not parent:
        return True
    if parent.count(-1) != 1:
        return False
    for i in range(len(parent)):
        seen = set()
        j = i
        while j != -1:
            if j in seen or not (-1 <= parent[j] < len(parent)):
                return False
            seen.add(j)
            j = parent[j]
    return True
