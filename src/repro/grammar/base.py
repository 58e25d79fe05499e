"""Heuristic-key algebra shared by all grammars.

A heuristic (Def 2) is identified by a flat string key with a grammar
prefix — ``"tr:best way to"`` (TokensRegex) or ``"tm:t=is/p=NOUN"``
(TreeMatch) — so the Spark sketch/index layer can treat every grammar
uniformly as (sid, key) pairs. ``ROOT`` is the ``'*'`` heuristic that
matches every sentence (the index root of §3.1).

Each grammar module supplies, for its keys:

- ``sketch(sentence) -> set[str]``: all keys the sentence satisfies up
  to the derivation-depth bound (the *derivation sketch* of §3.1);
- ``matches(key, sentence) -> bool``: direct evaluation, used by tests
  and by rule application on unindexed text;
- ``parents_of(key) -> list[str]``: keys one derivation step more
  general (superset coverage), defining the hierarchy of §3.2.
"""
from __future__ import annotations

ROOT = "*"

_PARENT_DISPATCH = {}


def register_grammar(prefix: str, parents_fn) -> None:
    """Register a grammar's ``parents_of`` under its key prefix."""
    _PARENT_DISPATCH[prefix] = parents_fn


def parents_of(key: str) -> list[str]:
    """Dispatch to the owning grammar; the root has no parents."""
    if key == ROOT:
        return []
    prefix = key.split(":", 1)[0]
    fn = _PARENT_DISPATCH.get(prefix)
    if fn is None:
        raise ValueError(f"unknown grammar prefix in key {key!r}")
    return fn(key)


def grammar_of(key: str) -> str:
    """The grammar prefix of a key ('tr', 'tm', or '*' for the root)."""
    return ROOT if key == ROOT else key.split(":", 1)[0]
