"""Deterministic whitespace/punctuation tokenizer.

The whole pipeline (sketch generation, POS tagging, parsing, rule
matching) must agree on token boundaries, so there is exactly one
tokenizer and it is pure (no state, no randomness).
"""
from __future__ import annotations

import re

_TOKEN_RE = re.compile(r"[a-z0-9']+|[?.!,]")


def tokenize(text: str) -> list[str]:
    """Lower-case and split into word / punctuation tokens.

    >>> tokenize("What is the best way to SFO?")
    ['what', 'is', 'the', 'best', 'way', 'to', 'sfo', '?']
    """
    return _TOKEN_RE.findall(text.lower())


def word_tokens(text: str) -> list[str]:
    """Tokens with sentence-final punctuation stripped (rule alphabet).

    Labeling rules in the paper match phrases of *words*; punctuation is
    noise for both grammars, so sketches are built over these tokens.
    """
    return [t for t in tokenize(text) if t not in "?.!,"]
