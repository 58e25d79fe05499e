"""Rule-based POS tagger (SpaCy substitute).

Universal-tagset-style tags assigned from a closed-class lexicon plus
suffix heuristics. TreeMatch only needs *consistent* tags — the same
word always gets the same tag — so a deterministic tagger preserves the
coverage-set semantics the search algorithms depend on (DESIGN.md §2).
"""
from __future__ import annotations

TAGS = ("NOUN", "VERB", "ADJ", "ADV", "ADP", "DET", "PRON", "AUX", "NUM", "PART", "PUNCT", "X")

_LEXICON: dict[str, str] = {}
for w in ("the", "a", "an", "this", "that", "these", "those", "some", "any"):
    _LEXICON[w] = "DET"
for w in ("i", "you", "he", "she", "it", "we", "they", "me", "us", "them",
          "there", "what", "which", "who", "where", "when", "how"):
    _LEXICON[w] = "PRON"
for w in ("is", "are", "was", "were", "be", "been", "am", "would", "will",
          "can", "could", "should", "may", "might", "do", "does", "did", "has", "have", "had"):
    _LEXICON[w] = "AUX"
for w in ("to", "from", "in", "on", "at", "by", "with", "for", "of", "near",
          "into", "about", "between", "after", "before", "around", "via"):
    _LEXICON[w] = "ADP"
for w in ("not", "n't", "'s"):
    _LEXICON[w] = "PART"
for w in ("very", "quite", "really", "here", "now", "soon", "fast", "also",
          "often", "usually", "please", "directly", "quickly"):
    _LEXICON[w] = "ADV"
for w in ("and", "or", "but", "if", "because", "so", "while", "whether"):
    _LEXICON[w] = "X"  # conjunctions folded into X for a compact tagset
for w in ("good", "best", "fastest", "cheapest", "nearest", "easiest",
          "great", "new", "old", "famous", "major", "severe", "late",
          "early", "happy", "local", "free"):
    _LEXICON[w] = "ADJ"
for w in ("get", "go", "take", "order", "check", "find", "book", "call",
          "need", "want", "ask", "play", "played", "plays", "wrote",
          "writes", "caused", "causes", "cause", "led", "leads", "made",
          "makes", "works", "worked", "work", "triggered", "triggers",
          "resulted", "results", "reach", "visit", "travel", "eat",
          "studied", "teaches", "taught", "performed", "performs",
          "composed", "toured", "recorded", "sang", "sings"):
    _LEXICON[w] = "VERB"

_ADJ_SUFFIX = ("ous", "ful", "ive", "able", "ible", "al", "ic", "est")
_ADV_SUFFIX = ("ly",)
_VERB_SUFFIX = ("ing", "ize", "ise")


def tag_word(word: str) -> str:
    """Tag a single (lower-case) token."""
    if word in _LEXICON:
        return _LEXICON[word]
    if word in "?.!,":
        return "PUNCT"
    if word.replace("'", "").isdigit():
        return "NUM"
    for suf in _ADV_SUFFIX:
        if word.endswith(suf) and len(word) > 3:
            return "ADV"
    for suf in _VERB_SUFFIX:
        if word.endswith(suf) and len(word) > 4:
            return "VERB"
    for suf in _ADJ_SUFFIX:
        if word.endswith(suf) and len(word) > 4:
            return "ADJ"
    if word.endswith("ed") and len(word) > 4:
        return "VERB"
    return "NOUN"


def tag(tokens: list[str]) -> list[str]:
    """Tag a token sequence. Pure and positionally independent."""
    return [tag_word(t) for t in tokens]
