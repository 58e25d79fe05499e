"""Unit tests for the rule-based POS tagger."""
import pytest

from repro.text.pos import TAGS, tag, tag_word


@pytest.mark.parametrize(
    "word,expected",
    [
        ("the", "DET"), ("a", "DET"), ("this", "DET"),
        ("what", "PRON"), ("i", "PRON"), ("they", "PRON"),
        ("is", "AUX"), ("would", "AUX"), ("did", "AUX"),
        ("to", "ADP"), ("from", "ADP"), ("with", "ADP"),
        ("not", "PART"),
        ("very", "ADV"), ("quickly", "ADV"), ("really", "ADV"),
        ("best", "ADJ"), ("fastest", "ADJ"), ("famous", "ADJ"),
        ("get", "VERB"), ("caused", "VERB"), ("triggered", "VERB"),
        ("?", "PUNCT"), (".", "PUNCT"),
        ("42", "NUM"), ("101", "NUM"),
        ("hotel", "NOUN"), ("airport", "NOUN"), ("shuttle", "NOUN"),
        ("and", "X"), ("because", "X"),
    ],
)
def test_tag_word(word, expected):
    assert tag_word(word) == expected


@pytest.mark.parametrize(
    "word,expected",
    [
        ("walking", "VERB"),   # -ing suffix
        ("happily", "ADV"),    # -ly suffix
        ("gorgeous", "ADJ"),   # -ous suffix
        ("painted", "VERB"),   # -ed suffix
        ("blissful", "ADJ"),   # -ful suffix
    ],
)
def test_suffix_rules(word, expected):
    assert tag_word(word) == expected


def test_tag_sequence_positional_independence():
    toks = ["the", "shuttle", "to", "the", "airport"]
    assert tag(toks) == [tag_word(t) for t in toks]


def test_all_outputs_in_tagset():
    words = "the quick brown fox jumps over a lazy dog near sfo 12 ?".split()
    for t in tag(words):
        assert t in TAGS


def test_deterministic():
    toks = ["composer", "beethoven", "wrote", "a", "famous", "symphony"]
    assert tag(toks) == tag(toks)
