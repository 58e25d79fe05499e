"""Unit tests for the deterministic tokenizer."""
import pytest

from repro.text.tokenizer import tokenize, word_tokens


@pytest.mark.parametrize(
    "text,expected",
    [
        ("What is the best way to SFO?", ["what", "is", "the", "best", "way", "to", "sfo", "?"]),
        ("Hello, world.", ["hello", ",", "world", "."]),
        ("", []),
        ("   ", []),
        ("a", ["a"]),
        ("don't stop", ["don't", "stop"]),
        ("room 101 please", ["room", "101", "please"]),
        ("UPPER lower MiXeD", ["upper", "lower", "mixed"]),
        ("twice  spaces", ["twice", "spaces"]),
        ("end!", ["end", "!"]),
    ],
)
def test_tokenize(text, expected):
    assert tokenize(text) == expected


@pytest.mark.parametrize(
    "text,expected",
    [
        ("What is this?", ["what", "is", "this"]),
        ("a, b. c!", ["a", "b", "c"]),
        ("no punct", ["no", "punct"]),
        ("", []),
    ],
)
def test_word_tokens_strips_punctuation(text, expected):
    assert word_tokens(text) == expected


def test_tokenize_idempotent_on_own_output():
    toks = tokenize("Is there a bart from SFO to the hotel?")
    assert tokenize(" ".join(toks)) == toks


def test_word_tokens_subset_of_tokenize():
    text = "Would Uber Eats be the fastest way to order?"
    assert set(word_tokens(text)) <= set(tokenize(text))
