"""Unit tests for the deterministic dependency parser."""
import pytest

from repro.text.depparse import children_of, descendants_of, is_tree, parse
from repro.text.pos import tag
from repro.text.tokenizer import word_tokens

SENTENCES = [
    "what is the best way to get to the airport ?",
    "is there a shuttle to the hotel ?",
    "smoking caused severe cancer last year",
    "composer beethoven wrote a famous symphony",
    "his job is teacher at the university",
    "the",
    "go",
    "the pool",
    "craving pizza right now",
    "can i take the bart from the hotel to downtown ?",
    "the report was reviewed by the journalist",
    "anyone want to grab tacos tonight ?",
]


@pytest.mark.parametrize("text", SENTENCES)
def test_parse_produces_valid_tree(text):
    toks = word_tokens(text)
    parent = parse(toks)
    assert len(parent) == len(toks)
    assert is_tree(parent)


@pytest.mark.parametrize("text", SENTENCES)
def test_parse_deterministic(text):
    toks = word_tokens(text)
    assert parse(toks) == parse(toks)


def test_empty_sentence():
    assert parse([]) == []
    assert is_tree([])


def test_root_is_first_verb():
    toks = word_tokens("the drought caused severe cancer")
    tags = tag(toks)
    parent = parse(toks, tags)
    root = parent.index(-1)
    assert toks[root] == "caused"


def test_root_fallback_aux():
    toks = word_tokens("is there a shuttle")
    parent = parse(toks)
    assert toks[parent.index(-1)] == "is"


def test_root_fallback_first_token():
    toks = ["the", "pool"]  # no verb, no aux
    parent = parse(toks)
    assert parent.index(-1) == 0


def test_children_of_inverts_parent():
    toks = word_tokens("composer beethoven wrote a famous symphony")
    parent = parse(toks)
    kids = children_of(parent)
    for head, cs in kids.items():
        for c in cs:
            assert parent[c] == head


def test_descendants_transitive():
    toks = word_tokens("what is the best way to get to the airport")
    parent = parse(toks)
    root = parent.index(-1)
    # Every non-root node is a descendant of the root.
    assert descendants_of(parent, root) == set(range(len(toks))) - {root}


def test_is_tree_rejects_cycle():
    assert not is_tree([1, 0])


def test_is_tree_rejects_two_roots():
    assert not is_tree([-1, -1])


def test_is_tree_rejects_self_loop():
    assert not is_tree([-1, 1])
