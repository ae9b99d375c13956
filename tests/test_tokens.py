"""Unit tests for tokenization and morphological normalization."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.text.tokens import (
    STOPWORDS,
    acronym_of,
    content_tokens,
    morph_normalize,
    tokenize,
)


@pytest.mark.parametrize(
    "phrase, toks",
    [
        ("University of Maryland", ["university", "of", "maryland"]),
        ("UMD", ["umd"]),
        ("be a member of", ["be", "a", "member", "of"]),
        ("  spaced   out  ", ["spaced", "out"]),
        ("hyphen-ated word", ["hyphen", "ated", "word"]),
        ("", []),
        ("42 things", ["42", "things"]),
        ("Warren Buffett", ["warren", "buffett"]),
    ],
)
def test_tokenize(phrase, toks):
    assert tokenize(phrase) == toks


@pytest.mark.parametrize(
    "phrase, toks",
    [
        ("University of Maryland", ["university", "maryland"]),
        ("be a member of", ["member"]),
        ("the big apple", ["big", "apple"]),
        ("was born in", ["born", "in"]),  # prepositions are content
        ("to be or not to be", ["or", "not"]),
    ],
)
def test_content_tokens(phrase, toks):
    assert content_tokens(phrase) == toks


@pytest.mark.parametrize(
    "phrase, toks",
    [
        ("members", ["member"]),
        ("kabas in", ["kaba", "in"]),
        ("founded companies", ["found", "compani"]),
        ("working", ["work"]),
    ],
)
def test_content_tokens_stemmed(phrase, toks):
    assert content_tokens(phrase, stem=True) == toks


@pytest.mark.parametrize(
    "phrase, norm",
    [
        ("be a member of", "member"),
        # the paper's Fig. 1 maps these two to one relation; "early" is
        # a modifier and modifiers are stripped
        ("be an early member of", "member"),
        ("members", "member"),
        ("running fast", "runn fast"),
        ("the", "the"),  # all-stopword phrases fall back to raw tokens
        ("is", "is"),
    ],
)
def test_morph_normalize(phrase, norm):
    assert morph_normalize(phrase) == norm


def test_morph_normalize_never_empty():
    for phrase in ["a", "the", "of", "is the", "be"]:
        assert morph_normalize(phrase) != ""


@pytest.mark.parametrize(
    "phrase, acro",
    [
        ("university of maryland", "um"),
        ("warren buffett", "wb"),
        ("be a member of", "m"),
    ],
)
def test_acronym_of(phrase, acro):
    assert acronym_of(phrase) == acro


def test_stopwords_contains_core_function_words():
    for w in ["a", "an", "the", "of", "be", "is", "was"]:
        assert w in STOPWORDS
    # relational prepositions are deliberately NOT stopwords
    for w in ["in", "on", "at", "with"]:
        assert w not in STOPWORDS


@given(st.text(max_size=50))
def test_tokenize_total(s):
    toks = tokenize(s)
    assert all(t == t.lower() for t in toks)
    assert all(t for t in toks)


@given(st.text(max_size=50))
def test_morph_normalize_shape(s):
    n = morph_normalize(s)
    assert n == n.lower()
    assert "  " not in n
    assert n == n.strip()


@given(st.text(alphabet="abcdefgh ", min_size=1, max_size=30))
def test_content_tokens_subset_of_tokens(s):
    assert set(content_tokens(s)) <= set(tokenize(s))
