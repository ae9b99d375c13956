"""Unit tests for the string similarity measures."""
import math

import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.text.similarity import (
    idf_token_overlap,
    jaro,
    jaro_winkler,
    levenshtein,
    levenshtein_sim,
    ngram_jaccard,
    ngrams,
)

WORDS = st.text(alphabet="abcdef", min_size=0, max_size=12)


# ----------------------------------------------------- IDF token overlap

def test_idf_overlap_identical():
    freq = {"warren": 2, "buffett": 3}
    assert idf_token_overlap("warren buffett", "warren buffett", freq) == 1.0


def test_idf_overlap_disjoint():
    assert idf_token_overlap("alpha", "beta", {}) == 0.0


def test_idf_overlap_weights_infrequent_words_higher():
    # shared rare word -> higher sim than shared frequent word
    freq = {"buffett": 1, "john": 1000, "warren": 1}
    rare = idf_token_overlap("warren buffett", "john buffett", freq)
    freq2 = {"buffett": 1000, "john": 1, "warren": 1000}
    frequent = idf_token_overlap("warren buffett", "john buffett", freq2)
    assert rare > frequent


def test_idf_overlap_hand_value():
    # w(t) = 1/log(2 + f); shared {yy}, union {xx, yy, zz}, all f = 1
    freq = {"xx": 1, "yy": 1, "zz": 1}
    w = 1.0 / math.log(3.0)
    expected = w / (3 * w)
    assert idf_token_overlap("xx yy", "yy zz", freq) == pytest.approx(expected)


def test_idf_overlap_stopwords_ignored():
    assert idf_token_overlap("the buffett", "a buffett", {"buffett": 1}) == 1.0


def test_idf_overlap_stemmed():
    freq = {"kaba": 3}
    assert idf_token_overlap("kabas of", "kaba of", freq, stem=True) == 1.0
    assert idf_token_overlap("kabas of", "kaba of", freq, stem=False) == 0.0


def test_idf_overlap_empty_content():
    assert idf_token_overlap("the", "the", {}) == 1.0
    assert idf_token_overlap("the", "a", {}) == 0.0


@given(WORDS, WORDS)
def test_idf_overlap_symmetric(a, b):
    freq = {"a": 3}
    assert idf_token_overlap(a, b, freq) == pytest.approx(
        idf_token_overlap(b, a, freq)
    )


# ----------------------------------------------------------------- ngram

def test_ngrams_padding():
    assert "^ab" in ngrams("abc")
    assert "bc$" in ngrams("abc")


def test_ngram_jaccard_identical():
    assert ngram_jaccard("capital", "capital") == 1.0


def test_ngram_jaccard_disjoint():
    assert ngram_jaccard("aaaa", "bbbb") == 0.0


def test_ngram_jaccard_case_insensitive():
    assert ngram_jaccard("Capital", "capital") == 1.0


@given(WORDS, WORDS)
def test_ngram_jaccard_bounds_and_symmetry(a, b):
    s = ngram_jaccard(a, b)
    assert 0.0 <= s <= 1.0
    assert s == pytest.approx(ngram_jaccard(b, a))


# ----------------------------------------------------------- levenshtein

@pytest.mark.parametrize(
    "a, b, d",
    [
        ("kitten", "sitting", 3),
        ("flaw", "lawn", 2),
        ("", "abc", 3),
        ("abc", "", 3),
        ("abc", "abc", 0),
        ("a", "b", 1),
        ("book", "back", 2),
    ],
)
def test_levenshtein_known(a, b, d):
    assert levenshtein(a, b) == d


@given(WORDS, WORDS)
def test_levenshtein_metric_properties(a, b):
    d = levenshtein(a, b)
    assert d == levenshtein(b, a)
    assert (d == 0) == (a == b)
    assert d <= max(len(a), len(b))


@given(WORDS, WORDS, WORDS)
def test_levenshtein_triangle(a, b, c):
    assert levenshtein(a, c) <= levenshtein(a, b) + levenshtein(b, c)


def test_levenshtein_sim_bounds():
    assert levenshtein_sim("abc", "abc") == 1.0
    assert levenshtein_sim("", "") == 1.0
    assert levenshtein_sim("aaaa", "bbbb") == 0.0


@given(WORDS, WORDS)
def test_levenshtein_sim_range(a, b):
    assert 0.0 <= levenshtein_sim(a, b) <= 1.0


# ---------------------------------------------------------- jaro-winkler

@pytest.mark.parametrize(
    "a, b, expected",
    [
        ("martha", "marhta", 0.944),
        ("dixon", "dicksonx", 0.767),
        ("jellyfish", "smellyfish", 0.896),
    ],
)
def test_jaro_known_values(a, b, expected):
    assert jaro(a, b) == pytest.approx(expected, abs=1e-3)


def test_jaro_winkler_prefix_bonus():
    assert jaro_winkler("prefixed", "prefixes") > jaro("prefixed", "prefixes")


def test_jaro_winkler_identical():
    assert jaro_winkler("same", "same") == 1.0


def test_jaro_winkler_empty():
    assert jaro_winkler("", "abc") == 0.0


@given(WORDS, WORDS)
def test_jaro_winkler_bounds_and_symmetry(a, b):
    s = jaro_winkler(a, b)
    assert 0.0 <= s <= 1.0 + 1e-9
    assert s == pytest.approx(jaro_winkler(b, a))
