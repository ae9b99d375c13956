"""Unit tests for the synthetic embedding model."""
import numpy as np
import pandas as pd
import pytest

from repro.text.embeddings import EmbeddingModel, _seeded_unit


def test_seeded_unit_deterministic_and_normalized():
    v1 = _seeded_unit("k", 32)
    v2 = _seeded_unit("k", 32)
    assert np.allclose(v1, v2)
    assert np.linalg.norm(v1) == pytest.approx(1.0)
    assert not np.allclose(v1, _seeded_unit("other", 32))


def test_word_vec_cached_and_deterministic():
    m1 = EmbeddingModel({"umd": "e1"})
    m2 = EmbeddingModel({"umd": "e1"})
    assert np.allclose(m1.word_vec("umd"), m2.word_vec("umd"))
    assert m1.word_vec("umd") is m1.word_vec("umd")


def test_same_concept_words_close_cross_concept_far():
    m = EmbeddingModel({"alpha": "c1", "beta": "c1", "gamma": "c2"})
    same = m.sim("alpha", "beta")
    cross = m.sim("alpha", "gamma")
    assert same > 0.8
    assert cross < same


def test_phrase_vec_is_word_mean():
    m = EmbeddingModel({})
    v = m.phrase_vec("aa bb")
    expected = (m.word_vec("aa") + m.word_vec("bb")) / 2
    assert np.allclose(v, expected)


def test_sim_bounds_and_identity():
    m = EmbeddingModel({"x": "c"})
    assert m.sim("x y z", "x y z") == pytest.approx(1.0)
    for a, b in [("x", "y"), ("foo bar", "baz"), ("", "x")]:
        assert 0.0 <= m.sim(a, b) <= 1.0


def test_empty_phrase_neutral():
    m = EmbeddingModel({})
    assert m.sim("", "anything") == 0.5


def test_sim_series_matches_scalar():
    m = EmbeddingModel({"umd": "e1", "maryland": "e1"})
    a = pd.Series(["umd", "umd"])
    b = pd.Series(["maryland", "paris"])
    out = m.sim_series(a, b)
    assert out[0] == pytest.approx(m.sim("umd", "maryland"))
    assert out[1] == pytest.approx(m.sim("umd", "paris"))


def test_latent_weight_controls_cohesion():
    tight = EmbeddingModel({"a": "c", "b": "c"}, latent_weight=0.95)
    loose = EmbeddingModel({"a": "c", "b": "c"}, latent_weight=0.2)
    assert tight.sim("a", "b") > loose.sim("a", "b")
