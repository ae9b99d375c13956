"""Broad parametrized property sweeps over the text/generator layers.

These complement the targeted unit tests with wide input coverage —
every case here is pure Python (no Spark), so the sweep is cheap.
"""
import itertools

import pytest

from repro.okbgen.okb import nytimes2018_lite, reverb45k_lite
from repro.okbgen.world import NYT_PROFILE, REVERB_PROFILE, build_world
from repro.text.embeddings import EmbeddingModel
from repro.text.similarity import (
    idf_token_overlap,
    jaro_winkler,
    levenshtein,
    levenshtein_sim,
    ngram_jaccard,
)
from repro.text.tokens import content_tokens, morph_normalize, tokenize

PHRASES = [
    "university of maryland", "umd", "maryland", "UMD",
    "warren buffett", "buffett", "president buffett",
    "be a member of", "be an early member of", "member",
    "john smith", "smiths", "j smith", "",
    "the", "a b c d e", "x" * 40,
]


@pytest.mark.parametrize("a, b", itertools.combinations(PHRASES, 2))
def test_all_similarities_bounded_and_symmetric(a, b):
    freq = {"university": 100, "of": 100}
    for fn in (
        lambda x, y: idf_token_overlap(x, y, freq),
        ngram_jaccard,
        levenshtein_sim,
        jaro_winkler,
    ):
        s_ab, s_ba = fn(a, b), fn(b, a)
        assert 0.0 <= s_ab <= 1.0 + 1e-9
        assert s_ab == pytest.approx(s_ba)


@pytest.mark.parametrize("p", PHRASES)
def test_self_similarity_is_one(p):
    if not p.strip():
        return
    assert idf_token_overlap(p, p, {}) == 1.0
    assert ngram_jaccard(p, p) == 1.0
    assert levenshtein_sim(p, p) == 1.0
    assert levenshtein(p, p) == 0


@pytest.mark.parametrize("p", PHRASES)
def test_tokenize_morph_consistency(p):
    toks = tokenize(p)
    assert content_tokens(p) == [t for t in toks if t in content_tokens(p)]
    n = morph_normalize(p)
    if toks:
        assert n  # never empty for non-empty token lists


@pytest.mark.parametrize("seed", range(5))
def test_world_invariants_across_seeds(seed):
    w = build_world(n_entities=25, n_relations=6, n_facts=50, seed=seed)
    assert len(w.entities) == 25
    assert (w.facts["subj"] != w.facts["obj"]).all()
    assert (w.anchors["count"] > 0).all()
    # every alias group is a gold NP group
    assert len(w.np_groups()) == 25


@pytest.mark.parametrize("profile", [REVERB_PROFILE, NYT_PROFILE])
def test_world_profiles_generate(profile):
    w = build_world(n_entities=20, n_relations=5, n_facts=40,
                    profile=profile, seed=1)
    assert len(w.aliases) >= 40  # >= 2 aliases per entity


@pytest.mark.parametrize("sf", [0.004, 0.008])
@pytest.mark.parametrize("maker", [reverb45k_lite, nytimes2018_lite])
def test_dataset_scaling_grid(maker, sf):
    ds = maker(sf=sf)
    assert len(ds.triples) >= 50
    gold = ds.gold_np_labels()
    assert gold["np"].is_unique
    # every emitted surface has a gold label
    assert set(ds.triples["subj"]).issubset(set(gold["np"]))


@pytest.mark.parametrize("seed", range(3))
def test_embeddings_alias_cohesion_across_seeds(seed):
    w = build_world(n_entities=30, n_relations=6, n_facts=60, seed=seed)
    m = EmbeddingModel(w.latent_of_word)
    groups = [g for g in w.np_groups() if len(g) >= 2][:10]
    within, cross = [], []
    for g in groups:
        within.append(m.sim(g[0], g[1]))
    for g1, g2 in zip(groups, groups[1:]):
        cross.append(m.sim(g1[0], g2[0]))
    assert sum(within) / len(within) > sum(cross) / len(cross)
