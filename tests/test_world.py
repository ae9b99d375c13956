"""Generator invariants for the synthetic world."""
import pandas as pd
import pytest

from repro.okbgen.world import (
    NYT_PROFILE,
    REVERB_PROFILE,
    World,
    build_world,
)


@pytest.fixture(scope="module")
def world() -> World:
    return build_world(n_entities=60, n_relations=10, n_facts=120, seed=3)


def test_entity_table_shape(world):
    assert len(world.entities) == 60
    assert set(world.entities.columns) == {"ent_id", "name", "kind", "popularity"}
    assert world.entities["ent_id"].is_unique


def test_popularity_is_distribution(world):
    pop = world.entities["popularity"]
    assert pop.sum() == pytest.approx(1.0)
    assert (pop > 0).all()


def test_every_entity_has_aliases_including_canonical(world):
    by_ent = world.aliases.groupby("ent_id")
    assert set(by_ent.groups) == set(world.entities["ent_id"])
    for ent_id, g in by_ent:
        assert (g["kind"] == "canonical").sum() == 1
        assert len(g) >= 2  # ReVerb45K: every entity has >= 2 aliases
        assert g["alias"].is_unique


def test_canonical_alias_is_entity_name(world):
    canon = world.aliases[world.aliases["kind"] == "canonical"]
    merged = canon.merge(world.entities, on="ent_id")
    assert (merged["alias"] == merged["name"]).all()


def test_relations_have_multiple_phrases(world):
    by_rel = world.rel_phrases.groupby("rel_id")
    assert set(by_rel.groups) == set(world.relations["rel_id"])
    for _, g in by_rel:
        assert len(g) >= 3
        assert (g["kind"] == "canonical").sum() == 1


def test_facts_reference_world_and_avoid_self_loops(world):
    f = world.facts
    assert (f["subj"] != f["obj"]).all()
    assert f["subj"].isin(world.entities["ent_id"]).all()
    assert f["obj"].isin(world.entities["ent_id"]).all()
    assert f["rel"].isin(world.relations["rel_id"]).all()
    assert not f.duplicated(subset=["subj", "rel", "obj"]).any()


def test_some_facts_in_ckb(world):
    frac = world.facts["in_ckb"].mean()
    assert 0.1 < frac < 0.8


def test_anchor_counts_positive_and_aggregated(world):
    a = world.anchors
    assert (a["count"] > 0).all()
    assert not a.duplicated(subset=["surface", "ent_id"]).any()


def test_ambiguous_surfaces_exist(world):
    per_surface = world.anchors.groupby("surface")["ent_id"].nunique()
    assert (per_surface > 1).any(), "no ambiguity planted — linking would be trivial"


def test_latent_map_covers_heads(world):
    # every entity's short alias (its head word) has a concept latent
    shorts = world.aliases[world.aliases["kind"] == "short"]["alias"]
    covered = sum(1 for s in shorts if s in world.latent_of_word)
    assert covered >= 0.9 * len(shorts)


def test_deterministic_in_seed():
    a = build_world(n_entities=20, n_relations=5, n_facts=40, seed=9)
    b = build_world(n_entities=20, n_relations=5, n_facts=40, seed=9)
    pd.testing.assert_frame_equal(a.entities, b.entities)
    pd.testing.assert_frame_equal(a.aliases, b.aliases)
    pd.testing.assert_frame_equal(a.anchors, b.anchors)
    assert a.latent_of_word == b.latent_of_word


def test_profiles_differ_in_noise():
    assert NYT_PROFILE.anchor_miss > REVERB_PROFILE.anchor_miss
    assert NYT_PROFILE.head_reuse > REVERB_PROFILE.head_reuse
    assert NYT_PROFILE.fact_in_ckb < REVERB_PROFILE.fact_in_ckb


def test_np_and_rp_groups(world):
    np_groups = world.np_groups()
    assert len(np_groups) == 60
    assert all(len(g) >= 2 for g in np_groups)
    rp_groups = world.rp_groups()
    assert len(rp_groups) == 10


def test_background_freq_nonempty(world):
    assert world.background_freq
    assert all(n > 0 for n in world.background_freq.values())
    assert "university" in world.background_freq


def test_ckb_relation_names_not_all_okb_phrases(world):
    """CKB relation names are ontology-style; most must differ from
    every OKB surface phrase of their relation."""
    phrases = set(world.rel_phrases["phrase"])
    outside = sum(1 for n in world.relations["name"] if n not in phrases)
    assert outside >= len(world.relations) * 0.4
