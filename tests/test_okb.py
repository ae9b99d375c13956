"""Dataset emitter tests: ReVerb45K-lite and NYTimes2018-lite."""
import pytest

from repro.okbgen.okb import nytimes2018_lite, reverb45k_lite


def test_reverb_size_scales():
    small = reverb45k_lite(sf=0.004)
    large = reverb45k_lite(sf=0.01)
    assert len(small.triples) == 180
    assert len(large.triples) == 450


def test_nyt_size_scales():
    assert len(nytimes2018_lite(sf=0.01).triples) == 340


def test_reverb_has_validation_fold(reverb_tiny):
    folds = set(reverb_tiny.triples["fold"])
    assert folds == {"val", "test"}
    frac = (reverb_tiny.triples["fold"] == "val").mean()
    assert 0.05 < frac < 0.45  # 20 % of entities, not of triples


def test_nyt_has_no_validation_fold(nyt_tiny):
    assert set(nyt_tiny.triples["fold"]) == {"test"}


def test_triples_carry_gold_labels(reverb_tiny):
    t = reverb_tiny.triples
    for col in ["subj", "pred", "obj", "gold_subj", "gold_rel", "gold_obj"]:
        assert col in t.columns
    w = reverb_tiny.world
    assert t["gold_subj"].isin(w.entities["ent_id"]).all()
    assert t["gold_rel"].isin(w.relations["rel_id"]).all()


def test_surfaces_come_from_world(reverb_tiny):
    w = reverb_tiny.world
    aliases = set(w.aliases["alias"])
    phrases = set(w.rel_phrases["phrase"])
    t = reverb_tiny.triples
    assert t["subj"].isin(aliases).all()
    assert t["obj"].isin(aliases).all()
    assert t["pred"].isin(phrases).all()


def test_gold_np_labels_unique_and_consistent(reverb_tiny):
    gold = reverb_tiny.gold_np_labels()
    assert gold["np"].is_unique
    occurring = set(reverb_tiny.triples["subj"]) | set(reverb_tiny.triples["obj"])
    assert set(gold["np"]) == occurring


def test_gold_rp_labels_unique(reverb_tiny):
    gold = reverb_tiny.gold_rp_labels()
    assert gold["rp"].is_unique
    assert set(gold["rp"]) == set(reverb_tiny.triples["pred"])


def test_deterministic_in_seed():
    a = reverb45k_lite(sf=0.004, seed=5)
    b = reverb45k_lite(sf=0.004, seed=5)
    assert a.triples.equals(b.triples)


def test_resources_cached(reverb_tiny):
    assert reverb_tiny.embeddings is reverb_tiny.embeddings
    assert reverb_tiny.ppdb is reverb_tiny.ppdb
    assert len(reverb_tiny.ppdb.rep_of) > 0


def test_facts_repeat_for_amie(reverb_tiny):
    """Zipf fact sampling must repeat head facts — AMIE's support."""
    t = reverb_tiny.triples
    per_fact = t.groupby(["gold_subj", "gold_rel", "gold_obj"]).size()
    assert (per_fact >= 2).sum() > 5


def test_to_spark_schema(spark, reverb_tiny):
    df = reverb_tiny.to_spark(spark)
    assert df.count() == len(reverb_tiny.triples)
    assert {"subj", "pred", "obj", "fold"} <= set(df.columns)
