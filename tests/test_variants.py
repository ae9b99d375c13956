"""Variant-registry tests (§4.4 / §4.5 configurations)."""
from repro.core import variants
from repro.core.jocl import JOCLConfig


def test_registry_complete():
    assert set(variants.VARIANTS) == {
        "JOCL", "JOCL_cano", "JOCL_link",
        "JOCL-single", "JOCL-double", "JOCL-all",
    }


def test_full_is_default_config():
    assert variants.FULL == JOCLConfig()
    assert variants.VARIANTS["JOCL-all"] is variants.FULL


def test_cano_only_disables_linking():
    c = variants.CANO_ONLY
    assert c.use_canon and not c.use_link and not c.use_consistency


def test_link_only_disables_canonicalization():
    c = variants.LINK_ONLY
    assert c.use_link and not c.use_canon and not c.use_consistency


def test_single_keeps_table5_features():
    c = variants.SINGLE
    assert c.np_feats == ("np_idf",)
    assert c.rp_feats == ("rp_idf",)
    assert c.el_feats == ("el_pop",)
    assert c.rl_feats == ("rl_ngram",)


def test_double_adds_embeddings():
    c = variants.DOUBLE
    for feats in (c.np_feats, c.rp_feats, c.el_feats, c.rl_feats):
        assert len(feats) == 2
        assert any(f.endswith("emb") for f in feats)


def test_structural_factors_stay_on_in_feature_variants():
    for name in ("JOCL-single", "JOCL-double"):
        c = variants.VARIANTS[name]
        assert c.use_transitivity and c.use_fact_inclusion and c.use_consistency
