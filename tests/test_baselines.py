"""Baseline sanity tests: schemas, coverage, and mechanism-specific
properties on the tiny ReVerb-lite dataset."""
import pytest
from pyspark.sql import functions as F

from repro.baselines.entity_linking import ENTITY_LINKING_BASELINES
from repro.baselines.np_canon import NP_CANON_BASELINES, morph_norm
from repro.baselines.relation_linking import RELATION_LINKING_BASELINES
from repro.baselines.rp_canon import RP_CANON_BASELINES
from repro.core.jocl import distinct_nps, distinct_rps
from repro.text.tokens import morph_normalize


@pytest.mark.parametrize("name", sorted(NP_CANON_BASELINES))
def test_np_canon_baseline_schema(spark, reverb_signals, name):
    out = NP_CANON_BASELINES[name](spark, reverb_signals)
    assert {"np", "cluster"} <= set(out.columns)
    n = out.count()
    assert n > 0
    assert out.select("np").distinct().count() == n


@pytest.mark.parametrize("name", ["Morph Norm", "Wikidata Integrator"])
def test_np_canon_full_coverage(spark, reverb_signals, name):
    out = NP_CANON_BASELINES[name](spark, reverb_signals)
    assert out.count() == distinct_nps(reverb_signals.triples).count()


def test_morph_norm_clusters_by_normal_form(spark, reverb_signals):
    out = morph_norm(spark, reverb_signals).collect()
    for r in out:
        assert r["cluster"] == morph_normalize(r["np"])


@pytest.mark.parametrize("name", sorted(RP_CANON_BASELINES))
def test_rp_canon_baseline_schema(spark, reverb_signals, name):
    out = RP_CANON_BASELINES[name](spark, reverb_signals)
    assert {"rp", "cluster"} <= set(out.columns)
    assert out.count() == distinct_rps(reverb_signals.triples).count()


def test_amie_baseline_merges_morph_variants(spark, reverb_signals):
    out = RP_CANON_BASELINES["AMIE"](spark, reverb_signals).collect()
    cluster_of = {r["rp"]: r["cluster"] for r in out}
    by_norm = {}
    for rp in cluster_of:
        by_norm.setdefault(morph_normalize(rp), []).append(rp)
    for group in by_norm.values():
        assert len({cluster_of[rp] for rp in group}) == 1


@pytest.mark.parametrize("name", sorted(ENTITY_LINKING_BASELINES))
def test_entity_linking_baseline_schema(spark, reverb_signals, name):
    out = ENTITY_LINKING_BASELINES[name](spark, reverb_signals)
    assert {"np", "ent_id"} <= set(out.columns)
    n = out.count()
    assert n > 0
    assert out.select("np").distinct().count() == n  # one link per NP


def test_falcon_links_subset_of_nps(spark, reverb_signals):
    """Label-exact matching cannot cover acronyms — strictly partial."""
    out = ENTITY_LINKING_BASELINES["Falcon"](spark, reverb_signals)
    assert out.count() < distinct_nps(reverb_signals.triples).count()


@pytest.mark.parametrize("name", sorted(RELATION_LINKING_BASELINES))
def test_relation_linking_baseline_schema(spark, reverb_signals, name):
    out = RELATION_LINKING_BASELINES[name](spark, reverb_signals)
    assert {"rp", "rel_id"} <= set(out.columns)
    n = out.count()
    assert n > 0
    assert out.select("rp").distinct().count() == n


def test_linking_baselines_differ(spark, reverb_signals):
    """The proxies must not collapse into one another: at least some
    NPs get different links from different systems."""
    outs = {}
    for name in ("Spotlight", "EARL", "Tagme"):
        outs[name] = {
            r["np"]: r["ent_id"]
            for r in ENTITY_LINKING_BASELINES[name](spark, reverb_signals).collect()
        }
    common = set(outs["Spotlight"]) & set(outs["EARL"]) & set(outs["Tagme"])
    assert common
    diffs = sum(
        1 for np_ in common
        if len({outs[n][np_] for n in outs}) > 1
    )
    assert diffs > 0
