"""End-to-end JOCL pipeline tests at tiny scale (slow tests)."""
import pytest
from pyspark.sql import functions as F

from repro.core.jocl import (
    build_jocl_graph,
    clusters_with_singletons,
    distinct_nps,
    run_jocl,
    validation_labels,
)
from repro.core.variants import CANO_ONLY, LINK_ONLY
from repro.evalx.canon_metrics import canon_scores
from repro.evalx.linking_metrics import linking_accuracy, np_occurrences


@pytest.fixture(scope="module")
def jocl_result(spark, reverb_tiny, quick_cfg, reverb_signals):
    return run_jocl(spark, reverb_tiny, quick_cfg, signals=reverb_signals)


def test_graph_contains_all_factor_families(reverb_signals, quick_cfg):
    g = build_jocl_graph(reverb_signals, quick_cfg)
    ftypes = {r["ftype"] for r in g.assign.select("ftype").distinct().collect()}
    assert {"Fnp", "Frp", "Fel", "Frl", "Unc", "Urc"} <= ftypes
    # Uf / Unt appear when the data provides CKB facts / triangles
    assert "Uf" in ftypes


def test_validation_labels_cover_both_tasks(spark, reverb_tiny, reverb_signals):
    labels = validation_labels(spark, reverb_tiny, reverb_signals)
    prefixes = {r["var_id"].split(":")[0] for r in labels.collect()}
    assert "npl" in prefixes
    assert labels.count() > 0


def test_jocl_produces_all_outputs(jocl_result):
    d = jocl_result.decode
    assert d.np_clusters is not None and d.np_clusters.count() > 0
    assert d.rp_clusters is not None
    assert d.np_links is not None and d.np_links.count() > 0
    assert d.rp_links is not None
    assert jocl_result.lbp_iterations >= 1


def test_jocl_links_beat_random(spark, reverb_tiny, jocl_result):
    t = spark.createDataFrame(reverb_tiny.triples)
    acc = linking_accuracy(np_occurrences(t), jocl_result.decode.np_links)
    n_entities = len(reverb_tiny.world.entities)
    assert acc > 3.0 / n_entities  # far above random guessing
    assert acc > 0.3


def test_jocl_canon_beats_singletons(spark, reverb_tiny, jocl_result):
    t = spark.createDataFrame(reverb_tiny.triples)
    gold = spark.createDataFrame(reverb_tiny.gold_np_labels())
    nps = distinct_nps(t)
    joined = (
        clusters_with_singletons(nps, jocl_result.decode.np_clusters, key="np")
        .join(gold, on="np")
        .select(F.col("cluster").alias("pred"), F.col("gold_ent").alias("gold"))
    )
    merged = canon_scores(joined)
    singletons = canon_scores(
        nps.join(gold, on="np").select(
            F.col("np").alias("pred"), F.col("gold_ent").alias("gold")
        )
    )
    assert merged.pair_f1 > singletons.pair_f1


def test_cano_only_variant_has_no_links(spark, reverb_tiny):
    from dataclasses import replace

    cfg = replace(CANO_ONLY, lbp_iters=3, epochs=0)
    res = run_jocl(spark, reverb_tiny, cfg)
    assert res.decode.np_clusters is not None
    assert res.decode.np_links is None
    assert res.decode.rp_links is None


def test_link_only_variant_has_no_clusters(spark, reverb_tiny):
    from dataclasses import replace

    cfg = replace(LINK_ONLY, lbp_iters=3, epochs=0)
    res = run_jocl(spark, reverb_tiny, cfg)
    assert res.decode.np_links is not None
    assert res.decode.np_clusters is None


def test_weights_default_to_uniform(jocl_result):
    assert all(v == 1.0 for v in jocl_result.weights.values())


def test_pipe_character_rejected(spark, reverb_tiny, quick_cfg):
    import pandas as pd

    from repro.core.jocl import build_signals

    bad = reverb_tiny.triples.copy()
    bad.loc[0, "subj"] = "evil|phrase"
    ds = type(reverb_tiny)(
        name="bad", world=reverb_tiny.world, triples=bad
    )
    with pytest.raises(ValueError, match="must not contain"):
        build_signals(spark, ds, quick_cfg)
