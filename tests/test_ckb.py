"""CKB view tests — checked against DuckDB via the provided oracle."""
import pyspark.sql.functions as F

from repro.okbgen.ckb import ckb_from_world
from repro.oracle import assert_equivalent


def test_ckb_facts_are_inckb_subset(spark, reverb_tiny):
    ckb = ckb_from_world(spark, reverb_tiny.world)
    assert_equivalent(
        ckb.facts.select("subj", "rel", "obj"),
        "SELECT subj, rel, obj FROM world_facts WHERE in_ckb",
        world_facts=reverb_tiny.world.facts,
    )


def test_ckb_entities_match_world(spark, reverb_tiny):
    ckb = ckb_from_world(spark, reverb_tiny.world)
    assert_equivalent(
        ckb.entities.select("ent_id", "name"),
        "SELECT ent_id, name FROM entities",
        entities=reverb_tiny.world.entities[["ent_id", "name"]],
    )


def test_anchor_totals_match_world(spark, reverb_tiny):
    ckb = ckb_from_world(spark, reverb_tiny.world)
    got = ckb.anchors.groupBy("surface").agg(
        F.sum("count").alias("total")
    )
    assert_equivalent(
        got,
        "SELECT surface, SUM(count) AS total FROM anchors GROUP BY surface",
        anchors=reverb_tiny.world.anchors,
    )


def test_empty_ckb_facts_schema(spark):
    from repro.okbgen.world import WorldProfile, build_world

    w = build_world(
        n_entities=16, n_relations=6, n_facts=30,
        profile=WorldProfile(fact_in_ckb=0.0), seed=0,
    )
    ckb = ckb_from_world(spark, w)
    assert ckb.facts.count() == 0
    assert set(ckb.facts.columns) == {"subj", "rel", "obj"}
