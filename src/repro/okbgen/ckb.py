"""Curated-KB (Freebase/DBpedia substitute) Spark views of a World.

The CKB a World induces is the ``in_ckb`` subset of its facts plus the
entity/relation catalogs and the synthetic Wikipedia anchor table.
These are the only CKB surfaces JOCL touches: candidate generation,
entity popularity, and the fact-inclusion factor U4.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.okbgen.world import World


@dataclass
class CKB:
    """Spark-side curated KB."""

    entities: DataFrame   # ent_id, name, kind, popularity
    relations: DataFrame  # rel_id, name
    facts: DataFrame      # subj, rel, obj   (CKB-included facts only)
    anchors: DataFrame    # surface, ent_id, count


def ckb_from_world(spark: SparkSession, world: World) -> CKB:
    facts_pd = world.facts.loc[world.facts["in_ckb"], ["subj", "rel", "obj"]]
    if facts_pd.empty:  # explicit schema: Spark cannot infer from no rows
        facts = spark.createDataFrame([], "subj long, rel long, obj long")
    else:
        facts = spark.createDataFrame(facts_pd)
    return CKB(
        entities=spark.createDataFrame(world.entities),
        relations=spark.createDataFrame(world.relations),
        facts=facts,
        anchors=spark.createDataFrame(world.anchors),
    )
