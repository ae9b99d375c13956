"""OKB relation linking baselines of Figure 3.

Each returns ``(rp, rel_id)``.  As in the paper, relation linking is
much harder than entity linking — relation phrases have far more
surface variation — and the baselines' scores mostly reflect how much
string normalization and joint evidence they can bring to bear.

* **EARL** [8] — edit-distance candidate scoring with connection
  density; weakest because raw RP surfaces rarely resemble CKB
  relation names.
* **Falcon** [41] — morphological normalization before ngram matching
  (its "old is gold" linguistic rules).
* **Rematch** [33] — semantic matching of relation phrases: embedding
  similarity blended with Levenshtein.
* **KBPearl** [28] — joint: candidate relations that complete CKB
  facts with the triples' linked entities get vote boosts.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, StringType

from repro.baselines.entity_linking import kbpearl
from repro.core.jocl import SignalBundle
from repro.text.similarity import ngram_jaccard
from repro.text.tokens import morph_normalize


def _argmax(scored: DataFrame, score_col: str) -> DataFrame:
    w = Window.partitionBy("rp").orderBy(F.desc(score_col), F.asc("rel_id"))
    return (
        scored.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select("rp", "rel_id")
    )


def earl_rel(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    deg = signals.ckb.facts.groupBy(F.col("rel").alias("rel_id")).agg(
        F.count("*").alias("deg")
    )
    scored = signals.rel_cands.join(deg, "rel_id", "left").fillna(
        {"deg": 0}
    ).withColumn("score", F.col("f_ld") + 0.05 * F.log1p("deg"))
    return _argmax(scored, "score")


def falcon_rel(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """ngram matching on morph-normalized RP surfaces."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    rels = signals.ckb.relations.select(
        "rel_id", F.col("name").alias("rel_name")
    )
    cands = signals.rel_cands.select("rp", "rel_id").join(rels, "rel_id")

    @F.pandas_udf(DoubleType())
    def ng_norm(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [ngram_jaccard(morph_normalize(x), morph_normalize(y))
             for x, y in zip(a, b)],
            index=a.index, dtype="float64",
        )

    scored = cands.withColumn("score", ng_norm("rp", "rel_name"))
    return _argmax(scored, "score")


def rematch(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Semantic (embedding) + Levenshtein blend."""
    scored = signals.rel_cands.withColumn(
        "score", 0.6 * F.col("f_emb") + 0.4 * F.col("f_ld")
    )
    return _argmax(scored, "score")


def kbpearl_rel(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Fact-coherence votes: a candidate relation completing a CKB fact
    with the triple's argument entities (linked by KBPearl's own
    label-search entity linker) gets a vote; ngram similarity is the
    fallback."""
    ent_links = kbpearl(spark, signals)
    t = signals.triples.select("subj", "pred", "obj").distinct()
    linked = (
        t.join(ent_links.withColumnRenamed("np", "subj")
                        .withColumnRenamed("ent_id", "es"), "subj")
        .join(ent_links.withColumnRenamed("np", "obj")
                       .withColumnRenamed("ent_id", "eo"), "obj")
    )
    cands = signals.rel_cands.select(
        F.col("rp").alias("pred"), "rel_id", "f_ngram"
    )
    facts = signals.ckb.facts.select(
        F.col("subj").alias("es"), F.col("rel").alias("rel_id"),
        F.col("obj").alias("eo"), F.lit(1.0).alias("hit"),
    )
    joined = linked.join(cands, "pred").join(
        facts, ["es", "rel_id", "eo"], "left"
    ).fillna({"hit": 0.0})
    scored = joined.groupBy(F.col("pred").alias("rp"), "rel_id").agg(
        (0.5 * F.sum("hit") + F.max("f_ngram")).alias("score")
    )
    return _argmax(scored, "score")


RELATION_LINKING_BASELINES = {
    "Falcon": falcon_rel,
    "EARL": earl_rel,
    "Rematch": rematch,
    "KBPearl": kbpearl_rel,
}
