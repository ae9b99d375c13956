"""Candidate generation + linking signals for OKB linking (§3.2).

Entity candidates come from the synthetic Wikipedia anchor table:
exact-surface matches ranked by anchor count, which simultaneously
yields the popularity prior ``f_pop = count(s, e) / count(s)``
(§3.2.3).  Relation candidates come from string similarity between the
RP and each CKB relation name, ranked by the combined ngram/LD score
(§3.2.4) — the CKB relation catalog is small, so this is a broadcast
cross join.

Candidate lists are capped at ``k`` states per linking variable; the
fact-inclusion factor's assignment table is cubic in this cap (see
DESIGN.md §5).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType

from repro.okbgen.ckb import CKB
from repro.text.embeddings import EmbeddingModel
from repro.text.ppdb import PPDBIndex
from repro.text.similarity import levenshtein_sim, ngram_jaccard

ENTITY_SIGNALS = ("f_pop", "f_emb", "f_ppdb")
RELATION_SIGNALS = ("f_ngram", "f_ld", "f_emb", "f_ppdb")


def _pair_udf(fn):
    @F.pandas_udf(DoubleType())
    def udf(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [fn(x, y) for x, y in zip(a, b)], index=a.index, dtype="float64"
        )

    return udf


def entity_candidates(
    nps: DataFrame,
    ckb: CKB,
    embeddings: EmbeddingModel,
    ppdb: PPDBIndex,
    *,
    k: int = 5,
    col: str = "np",
) -> DataFrame:
    """Top-``k`` candidate entities per distinct NP.

    Returns ``(np, ent_id, f_pop, f_emb, f_ppdb, rank)``.  NPs with no
    anchor hits get no rows — they stay unlinkable, which is a genuine
    error mode of anchor-based candidate generation.
    """
    hits = nps.select(F.col(col).alias("np")).distinct().join(
        ckb.anchors.withColumnRenamed("surface", "np"), on="np"
    )
    tot = hits.groupBy("np").agg(F.sum("count").alias("total"))
    scored = (
        hits.join(tot, on="np")
        .withColumn("f_pop", F.col("count") / F.col("total"))
        .withColumn(
            "rank",
            F.row_number().over(
                Window.partitionBy("np").orderBy(
                    F.desc("count"), F.asc("ent_id")
                )
            ),
        )
        .where(F.col("rank") <= k)
    )
    named = scored.join(
        ckb.entities.select("ent_id", F.col("name").alias("ent_name")), on="ent_id"
    )
    named = named.withColumn("f_emb", _pair_udf(embeddings.sim)("np", "ent_name"))
    named = named.withColumn("f_ppdb", _pair_udf(ppdb.sim)("np", "ent_name"))
    return named.select("np", "ent_id", "f_pop", "f_emb", "f_ppdb", "rank")


def relation_candidates(
    rps: DataFrame,
    ckb: CKB,
    embeddings: EmbeddingModel,
    ppdb: PPDBIndex,
    *,
    k: int = 5,
    col: str = "rp",
) -> DataFrame:
    """Top-``k`` candidate CKB relations per distinct RP.

    Returns ``(rp, rel_id, f_ngram, f_ld, f_emb, f_ppdb, rank)``; ranked
    by the mean of the string signals (the factor weights, not the
    ranking, decide the final link).
    """
    cross = rps.select(F.col(col).alias("rp")).distinct().crossJoin(
        F.broadcast(ckb.relations.select("rel_id", F.col("name").alias("rel_name")))
    )
    cross = cross.withColumn("f_ngram", _pair_udf(ngram_jaccard)("rp", "rel_name"))
    cross = cross.withColumn("f_ld", _pair_udf(levenshtein_sim)("rp", "rel_name"))
    cross = cross.withColumn("f_emb", _pair_udf(embeddings.sim)("rp", "rel_name"))
    cross = cross.withColumn("f_ppdb", _pair_udf(ppdb.sim)("rp", "rel_name"))
    score = (F.col("f_ngram") + F.col("f_ld") + F.col("f_emb") + F.col("f_ppdb")) / 4
    ranked = cross.withColumn(
        "rank",
        F.row_number().over(
            Window.partitionBy("rp").orderBy(score.desc(), F.asc("rel_id"))
        ),
    )
    return ranked.where(F.col("rank") <= k).select(
        "rp", "rel_id", "f_ngram", "f_ld", "f_emb", "f_ppdb", "rank"
    )
