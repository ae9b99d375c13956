"""NP canonicalization baselines of Table 1.

Each baseline is a reimplementation of the cited system's *core
mechanism* running on the same synthetic substrate, so the comparison
isolates exactly what the paper's comparison isolates: which signals a
method can exploit.

* **Morph Norm** [11] — group by the morphologically normalized string
  (no alias knowledge at all).
* **Wikidata Integrator** — an off-the-shelf entity-linking tool: link
  every NP to its most popular anchor entity, group NPs by link.
* **Text Similarity** [13] — Jaro-Winkler + HAC: single-linkage cut of
  the pair graph at a JW threshold.
* **IDF Token Overlap** [13] — HAC over IDF-token-overlap similarity;
  the canonical setting merges every blocked pair (τ equal to the
  blocking threshold), which over-merges — visible as its low micro F1
  in the paper.
* **Attribute Overlap** [13] — Jaccard similarity between the NPs'
  attribute sets (their (relation, other-NP) contexts in the OKB).
* **CESI** [50] — learned embeddings plus side information (PPDB):
  threshold clustering over the combined idf/embedding/PPDB score.
* **SIST** [27] — CESI's signals plus side information from the source
  text; its decisive extra signal (candidate entities of NPs) is
  modeled by agreement of top candidate entities.

All pair-based methods run on the same IDF-blocked candidate pair
graph the paper's own factor graph uses — blocking is shared
infrastructure, the methods differ in how they score pairs.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, StringType

from repro.canon.blocking import blocked_pairs
from repro.canon.clustering import threshold_cluster
from repro.canon.signals import add_pair_sim
from repro.core.jocl import SignalBundle, distinct_nps
from repro.text.similarity import jaro_winkler
from repro.text.tokens import morph_normalize


def _vertices(signals: SignalBundle) -> DataFrame:
    return distinct_nps(signals.triples).withColumnRenamed("np", "item")


def morph_norm(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """(np, cluster): cluster = morph-normalized surface string."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    return distinct_nps(signals.triples).select(
        "np", norm("np").alias("cluster")
    )


def wikidata_integrator(spark: SparkSession, signals: SignalBundle) -> DataFrame:
    """(np, cluster): cluster = most-popular anchor entity (singleton
    cluster labeled by the NP itself when unlinkable)."""
    nps = distinct_nps(signals.triples)
    top = (
        nps.join(signals.ckb.anchors.withColumnRenamed("surface", "np"), "np")
        .withColumn(
            "rn",
            F.row_number().over(
                Window.partitionBy("np").orderBy(F.desc("count"), F.asc("ent_id"))
            ),
        )
        .where(F.col("rn") == 1)
        .select("np", F.concat(F.lit("e"), F.col("ent_id")).alias("cluster"))
    )
    return nps.join(top, "np", "left").withColumn(
        "cluster", F.coalesce(F.col("cluster"), F.col("np"))
    )


def text_similarity(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 0.85
) -> DataFrame:
    """(np, cluster): token-aligned Jaro-Winkler (Monge-Elkan) HAC cut.

    Classic record-linkage text similarity: each token is matched to
    its best JW counterpart in the other phrase and the two directional
    averages are averaged again — "john x" / "john y" stays apart,
    "john x" / "x" scores high.  Purely lexical — no IDF weighting, no
    embeddings — which is the baseline's ceiling."""

    def monge_elkan(x: str, y: str) -> float:
        tx, ty = x.split(), y.split()
        if not tx or not ty:
            return jaro_winkler(x, y)

        def me(src, dst):
            return sum(max(jaro_winkler(t, u) for u in dst) for t in src) / len(src)

        return (me(tx, ty) + me(ty, tx)) / 2.0

    def sim(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [monge_elkan(x, y) for x, y in zip(a, b)],
            index=a.index, dtype="float64",
        )

    pairs = add_pair_sim(signals.np_pairs, "sim_jw", sim)
    return threshold_cluster(
        _vertices(signals), pairs, sim_col="sim_jw", tau=tau
    ).withColumnRenamed("item", "np")


def idf_token_overlap(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 1 / 3
) -> DataFrame:
    """(np, cluster): IDF-overlap single-linkage cut.

    [13] computes f(x) over its own OIE corpus; without web-scale
    background statistics, generic words ("university", "john") are not
    frequent enough to be down-weighted, so NPs sharing *any* token
    merge — the over-merging visible as this baseline's low micro F1 in
    Table 1.  (JOCL's own IDF signal uses fastText/Wikipedia-scale
    statistics, modeled by the world's background counts.)
    """
    nps = distinct_nps(signals.triples).withColumnRenamed("np", "phrase")
    occ = signals.triples.select(F.col("subj").alias("phrase")).union(
        signals.triples.select(F.col("obj").alias("phrase"))
    )
    from repro.text.similarity import idf_weights

    raw_freq = idf_weights(occ)  # deliberately no background counts
    pairs = blocked_pairs(nps, tau=tau, freq=raw_freq)
    return threshold_cluster(
        _vertices(signals), pairs, sim_col="sim_idf", tau=tau
    ).withColumnRenamed("item", "np")


def attribute_overlap(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 0.3
) -> DataFrame:
    """(np, cluster): Jaccard over attribute sets, where an NP's
    attributes are its (normalized relation, normalized other-NP)
    contexts across the OKB."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    t = signals.triples
    attrs = t.select(
        F.col("subj").alias("np"),
        F.concat(norm("pred"), F.lit(">"), norm("obj")).alias("attr"),
    ).union(
        t.select(
            F.col("obj").alias("np"),
            F.concat(norm("pred"), F.lit("<"), norm("subj")).alias("attr"),
        )
    ).distinct()
    sizes = attrs.groupBy("np").agg(F.count("*").alias("n"))
    inter = (
        attrs.alias("l")
        .join(attrs.alias("r"), on="attr")
        .where(F.col("l.np") < F.col("r.np"))
        .groupBy(F.col("l.np").alias("a"), F.col("r.np").alias("b"))
        .agg(F.count("*").alias("common"))
    )
    jac = (
        inter.join(sizes.select(F.col("np").alias("a"), F.col("n").alias("na")), "a")
        .join(sizes.select(F.col("np").alias("b"), F.col("n").alias("nb")), "b")
        .withColumn(
            "sim_attr",
            F.col("common") / (F.col("na") + F.col("nb") - F.col("common")),
        )
    )
    return threshold_cluster(
        _vertices(signals), jac, sim_col="sim_attr", tau=tau
    ).withColumnRenamed("item", "np")


def cesi(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 0.58
) -> DataFrame:
    """(np, cluster): threshold clustering over the mean of the
    idf/embedding/PPDB similarities (embeddings + side information)."""
    pairs = signals.np_pairs.withColumn(
        "sim_cesi",
        0.5 * F.col("sim_emb") + 0.25 * F.col("sim_idf")
        + 0.25 * F.col("sim_ppdb"),
    )
    return threshold_cluster(
        _vertices(signals), pairs, sim_col="sim_cesi", tau=tau
    ).withColumnRenamed("item", "np")


def sist(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 0.55
) -> DataFrame:
    """(np, cluster): CESI's score augmented with source-text side
    information, modeled as the Jaccard overlap of the NPs' candidate
    entity sets (SIST's strongest extra signal is candidate entities of
    NPs inferred from the source text; set overlap is robust to a noisy
    top-1)."""
    sets = (
        signals.ent_cands.where(F.col("rank") <= 3)
        .groupBy("np").agg(F.collect_set("ent_id").alias("cands"))
    )
    pairs = (
        signals.np_pairs
        .join(sets.withColumnRenamed("np", "a")
                  .withColumnRenamed("cands", "ca"), "a", "left")
        .join(sets.withColumnRenamed("np", "b")
                  .withColumnRenamed("cands", "cb"), "b", "left")
        .withColumn(
            "sim_cand",
            F.when(
                F.col("ca").isNotNull() & F.col("cb").isNotNull(),
                F.size(F.array_intersect("ca", "cb"))
                / F.size(F.array_union("ca", "cb")),
            ).otherwise(0.0),
        )
        .withColumn(
            "sim_sist",
            0.45 * F.col("sim_emb") + 0.2 * F.col("sim_idf")
            + 0.2 * F.col("sim_ppdb") + 0.15 * F.col("sim_cand"),
        )
    )
    return threshold_cluster(
        _vertices(signals), pairs, sim_col="sim_sist", tau=tau
    ).withColumnRenamed("item", "np")


NP_CANON_BASELINES = {
    "Morph Norm": morph_norm,
    "Wikidata Integrator": wikidata_integrator,
    "Text Similarity": text_similarity,
    "IDF Token Overlap": idf_token_overlap,
    "Attribute Overlap": attribute_overlap,
    "CESI": cesi,
    "SIST": sist,
}
