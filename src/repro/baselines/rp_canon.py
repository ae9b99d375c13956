"""RP canonicalization baselines of Table 2.

* **AMIE** [14] — clusters from mined bidirectional implication rules
  only (plus trivial morph-class identity).  Low coverage: most RPs
  appear fewer times than the support threshold, so AMIE leaves them
  singletons — the paper's explanation for its last place.
* **PATTY** [36] — relational-pattern synsets: RPs supported by the
  same NP argument pairs fall in one synset (plus morph classes).
* **SIST** [27] — threshold clustering over the combined
  idf/embedding/PPDB/AMIE/KBP pair score.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import StringType

from repro.canon.clustering import connected_components, threshold_cluster
from repro.core.jocl import SignalBundle, distinct_rps
from repro.mining.amie import equivalent_pairs, normalized_triples
from repro.text.tokens import morph_normalize


def _vertices(signals: SignalBundle) -> DataFrame:
    return distinct_rps(signals.triples).withColumnRenamed("rp", "item")


def _norm_edges(signals: SignalBundle) -> DataFrame:
    """Edges joining raw RPs with equal morph-normalized form."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    rp = distinct_rps(signals.triples).withColumn("n", norm("rp"))
    return (
        rp.alias("l").join(rp.alias("r"), on="n")
        .where(F.col("l.rp") < F.col("r.rp"))
        .select(F.col("l.rp").alias("a"), F.col("r.rp").alias("b"))
    )


def _norm_rule_edges(signals: SignalBundle, rules: DataFrame) -> DataFrame:
    """Lift normalized-form rule pairs back to raw RP edges."""
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    rp = distinct_rps(signals.triples).withColumn("n", norm("rp"))
    return (
        rules.join(rp.select(F.col("rp").alias("a"), F.col("n").alias("p1")), "p1")
        .join(rp.select(F.col("rp").alias("b"), F.col("n").alias("p2")), "p2")
        .where(F.col("a") != F.col("b"))
        .select("a", "b")
    )


def amie_baseline(
    spark: SparkSession, signals: SignalBundle, *,
    min_support: int = 2, min_confidence: float = 0.2,
) -> DataFrame:
    """(rp, cluster): components of morph-identity ∪ mined-rule edges."""
    rules = equivalent_pairs(
        signals.triples, min_support=min_support,
        min_confidence=min_confidence,
    )
    edges = _norm_edges(signals).union(_norm_rule_edges(signals, rules))
    return connected_components(_vertices(signals), edges).withColumnRenamed(
        "item", "rp"
    )


def patty(
    spark: SparkSession, signals: SignalBundle, *, min_shared: int = 3
) -> DataFrame:
    """(rp, cluster): synsets of RPs sharing >= ``min_shared`` distinct
    normalized NP argument pairs, unioned with morph classes."""
    t = normalized_triples(signals.triples)
    # map normalized predicates back to raw RPs via their support sets
    norm = F.udf(lambda s: morph_normalize(s), StringType())
    raw = distinct_rps(signals.triples).withColumn("np", norm("rp"))
    support = t.join(raw, on="np").select("rp", "ns", "no").distinct()
    shared = (
        support.alias("l")
        .join(support.alias("r"), on=["ns", "no"])
        .where(F.col("l.rp") < F.col("r.rp"))
        .groupBy(F.col("l.rp").alias("a"), F.col("r.rp").alias("b"))
        .agg(F.count("*").alias("n"))
        .where(F.col("n") >= min_shared)
        .select("a", "b")
    )
    edges = _norm_edges(signals).union(shared)
    return connected_components(_vertices(signals), edges).withColumnRenamed(
        "item", "rp"
    )


def sist_rp(
    spark: SparkSession, signals: SignalBundle, *, tau: float = 0.5
) -> DataFrame:
    """(rp, cluster): threshold clustering over a weighted blend of all
    five RP pair signals (the sparse binary signals — PPDB, AMIE, KBP —
    get smaller weights so their misses cannot veto a merge two dense
    signals support)."""
    pairs = signals.rp_pairs.withColumn(
        "sim_sist",
        0.3 * F.col("sim_idf") + 0.3 * F.col("sim_emb")
        + 0.15 * F.col("sim_ppdb") + 0.15 * F.col("sim_amie")
        + 0.1 * F.col("sim_kbp"),
    )
    return threshold_cluster(
        _vertices(signals), pairs, sim_col="sim_sist", tau=tau
    ).withColumnRenamed("item", "rp")


RP_CANON_BASELINES = {
    "AMIE": amie_baseline,
    "PATTY": patty,
    "SIST": sist_rp,
}
