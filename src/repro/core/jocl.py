"""JOCL end-to-end pipeline: signals → factor graph → learn → infer.

Mirrors Figure 1(b): given an OIE dataset and its CKB, build the
canonicalization and linking signal tables, assemble the joint factor
graph, learn weights on the ReVerb validation fold (gradient ascent on
LBP marginals, lr = 0.05), run LBP to convergence, and decode clusters
plus links with conflict resolution.
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.canon.blocking import blocked_pairs
from repro.canon.signals import np_pair_signals, rp_pair_signals
from repro.core import factor_graph as fg
from repro.core.inference import DecodeResult, decode_variables, extract
from repro.core.learning import FitResult, fit_weights
from repro.core.lbp import run_lbp
from repro.linking.candidates import entity_candidates, relation_candidates
from repro.mining.amie import AMIESim
from repro.mining.kbp import KBPModel
from repro.okbgen.ckb import CKB, ckb_from_world
from repro.okbgen.okb import OKBDataset
from repro.text.similarity import idf_weights


@dataclass(frozen=True)
class JOCLConfig:
    """Hyper-parameters; defaults follow §4.1 where the paper states
    them (blocking τ = 0.5, lr = 0.05, LBP ≤ 20 iterations)."""

    tau_block: float = 0.5
    k_candidates: int = 5
    #: relations get a deeper list: CKB relation names are ontology-
    #: style, so string ranking is weak and the gold relation often
    #: sits below rank 5 (MAXK=8 caps this)
    k_rel_candidates: int = 8
    lbp_iters: int = 12
    learn_lbp_iters: int = 5
    epochs: int = 3
    lr: float = 0.05
    damping: float = 0.3
    amie_min_support: int = 2
    amie_min_confidence: float = 0.2
    np_feats: tuple[str, ...] = tuple(fg.NP_FEATS.values())
    rp_feats: tuple[str, ...] = tuple(fg.RP_FEATS.values())
    el_feats: tuple[str, ...] = tuple(fg.EL_FEATS.values())
    rl_feats: tuple[str, ...] = tuple(fg.RL_FEATS.values())
    use_canon: bool = True
    use_link: bool = True
    use_transitivity: bool = True
    use_fact_inclusion: bool = True
    use_consistency: bool = True


@dataclass
class SignalBundle:
    """All precomputed signal tables for one dataset."""

    triples: DataFrame
    ckb: CKB
    np_pairs: DataFrame | None
    rp_pairs: DataFrame | None
    ent_cands: DataFrame | None
    rel_cands: DataFrame | None
    np_freq: dict[str, int] = field(default_factory=dict)


def merged_idf(phrases: DataFrame, ds: OKBDataset,
               col: str = "phrase", *, stem: bool = False) -> dict[str, int]:
    """Corpus word frequencies plus the world's background counts."""
    freq = idf_weights(phrases, col, stem=stem)
    for w, n in ds.world.background_freq.items():
        freq[w] = freq.get(w, 0) + n
    return freq


def distinct_nps(triples: DataFrame) -> DataFrame:
    return (
        triples.select(F.col("subj").alias("np"))
        .union(triples.select(F.col("obj").alias("np")))
        .distinct()
    )


def distinct_rps(triples: DataFrame) -> DataFrame:
    return triples.select(F.col("pred").alias("rp")).distinct()


def build_signals(
    spark: SparkSession, ds: OKBDataset, config: JOCLConfig = JOCLConfig()
) -> SignalBundle:
    """Compute every signal table once (shared by JOCL and baselines)."""
    triples = ds.to_spark(spark).cache()
    ckb = ckb_from_world(spark, ds.world)

    bad = triples.where(
        F.col("subj").contains("|") | F.col("obj").contains("|")
        | F.col("pred").contains("|")
    ).limit(1).count()
    if bad:
        raise ValueError("phrases must not contain '|' (used in variable ids)")

    nps = distinct_nps(triples).cache()
    rps = distinct_rps(triples).cache()

    np_pairs = rp_pairs = ent_cands = rel_cands = None
    np_freq: dict[str, int] = {}

    if config.use_canon or config.use_link:
        # NP word frequencies over occurrences, as the paper defines
        # f(x); merged with the world's corpus-scale background counts
        # (real IDF statistics come from ClueWeb-scale text)
        occ = triples.select(F.col("subj").alias("phrase")).union(
            triples.select(F.col("obj").alias("phrase"))
        )
        np_freq = merged_idf(occ, ds)

    if config.use_canon:
        np_pairs = blocked_pairs(
            nps.withColumnRenamed("np", "phrase"), tau=config.tau_block,
            freq=np_freq,
        ).withColumnRenamed("phrase", "a")
        np_pairs = np_pair_signals(np_pairs, ds.embeddings, ds.ppdb)
        np_pairs = np_pairs.localCheckpoint(eager=True)

        # RP blocking runs on *stemmed* tokens so tense/plural verb
        # variants become candidate pairs (cf. the paper's morphological
        # normalization of triples in §3.1.4)
        rp_freq = merged_idf(
            triples.select(F.col("pred").alias("phrase")), ds, stem=True
        )
        rp_pairs = blocked_pairs(
            rps.withColumnRenamed("rp", "phrase"), tau=config.tau_block,
            freq=rp_freq, stem=True,
        )
        amie = AMIESim.mine(
            triples, min_support=config.amie_min_support,
            min_confidence=config.amie_min_confidence,
        )
        kbp = KBPModel.from_world(ds.world)
        rp_pairs = rp_pair_signals(rp_pairs, ds.embeddings, ds.ppdb, amie, kbp)
        rp_pairs = rp_pairs.localCheckpoint(eager=True)

    if config.use_link:
        ent_cands = entity_candidates(
            nps, ckb, ds.embeddings, ds.ppdb, k=config.k_candidates
        ).localCheckpoint(eager=True)
        rel_cands = relation_candidates(
            rps, ckb, ds.embeddings, ds.ppdb, k=config.k_rel_candidates
        ).localCheckpoint(eager=True)

    return SignalBundle(
        triples=triples, ckb=ckb, np_pairs=np_pairs, rp_pairs=rp_pairs,
        ent_cands=ent_cands, rel_cands=rel_cands, np_freq=np_freq,
    )


def build_jocl_graph(
    signals: SignalBundle, config: JOCLConfig = JOCLConfig()
) -> fg.FactorGraph:
    return fg.build_graph(
        np_pairs=signals.np_pairs,
        rp_pairs=signals.rp_pairs,
        ent_cands=signals.ent_cands,
        rel_cands=signals.rel_cands,
        triples=signals.triples,
        ckb_facts=signals.ckb.facts,
        np_feats=config.np_feats,
        rp_feats=config.rp_feats,
        el_feats=config.el_feats,
        rl_feats=config.rl_feats,
        use_transitivity=config.use_transitivity,
        use_fact_inclusion=config.use_fact_inclusion and config.use_link,
        use_consistency=(config.use_consistency and config.use_canon
                         and config.use_link),
    )


# ----------------------------------------------------- validation labels

def validation_labels(
    spark: SparkSession, ds: OKBDataset, signals: SignalBundle
) -> DataFrame:
    """Gold states for variables touching the validation fold
    (var_id, state) — the ``Y^L`` of eq. 5."""
    val = ds.triples[ds.triples["fold"] == "val"]
    val_nps = set(val["subj"]) | set(val["obj"])
    val_rps = set(val["pred"])
    gold_np = ds.gold_np_labels().set_index("np")["gold_ent"].to_dict()
    gold_rp = ds.gold_rp_labels().set_index("rp")["gold_rel"].to_dict()

    rows: list[tuple[str, int]] = []

    if signals.np_pairs is not None:
        for r in signals.np_pairs.select("a", "b").toPandas().itertuples():
            if r.a in val_nps and r.b in val_nps:
                same = gold_np.get(r.a) == gold_np.get(r.b)
                rows.append((f"npp:{r.a}|{r.b}", int(same)))
    if signals.rp_pairs is not None:
        for r in signals.rp_pairs.select("a", "b").toPandas().itertuples():
            if r.a in val_rps and r.b in val_rps:
                same = gold_rp.get(r.a) == gold_rp.get(r.b)
                rows.append((f"rpp:{r.a}|{r.b}", int(same)))
    if signals.ent_cands is not None:
        cands = signals.ent_cands.select("np", "ent_id", "rank").toPandas()
        for r in cands.itertuples():
            if r.np in val_nps and gold_np.get(r.np) == r.ent_id:
                rows.append((f"npl:{r.np}", int(r.rank) - 1))
    if signals.rel_cands is not None:
        cands = signals.rel_cands.select("rp", "rel_id", "rank").toPandas()
        for r in cands.itertuples():
            if r.rp in val_rps and gold_rp.get(r.rp) == r.rel_id:
                rows.append((f"rpl:{r.rp}", int(r.rank) - 1))

    if not rows:
        return spark.createDataFrame([], "var_id string, state int")
    return spark.createDataFrame(rows, ["var_id", "state"])


# ------------------------------------------------------------- pipeline

@dataclass
class JOCLResult:
    decode: DecodeResult
    weights: dict[str, float]
    lbp_iterations: int
    lbp_delta: float


def learn_jocl_weights(
    spark: SparkSession,
    ds: OKBDataset,
    config: JOCLConfig = JOCLConfig(),
    *,
    signals: SignalBundle | None = None,
) -> FitResult:
    """Train ω on the dataset's validation fold (the paper trains on
    ReVerb45K's fold and applies the weights to both test sets)."""
    signals = signals or build_signals(spark, ds, config)
    graph = build_jocl_graph(signals, config)
    labels = validation_labels(spark, ds, signals)
    return fit_weights(
        graph, labels, epochs=config.epochs, lr=config.lr,
        lbp_iters=config.learn_lbp_iters, damping=config.damping,
    )


def run_jocl(
    spark: SparkSession,
    ds: OKBDataset,
    config: JOCLConfig = JOCLConfig(),
    *,
    weights: dict[str, float] | None = None,
    signals: SignalBundle | None = None,
) -> JOCLResult:
    """Full inference pass; ``weights=None`` uses uniform ω = 1."""
    signals = signals or build_signals(spark, ds, config)
    graph = build_jocl_graph(signals, config).checkpointed()
    if weights is None:
        weights = {f: 1.0 for f in graph.feat_names}
    state = run_lbp(
        graph, weights, max_iter=config.lbp_iters, damping=config.damping
    )
    decoded = decode_variables(state, graph)
    dec = extract(spark, decoded)
    return JOCLResult(
        decode=dec, weights=dict(weights),
        lbp_iterations=state.iterations, lbp_delta=state.delta,
    )


# -------------------------------------------------------------- helpers

def clusters_with_singletons(
    all_items: DataFrame, clusters: DataFrame | None, *, key: str
) -> DataFrame:
    """Every item gets a cluster; items outside the blocked-pair graph
    are singletons labeled by themselves."""
    if clusters is None:
        return all_items.select(F.col(key), F.col(key).alias("cluster"))
    return (
        all_items.join(clusters, on=key, how="left")
        .withColumn("cluster", F.coalesce(F.col("cluster"), F.col(key)))
    )
