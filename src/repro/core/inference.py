"""Decoding: marginals → labels, plus conflict resolution (§3.5).

The best label of each variable is its max-marginal state.  The
canonicalization output is the connected components of the pairs
decoded to 1; the linking output is the decoded candidate per phrase.

Conflicts (a pair decoded "same meaning" whose two phrases link to
different entities) are resolved exactly as the paper prescribes: "we
select the label of the larger group as the final label for both NPs",
where a group is the set of phrases linked to one entity.  The decoded
tables are phrase-level and small (thousands of rows), so conflict
resolution runs on the driver in pandas; everything upstream stays in
Spark.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.canon.clustering import connected_components
from repro.core.factor_graph import FactorGraph
from repro.core.lbp import LBPState, var_beliefs


def decode_variables(state: LBPState, graph: FactorGraph) -> DataFrame:
    """(var_id, vtype, state, label) — the argmax state per variable."""
    vb = var_beliefs(state, graph.var_states)
    w = Window.partitionBy("var_id").orderBy(F.desc("logp"), F.asc("state"))
    return (
        vb.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select("var_id", "vtype", "state", "label")
    )


def _split_pair(df: DataFrame, prefix: str) -> DataFrame:
    """'npp:a|b' rows -> (a, b, on) — phrases never contain '|'
    (enforced by the generators; asserted in jocl.py)."""
    body = F.expr(f"substring(var_id, {len(prefix) + 1}, 100000)")
    return df.select(
        F.split(body, r"\|").getItem(0).alias("a"),
        F.split(body, r"\|").getItem(1).alias("b"),
        (F.col("state") == 1).alias("on"),
    )


def _strip_prefix(df: DataFrame, prefix: str, out: str) -> DataFrame:
    body = F.expr(f"substring(var_id, {len(prefix) + 1}, 100000)")
    return df.select(body.alias(out), F.col("label"))


@dataclass
class DecodeResult:
    """Final JOCL outputs (all Spark DataFrames; empty when the variant
    dropped the corresponding task)."""

    np_clusters: DataFrame | None   # (np, cluster)
    rp_clusters: DataFrame | None   # (rp, cluster)
    np_links: DataFrame | None      # (np, ent_id)
    rp_links: DataFrame | None      # (rp, rel_id)


def resolve_conflicts(links: pd.DataFrame, edges: pd.DataFrame,
                      key: str, label: str) -> pd.DataFrame:
    """Paper §3.5: for every pair decoded 1 whose phrases carry
    different link labels, relabel both phrases with the label of the
    larger linking group.  Processed in descending winner-group size so
    later relabelings cannot undo a bigger group's win."""
    links = links.copy()
    lab_of = dict(zip(links[key], links[label]))
    sizes = links.groupby(label)[key].size().to_dict()

    conflicts = []
    for a, b in edges[["a", "b"]].itertuples(index=False):
        la, lb = lab_of.get(a), lab_of.get(b)
        if la is None or lb is None or la == lb:
            continue
        win, lose = (la, lb) if sizes.get(la, 0) >= sizes.get(lb, 0) else (lb, la)
        conflicts.append((sizes.get(win, 0), a, b, win))
    for _, a, b, win in sorted(conflicts, key=lambda t: -t[0]):
        lab_of[a] = lab_of[b] = win
    links[label] = links[key].map(lab_of)
    return links


def extract(
    spark: SparkSession,
    decoded: DataFrame,
    *,
    resolve: bool = True,
) -> DecodeResult:
    """Turn decoded variables into the four output tables."""
    decoded = decoded.cache()

    def _maybe(vtype: str) -> DataFrame | None:
        d = decoded.where(F.col("vtype") == vtype)
        return d if d.limit(1).count() else None

    out: dict[str, DataFrame | None] = {
        "np_clusters": None, "rp_clusters": None,
        "np_links": None, "rp_links": None,
    }

    for pair_t, link_t, pfx, lpfx, key, lab, ckey, lkey in (
        ("npp", "npl", "npp:", "npl:", "np", "ent_id", "np_clusters", "np_links"),
        ("rpp", "rpl", "rpp:", "rpl:", "rp", "rel_id", "rp_clusters", "rp_links"),
    ):
        pairs_d = _maybe(pair_t)
        links_d = _maybe(link_t)

        links_pd = None
        if links_d is not None:
            links_pd = _strip_prefix(links_d, lpfx, key).toPandas()
            links_pd[lab] = links_pd.pop("label").astype("int64")

        edges_pd = None
        if pairs_d is not None:
            all_pairs = _split_pair(pairs_d, pfx).toPandas()
            edges_pd = all_pairs[all_pairs["on"]][["a", "b"]]

        # §3.5 states the larger-group rule for *NP* pairs; applying it
        # to RPs demonstrably propagates a wrong-majority relation
        # through the (large) RP clusters and costs ~20 points of
        # relation-linking accuracy.
        if (links_pd is not None and edges_pd is not None and resolve
                and key == "np"):
            links_pd = resolve_conflicts(links_pd, edges_pd, key, lab)

        if links_pd is not None:
            out[lkey] = spark.createDataFrame(links_pd)

        if pairs_d is not None:
            # Final canonicalization groups: components over the pairs
            # decoded 1 *plus* same-link chains.  The linking edges are
            # required by the paper's own running example — "University
            # of Maryland" and "UMD" share no token, so no pair variable
            # exists, yet Figure 1 clusters them: only their common
            # entity link can merge them (Assumption 1).
            vert_series = [all_pairs["a"], all_pairs["b"]]
            edge_frames = [edges_pd]
            # NP-only, like conflict resolution: relation links are too
            # inaccurate (relation linking is the hardest task, §4.3.2)
            # for same-link merging to help RP clusters.
            if links_pd is not None and key == "np":
                vert_series.append(links_pd[key])
                chains = links_pd.sort_values([lab, key]).groupby(lab)[key]
                link_edges = [
                    (g[i], g[i + 1])
                    for g in (list(v) for _, v in chains)
                    for i in range(len(g) - 1)
                ]
                if link_edges:
                    edge_frames.append(
                        pd.DataFrame(link_edges, columns=["a", "b"])
                    )
            vertices = spark.createDataFrame(
                pd.concat(vert_series).drop_duplicates().to_frame(name="item")
            )
            edges_all = pd.concat(edge_frames, ignore_index=True)
            edges = spark.createDataFrame(edges_all) if len(edges_all) else (
                spark.createDataFrame([], "a string, b string")
            )
            out[ckey] = connected_components(vertices, edges).withColumnRenamed(
                "item", key
            )

    return DecodeResult(**out)
