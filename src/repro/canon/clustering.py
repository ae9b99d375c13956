"""Clustering over similarity graphs, as Spark dataflow.

Canonicalization outputs are clusters.  JOCL decodes clusters from the
pairwise canonicalization variables via connected components; the
HAC-at-threshold baselines ([13]'s Text Similarity / IDF Token Overlap
with hierarchical agglomerative clustering cut at a similarity
threshold) are realized as single-linkage threshold clustering, which
is exactly connected components of the ``sim >= tau`` graph.

Connected components run as iterative minimum-label propagation over
DataFrames (labels converge in O(diameter) rounds; alias/paraphrase
graphs have tiny diameters).  Lineage is truncated each round with
``localCheckpoint``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def connected_components(
    vertices: DataFrame,
    edges: DataFrame,
    *,
    vcol: str = "item",
    acol: str = "a",
    bcol: str = "b",
    max_iter: int = 50,
) -> DataFrame:
    """Label each vertex with the minimum vertex id of its component.

    ``vertices`` supplies the universe (singletons keep their own
    label); ``edges`` are undirected pairs.  Returns ``(item, cluster)``.
    """
    sym = edges.select(
        F.col(acol).alias("u"), F.col(bcol).alias("v")
    ).union(edges.select(F.col(bcol).alias("u"), F.col(acol).alias("v")))
    sym = sym.distinct().localCheckpoint(eager=True)

    labels = vertices.select(
        F.col(vcol).alias("u"), F.col(vcol).alias("cluster")
    ).localCheckpoint(eager=True)

    for _ in range(max_iter):
        neigh_min = (
            sym.join(labels.withColumnRenamed("u", "v"), on="v")
            .groupBy("u")
            .agg(F.min("cluster").alias("nmin"))
        )
        new_labels = (
            labels.join(neigh_min, on="u", how="left")
            .select(
                "u",
                F.least(
                    F.col("cluster"), F.coalesce(F.col("nmin"), F.col("cluster"))
                ).alias("cluster"),
            )
            .localCheckpoint(eager=True)
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), on="u")
            .where(F.col("n.cluster") != F.col("o.cluster"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    return labels.withColumnRenamed("u", vcol)


def threshold_cluster(
    vertices: DataFrame,
    pairs: DataFrame,
    *,
    sim_col: str,
    tau: float,
    vcol: str = "item",
    acol: str = "a",
    bcol: str = "b",
) -> DataFrame:
    """Single-linkage clustering cut at ``tau`` (HAC-threshold stand-in):
    connected components of the ``sim >= tau`` subgraph."""
    edges = pairs.where(F.col(sim_col) >= tau).select(acol, bcol)
    return connected_components(vertices, edges, vcol=vcol, acol=acol, bcol=bcol)


def clusters_from_pandas(
    spark: SparkSession, items: list[str], edges: list[tuple[str, str]]
) -> DataFrame:
    """Convenience wrapper for tests: cluster a small in-memory graph."""
    v = spark.createDataFrame([(i,) for i in items], ["item"])
    if edges:
        e = spark.createDataFrame(list(edges), ["a", "b"])
    else:
        e = spark.createDataFrame([], "a string, b string")
    return connected_components(v, e)
