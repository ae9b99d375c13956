"""OKB linking accuracy (§4.1).

"the number of correctly linked NPs (RPs) divided by the total number
of all NPs (RPs)" — counted over *occurrences* (each NP slot of each
triple), so an unlinked occurrence (no candidates survived) counts as
wrong, exactly as it would for a deployed linker.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def linking_accuracy(
    occurrences: DataFrame,
    links: DataFrame,
    *,
    phrase: str = "np",
    gold: str = "gold",
    link: str = "ent_id",
) -> float:
    """Accuracy of a phrase -> id linking table against per-occurrence gold.

    ``occurrences``: one row per slot occurrence with columns
    ``(phrase, gold)``.  ``links``: one row per distinct phrase with the
    predicted id in ``link`` (missing phrases count as wrong).
    """
    joined = occurrences.join(
        links.select(F.col(phrase), F.col(link).alias("_pred")),
        on=phrase,
        how="left",
    )
    row = joined.agg(
        F.count("*").alias("n"),
        F.sum((F.col("_pred") == F.col(gold)).cast("long")).alias("ok"),
    ).collect()[0]
    return (row["ok"] or 0) / row["n"] if row["n"] else 0.0


def np_occurrences(triples: DataFrame) -> DataFrame:
    """(np, gold) per NP slot occurrence: subjects and objects stacked."""
    s = triples.select(
        F.col("subj").alias("np"), F.col("gold_subj").alias("gold")
    )
    o = triples.select(F.col("obj").alias("np"), F.col("gold_obj").alias("gold"))
    return s.union(o)


def rp_occurrences(triples: DataFrame) -> DataFrame:
    """(rp, gold) per predicate occurrence."""
    return triples.select(
        F.col("pred").alias("rp"), F.col("gold_rel").alias("gold")
    )
