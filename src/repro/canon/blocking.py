"""Candidate pair generation for canonicalization variables.

"As it is unnecessary and impractical to generate canonicalization
variables for all pairs of NPs and RPs in the factor graph, we generate
canonicalization variables only for NP (RP) pairs with a relatively
high similarity based on IDF token overlap, whose threshold is set to
0.5."  (§4.1)

The classic data-integration blocking pattern: explode phrases into an
inverted token index, self-join on tokens to get candidate pairs (IDF
overlap is 0 without a shared token, so no candidate is lost), then
score each candidate with ``Sim_idf`` and filter at the threshold.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType

from repro.text.similarity import idf_token_overlap, idf_weights
from repro.text.tokens import with_tokens


def blocked_pairs(
    phrases: DataFrame,
    *,
    col: str = "phrase",
    tau: float = 0.5,
    freq: dict[str, int] | None = None,
    stem: bool = False,
) -> DataFrame:
    """Unordered phrase pairs with ``sim_idf >= tau``.

    ``phrases`` must contain distinct phrases in ``col``; the result has
    columns ``(a, b, sim_idf)`` with ``a < b``.  ``freq`` is the corpus
    word-frequency table (computed from ``phrases`` itself if omitted —
    callers working on a full triple set should pass frequencies
    computed over *all* NP occurrences, as the paper defines ``f(x)``
    over the collection of words appearing in the OIE triples).
    """
    if freq is None:
        freq = idf_weights(phrases, col, stem=stem)

    toks = phrases.select(
        F.col(col).alias("phrase"),
        F.explode(with_tokens(col, stem=stem)).alias("tok"),
    ).distinct()
    cand = (
        toks.alias("l")
        .join(toks.alias("r"), on="tok")
        .where(F.col("l.phrase") < F.col("r.phrase"))
        .select(F.col("l.phrase").alias("a"), F.col("r.phrase").alias("b"))
        .distinct()
    )

    @F.pandas_udf(DoubleType())
    def sim_udf(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [idf_token_overlap(x, y, freq, stem=stem) for x, y in zip(a, b)],
            index=a.index,
            dtype="float64",
        )

    return cand.withColumn("sim_idf", sim_udf("a", "b")).where(
        F.col("sim_idf") >= tau
    )
