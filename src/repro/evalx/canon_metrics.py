"""Canonicalization metrics: macro / micro / pairwise F1 (§4.1).

Definitions follow Galárraga et al. [13] (the paper adopts "the same
evaluation measures as previous works [13, 27, 50]"):

* **macro precision** — fraction of predicted clusters that are pure
  (all elements share one gold cluster); **macro recall** — the same
  with predicted and gold swapped.
* **micro precision** — purity: Σ over predicted clusters of the size
  of their largest gold-consistent subset, over N; micro recall — the
  transpose.
* **pairwise precision** — #element pairs co-clustered in both pred and
  gold over #pairs co-clustered in pred; recall — over #pairs
  co-clustered in gold.

``average F1`` is the mean of the three F1s, the paper's headline
canonicalization number.  Computation is a single contingency-table
aggregation in Spark.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _f1(p: float, r: float) -> float:
    return 2 * p * r / (p + r) if (p + r) > 0 else 0.0


@dataclass
class CanonScores:
    macro_p: float
    macro_r: float
    micro_p: float
    micro_r: float
    pair_p: float
    pair_r: float

    @property
    def macro_f1(self) -> float:
        return _f1(self.macro_p, self.macro_r)

    @property
    def micro_f1(self) -> float:
        return _f1(self.micro_p, self.micro_r)

    @property
    def pair_f1(self) -> float:
        return _f1(self.pair_p, self.pair_r)

    @property
    def average_f1(self) -> float:
        return (self.macro_f1 + self.micro_f1 + self.pair_f1) / 3.0

    def row(self) -> dict[str, float]:
        return {
            "macro_f1": round(self.macro_f1, 3),
            "micro_f1": round(self.micro_f1, 3),
            "pairwise_f1": round(self.pair_f1, 3),
            "average_f1": round(self.average_f1, 3),
        }


def canon_scores(assignments: DataFrame, *, pred: str = "pred",
                 gold: str = "gold") -> CanonScores:
    """Score a clustering given one row per item with its predicted and
    gold cluster labels."""
    cont = (
        assignments.groupBy(F.col(pred).alias("p"), F.col(gold).alias("g"))
        .agg(F.count("*").alias("n"))
        .cache()
    )

    def _side(key: str) -> tuple[int, int, float, float]:
        """(#clusters, #pure clusters, Σ max-overlap, Σ C(pairs,2))."""
        per = cont.groupBy(key).agg(
            F.count("*").alias("parts"),
            F.max("n").alias("mx"),
            F.sum("n").alias("sz"),
        )
        row = per.agg(
            F.count("*").alias("k"),
            F.sum((F.col("parts") == 1).cast("long")).alias("pure"),
            F.sum("mx").alias("hit"),
            F.sum(F.col("sz") * (F.col("sz") - 1) / 2).alias("pairs"),
        ).collect()[0]
        return row["k"], row["pure"], float(row["hit"]), float(row["pairs"])

    kp, purep, hitp, pairs_p = _side("p")
    kg, pureg, hitg, pairs_g = _side("g")
    n = float(assignments.count())
    pair_hits = float(
        cont.agg(F.sum(F.col("n") * (F.col("n") - 1) / 2)).collect()[0][0] or 0.0
    )
    cont.unpersist()
    return CanonScores(
        macro_p=purep / kp if kp else 0.0,
        macro_r=pureg / kg if kg else 0.0,
        micro_p=hitp / n if n else 0.0,
        micro_r=hitg / n if n else 0.0,
        pair_p=pair_hits / pairs_p if pairs_p else 0.0,
        pair_r=pair_hits / pairs_g if pairs_g else 0.0,
    )
