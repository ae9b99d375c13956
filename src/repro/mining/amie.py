"""AMIE-style implication-rule mining over OIE triples (§3.1.4 "AMIE").

This is a real implementation of the statistical rule mining JOCL uses
as an RP-canonicalization signal — not a proxy.  Following AMIE [14]
restricted to the rule shape the paper needs (``p_i(x, y) ⇒ p_j(x, y)``
between two relation phrases):

* triples are morphologically normalized first ("We take morphological
  normalized OIE triples as the input of AMIE");
* ``support(p_i ⇒ p_j)``  = #distinct (x, y) with p_i(x,y) ∧ p_j(x,y);
* ``confidence(p_i ⇒ p_j)`` = support / #distinct (x, y) with p_i(x,y);
* two RPs are equivalent (``Sim_AMIE`` = 1) iff **both** directions pass
  the support and confidence thresholds.

All counting is Spark SQL over the triple DataFrame (self-join on the
normalized argument pair), so it scales with the OKB.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.text.tokens import morph_normalize


def normalized_triples(triples: DataFrame) -> DataFrame:
    """Distinct morph-normalized (ns, np, no) view of an OIE triple set."""
    from pyspark.sql.types import StringType

    norm = F.udf(lambda s: morph_normalize(s), StringType())
    return (
        triples.select(
            norm("subj").alias("ns"), norm("pred").alias("np"), norm("obj").alias("no")
        )
        .where((F.col("ns") != "") & (F.col("no") != ""))
        .distinct()
    )


def mine_rules(
    triples: DataFrame, *, min_support: int = 2, min_confidence: float = 0.2
) -> DataFrame:
    """All directed rules ``p1 ⇒ p2`` passing the thresholds.

    Returns a DataFrame ``(p1, p2, support, confidence)`` over
    *normalized* relation phrases.
    """
    t = normalized_triples(triples).cache()
    joint = (
        t.alias("a")
        .join(t.alias("b"), on=["ns", "no"])
        .where(F.col("a.np") != F.col("b.np"))
        .groupBy(F.col("a.np").alias("p1"), F.col("b.np").alias("p2"))
        .agg(F.count("*").alias("support"))
    )
    body = t.groupBy(F.col("np").alias("p1")).agg(F.count("*").alias("body_n"))
    return (
        joint.join(body, on="p1")
        .withColumn("confidence", F.col("support") / F.col("body_n"))
        .where(
            (F.col("support") >= min_support)
            & (F.col("confidence") >= min_confidence)
        )
        .select("p1", "p2", "support", "confidence")
    )


def equivalent_pairs(
    triples: DataFrame, *, min_support: int = 2, min_confidence: float = 0.2
) -> DataFrame:
    """Unordered normalized-RP pairs with bidirectional rules
    (``Sim_AMIE = 1``): DataFrame ``(p1, p2)`` with ``p1 < p2``."""
    rules = mine_rules(
        triples, min_support=min_support, min_confidence=min_confidence
    )
    fwd = rules.select("p1", "p2")
    bwd = rules.select(F.col("p2").alias("p1"), F.col("p1").alias("p2"))
    both = fwd.intersect(bwd)
    return both.where(F.col("p1") < F.col("p2")).distinct()


class AMIESim:
    """``Sim_AMIE`` over raw RP strings.

    Two raw RPs score 1 iff their normalized forms are equal or form a
    mined bidirectional equivalence; else 0.  The equivalence set is
    collected to the driver (it is tiny relative to the triple set) so
    the similarity is usable inside pandas UDFs.
    """

    def __init__(self, equiv: set[tuple[str, str]]):
        self.equiv = set(equiv)

    @classmethod
    def mine(
        cls, triples: DataFrame, *, min_support: int = 2, min_confidence: float = 0.2
    ) -> "AMIESim":
        pairs = equivalent_pairs(
            triples, min_support=min_support, min_confidence=min_confidence
        ).collect()
        return cls({(r["p1"], r["p2"]) for r in pairs})

    def sim(self, a: str, b: str) -> float:
        na, nb = morph_normalize(a), morph_normalize(b)
        if na == nb:
            return 1.0
        key = (na, nb) if na < nb else (nb, na)
        return 1.0 if key in self.equiv else 0.0

    def sim_series(self, a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [self.sim(x, y) for x, y in zip(a, b)], index=a.index, dtype="float64"
        )
