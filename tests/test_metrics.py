"""Canonicalization metrics (macro/micro/pairwise) and linking accuracy.

The contingency aggregation is cross-checked against DuckDB via the
oracle; the metric values are checked against hand computations on the
classic examples.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.evalx.canon_metrics import CanonScores, canon_scores
from repro.evalx.linking_metrics import (
    linking_accuracy,
    np_occurrences,
    rp_occurrences,
)


def _asg(spark, rows):
    return spark.createDataFrame(rows, ["item", "pred", "gold"])


def test_perfect_clustering(spark):
    rows = [("a", "c1", "g1"), ("b", "c1", "g1"), ("c", "c2", "g2")]
    s = canon_scores(_asg(spark, rows))
    assert s.macro_f1 == 1.0
    assert s.micro_f1 == 1.0
    assert s.pair_f1 == 1.0
    assert s.average_f1 == 1.0


def test_all_singletons_vs_one_gold_cluster(spark):
    rows = [("a", "ca", "g"), ("b", "cb", "g"), ("c", "cc", "g")]
    s = canon_scores(_asg(spark, rows))
    # every predicted cluster is pure -> macro precision 1; the gold
    # cluster is split -> macro recall 0
    assert s.macro_p == 1.0
    assert s.macro_r == 0.0
    assert s.macro_f1 == 0.0
    # micro: every predicted cluster maps fully -> precision 1;
    # gold's best predicted overlap is 1 of 3
    assert s.micro_p == 1.0
    assert s.micro_r == pytest.approx(1 / 3)
    # no predicted pairs -> pairwise precision 0 by convention
    assert s.pair_p == 0.0
    assert s.pair_r == 0.0


def test_one_big_cluster(spark):
    rows = [("a", "c", "g1"), ("b", "c", "g1"), ("x", "c", "g2")]
    s = canon_scores(_asg(spark, rows))
    assert s.macro_p == 0.0  # the single predicted cluster is impure
    assert s.macro_r == 1.0  # both gold clusters sit inside one pred cluster
    # micro precision: max overlap 2 of 3
    assert s.micro_p == pytest.approx(2 / 3)
    assert s.micro_r == 1.0
    # pairs: predicted C(3,2)=3, gold C(2,2)=1, hits 1
    assert s.pair_p == pytest.approx(1 / 3)
    assert s.pair_r == 1.0


def test_macro_recall_counts_contained_gold_clusters(spark):
    # g1 fully inside c1 (with an impurity), g2 split across c1/c2
    rows = [("a", "c1", "g1"), ("b", "c1", "g1"), ("x", "c1", "g2"),
            ("y", "c2", "g2")]
    s = canon_scores(_asg(spark, rows))
    assert s.macro_r == pytest.approx(1 / 2)
    assert s.macro_p == pytest.approx(1 / 2)


def test_textbook_mixed_case(spark):
    rows = [
        ("a", "c1", "g1"), ("b", "c1", "g1"), ("c", "c1", "g2"),
        ("d", "c2", "g2"), ("e", "c2", "g2"),
        ("f", "c3", "g3"),
    ]
    s = canon_scores(_asg(spark, rows))
    assert s.macro_p == pytest.approx(2 / 3)
    assert s.macro_r == pytest.approx(2 / 3)
    assert s.micro_p == pytest.approx((2 + 2 + 1) / 6)
    assert s.micro_r == pytest.approx((2 + 2 + 1) / 6)
    # pred pairs: C(3,2)+C(2,2)=4; gold pairs: C(2,2)+C(3,2)=4
    # hits: (a,b) + (d,e) = 2
    assert s.pair_p == pytest.approx(0.5)
    assert s.pair_r == pytest.approx(0.5)


def test_contingency_vs_duckdb(spark):
    pdf = pd.DataFrame(
        {
            "item": list("abcdefgh"),
            "pred": ["p1", "p1", "p2", "p2", "p2", "p3", "p3", "p4"],
            "gold": ["g1", "g2", "g1", "g1", "g3", "g2", "g2", "g3"],
        }
    )
    df = spark.createDataFrame(pdf)
    got = df.groupBy("pred", "gold").agg(F.count("*").alias("n"))
    from repro.oracle import assert_equivalent

    assert_equivalent(
        got,
        "SELECT pred, gold, COUNT(*) AS n FROM asg GROUP BY pred, gold",
        asg=pdf,
    )


def test_f1_zero_guard():
    s = CanonScores(0, 0, 0, 0, 0, 0)
    assert s.macro_f1 == 0.0
    assert s.average_f1 == 0.0


def test_row_rounding():
    s = CanonScores(1, 1, 1, 1, 1, 1)
    assert s.row() == {"macro_f1": 1.0, "micro_f1": 1.0,
                       "pairwise_f1": 1.0, "average_f1": 1.0}


# -------------------------------------------------------------- linking

def test_linking_accuracy_counts_occurrences(spark):
    occ = spark.createDataFrame(
        [("umd", 1), ("umd", 1), ("paris", 2)], ["np", "gold"]
    )
    links = spark.createDataFrame([("umd", 1), ("paris", 9)], ["np", "ent_id"])
    # umd occurs twice (both right), paris once (wrong) -> 2/3
    assert linking_accuracy(occ, links) == pytest.approx(2 / 3)


def test_unlinked_phrase_counts_wrong(spark):
    occ = spark.createDataFrame([("a", 1), ("b", 2)], ["np", "gold"])
    links = spark.createDataFrame([("a", 1)], ["np", "ent_id"])
    assert linking_accuracy(occ, links) == pytest.approx(0.5)


def test_occurrence_extractors(spark, reverb_tiny):
    t = reverb_tiny.to_spark(spark)
    nps = np_occurrences(t)
    assert nps.count() == 2 * t.count()
    rps = rp_occurrences(t)
    assert rps.count() == t.count()
    assert set(nps.columns) == {"np", "gold"}
    assert set(rps.columns) == {"rp", "gold"}
