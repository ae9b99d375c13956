"""AMIE rule-mining tests — support/confidence checked against DuckDB
via the oracle on the same normalized-triple view."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.mining.amie import (
    AMIESim,
    equivalent_pairs,
    mine_rules,
    normalized_triples,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def triples(spark):
    rows = [
        # "capital of" <=> "capital city of" on three shared facts
        ("paris", "capital of", "france"),
        ("paris", "capital city of", "france"),
        ("rome", "capital of", "italy"),
        ("rome", "capital city of", "italy"),
        ("berlin", "capital of", "germany"),
        ("berlin", "capital city of", "germany"),
        # "located in" implies "part of" but not vice versa
        ("nice", "located in", "france"),
        ("nice", "part of", "france"),
        ("lyon", "located in", "france"),
        ("lyon", "part of", "france"),
        ("x1", "part of", "y1"),
        ("x2", "part of", "y2"),
        ("x3", "part of", "y3"),
        ("x4", "part of", "y4"),
        # singleton relation, below support
        ("a", "borders", "b"),
        ("a", "touches", "b"),
    ]
    return spark.createDataFrame(rows, ["subj", "pred", "obj"])


def test_normalized_triples_distinct_and_normalized(spark, triples):
    n = normalized_triples(triples)
    rows = {(r["ns"], r["np"], r["no"]) for r in n.collect()}
    # morph normalization strips the plural-looking -s of "paris" too
    assert ("pari", "capital", "france") in rows
    assert ("berlin", "capital city", "germany") in rows
    assert n.count() == len(rows)


def test_rule_support_and_confidence_vs_duckdb(spark, triples):
    rules = mine_rules(triples, min_support=1, min_confidence=0.0)
    n = normalized_triples(triples).toPandas()
    sql = """
        WITH joint AS (
            SELECT a.np AS p1, b.np AS p2, COUNT(*) AS support
            FROM t a JOIN t b USING (ns, no)
            WHERE a.np <> b.np GROUP BY a.np, b.np
        ), body AS (
            SELECT np AS p1, COUNT(*) AS body_n FROM t GROUP BY np
        )
        SELECT j.p1, j.p2, j.support,
               j.support / CAST(b.body_n AS DOUBLE) AS confidence
        FROM joint j JOIN body b USING (p1)
    """
    assert_equivalent(rules, sql, t=n)


def test_bidirectional_equivalence(spark, triples):
    pairs = {(r["p1"], r["p2"])
             for r in equivalent_pairs(triples, min_support=2,
                                       min_confidence=0.5).collect()}
    assert ("capital", "capital city") in pairs


def test_one_directional_rule_not_equivalent(spark, triples):
    pairs = {(r["p1"], r["p2"])
             for r in equivalent_pairs(triples, min_support=2,
                                       min_confidence=0.5).collect()}
    # "located" => "part" has conf 1.0 but "part" => "located" only 2/6
    assert not any("locat" in a or "locat" in b for a, b in pairs)


def test_support_threshold(spark, triples):
    pairs = equivalent_pairs(triples, min_support=2, min_confidence=0.5)
    assert not any(
        "border" in r["p1"] or "border" in r["p2"] for r in pairs.collect()
    )


def test_amiesim_raw_phrases(spark, triples):
    sim = AMIESim.mine(triples, min_support=2, min_confidence=0.5)
    assert sim.sim("capital of", "capital city of") == 1.0
    assert sim.sim("is the capital of", "capital of") == 1.0  # morph-equal
    assert sim.sim("located in", "part of") == 0.0
    out = sim.sim_series(pd.Series(["capital of"]), pd.Series(["borders"]))
    assert list(out) == [0.0]
