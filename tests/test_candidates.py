"""Candidate generation tests — popularity prior checked against DuckDB."""
import pytest
from pyspark.sql import functions as F

from repro.linking.candidates import entity_candidates, relation_candidates
from repro.okbgen.ckb import ckb_from_world


@pytest.fixture(scope="module")
def ckb(spark, reverb_tiny):
    return ckb_from_world(spark, reverb_tiny.world)


@pytest.fixture(scope="module")
def ent_cands(spark, reverb_tiny, ckb):
    nps = spark.createDataFrame(
        reverb_tiny.gold_np_labels()[["np"]].drop_duplicates()
    )
    return entity_candidates(
        nps, ckb, reverb_tiny.embeddings, reverb_tiny.ppdb, k=5
    ).cache()


def test_popularity_matches_duckdb(spark, reverb_tiny, ent_cands):
    """f_pop must equal count(s, e) / count(s) over the anchor table,
    restricted to the top-5 candidates per NP."""
    from repro.oracle import assert_equivalent

    got = ent_cands.select("np", "ent_id", "f_pop")
    nps = reverb_tiny.gold_np_labels()[["np"]].drop_duplicates()
    sql = """
        WITH hits AS (
            SELECT n.np, a.ent_id, a.count
            FROM nps n JOIN anchors a ON a.surface = n.np
        ), ranked AS (
            SELECT np, ent_id,
                   count * 1.0 / SUM(count) OVER (PARTITION BY np) AS f_pop,
                   ROW_NUMBER() OVER (PARTITION BY np
                                      ORDER BY count DESC, ent_id) AS rk
            FROM hits
        )
        SELECT np, ent_id, f_pop FROM ranked WHERE rk <= 5
    """
    assert_equivalent(got, sql, nps=nps, anchors=reverb_tiny.world.anchors)


def test_rank_orders_by_anchor_count(ent_cands):
    rows = ent_cands.orderBy("np", "rank").collect()
    by_np = {}
    for r in rows:
        by_np.setdefault(r["np"], []).append(r)
    for np_rows in by_np.values():
        pops = [r["f_pop"] for r in np_rows]
        assert pops == sorted(pops, reverse=True)
        assert [r["rank"] for r in np_rows] == list(range(1, len(np_rows) + 1))


def test_candidate_cap(ent_cands):
    per_np = ent_cands.groupBy("np").count().agg(F.max("count")).collect()[0][0]
    assert per_np <= 5


def test_signal_ranges(ent_cands):
    row = ent_cands.agg(
        F.min("f_pop"), F.max("f_pop"), F.min("f_emb"), F.max("f_emb"),
        F.min("f_ppdb"), F.max("f_ppdb"),
    ).collect()[0]
    assert 0.0 < row[0] and row[1] <= 1.0
    assert 0.0 <= row[2] and row[3] <= 1.0
    assert row[4] in (0.0, 1.0) or 0.0 <= row[4] <= 1.0


def test_candidate_recall_reasonable(spark, reverb_tiny, ent_cands):
    """Most NPs' gold entity must appear among their candidates —
    otherwise the linking task would be unlearnable for every system."""
    gold = spark.createDataFrame(reverb_tiny.gold_np_labels())
    nps_with = ent_cands.select("np").distinct().count()
    hit = (
        ent_cands.join(gold, on="np")
        .where(F.col("ent_id") == F.col("gold_ent"))
        .select("np").distinct().count()
    )
    total = gold.count()
    assert nps_with / total > 0.7
    assert hit / total > 0.6


def test_relation_candidates_schema_and_cap(spark, reverb_tiny, ckb):
    rps = spark.createDataFrame(reverb_tiny.gold_rp_labels()[["rp"]])
    rc = relation_candidates(
        rps, ckb, reverb_tiny.embeddings, reverb_tiny.ppdb, k=4
    ).cache()
    assert {"rp", "rel_id", "f_ngram", "f_ld", "f_emb", "f_ppdb", "rank"} <= set(
        rc.columns
    )
    assert rc.groupBy("rp").count().agg(F.max("count")).collect()[0][0] <= 4
    # every RP gets candidates: the relation catalog is searched directly
    assert rc.select("rp").distinct().count() == rps.count()


def test_relation_candidate_scores_bounded(spark, reverb_tiny, ckb):
    rps = spark.createDataFrame(reverb_tiny.gold_rp_labels()[["rp"]])
    rc = relation_candidates(
        rps, ckb, reverb_tiny.embeddings, reverb_tiny.ppdb, k=3
    )
    row = rc.agg(
        F.min("f_ngram"), F.max("f_ngram"), F.min("f_ld"), F.max("f_ld")
    ).collect()[0]
    assert 0.0 <= row[0] and row[1] <= 1.0
    assert 0.0 <= row[2] and row[3] <= 1.0
