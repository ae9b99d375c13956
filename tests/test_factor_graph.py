"""Factor-graph construction invariants on hand-built signal tables."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import factor_graph as fg


@pytest.fixture(scope="module")
def np_pairs(spark):
    return spark.createDataFrame(pd.DataFrame({
        "a": ["x", "x", "y"],
        "b": ["y", "z", "z"],
        "sim_idf": [0.9, 0.8, 0.2],
        "sim_emb": [0.85, 0.7, 0.3],
        "sim_ppdb": [1.0, 0.0, 0.0],
    }))


@pytest.fixture(scope="module")
def ent_cands(spark):
    return spark.createDataFrame(pd.DataFrame({
        "np": ["x", "x", "y", "z"],
        "ent_id": [10, 11, 10, 12],
        "f_pop": [0.8, 0.2, 1.0, 1.0],
        "f_emb": [0.9, 0.4, 0.7, 0.6],
        "f_ppdb": [1.0, 0.0, 0.0, 0.0],
        "rank": [1, 2, 1, 1],
    }))


@pytest.fixture(scope="module")
def rel_cands(spark):
    return spark.createDataFrame(pd.DataFrame({
        "rp": ["p", "p"],
        "rel_id": [5, 6],
        "f_ngram": [0.7, 0.2],
        "f_ld": [0.6, 0.3],
        "f_emb": [0.8, 0.4],
        "f_ppdb": [0.0, 0.0],
        "rank": [1, 2],
    }))


def test_pair_part_states_and_combos(spark, np_pairs):
    g = fg.build_graph(np_pairs=np_pairs, use_transitivity=False)
    states = g.var_states.collect()
    assert len(states) == 6  # 3 pair vars x 2 states
    assert {r["vtype"] for r in states} == {"npp"}
    assign = g.assign.collect()
    assert len(assign) == 6  # unary factor: 2 combos x 1 var each
    assert {r["ftype"] for r in assign} == {"Fnp"}


def test_pair_feature_values_flip(spark, np_pairs):
    g = fg.build_graph(np_pairs=np_pairs, use_transitivity=False)
    feats = {(r["factor_id"], r["combo_id"], r["feat"]): r["val"]
             for r in g.feats.collect()}
    assert feats[("Fnp:x|y", 1, "np_idf")] == pytest.approx(0.9)
    assert feats[("Fnp:x|y", 0, "np_idf")] == pytest.approx(0.1)
    assert feats[("Fnp:x|z", 1, "np_emb")] == pytest.approx(0.7)
    assert feats[("Fnp:x|z", 0, "np_emb")] == pytest.approx(0.3)


def test_feature_filtering(spark, np_pairs):
    g = fg.build_graph(np_pairs=np_pairs, np_feats=("np_idf",),
                       use_transitivity=False)
    assert set(g.feat_names) == {"np_idf"}
    assert {r["feat"] for r in g.feats.collect()} == {"np_idf"}


def test_triangle_combos_and_scores(spark, np_pairs):
    g = fg.build_graph(np_pairs=np_pairs, use_transitivity=True)
    tri = g.assign.where(F.col("ftype") == "Unt")
    # one triangle (x,y,z): 8 combos x 3 vars
    assert tri.count() == 24
    feats = {r["combo_id"]: r["val"]
             for r in g.feats.where(F.col("feat") == "np_trans").collect()}
    assert feats[7] == pytest.approx(fg.TRANS_HIGH)   # 1,1,1
    assert feats[0] == pytest.approx(fg.TRANS_MID)    # 0,0,0
    assert feats[6] == pytest.approx(fg.TRANS_LOW)    # 1,1,0 violation
    assert feats[1] == pytest.approx(fg.TRANS_MID)    # 0,0,1
    assert feats[3] == pytest.approx(fg.TRANS_LOW)    # 0,1,1 violation


def test_link_part_states_carry_labels(spark, ent_cands):
    g = fg.build_graph(ent_cands=ent_cands)
    states = {(r["var_id"], r["state"]): r["label"]
              for r in g.var_states.collect()}
    assert states[("npl:x", 0)] == "10"
    assert states[("npl:x", 1)] == "11"
    assert states[("npl:y", 0)] == "10"


def test_fact_inclusion_scores(spark, np_pairs, ent_cands, rel_cands):
    triples = spark.createDataFrame([("x", "p", "y")], ["subj", "pred", "obj"])
    facts = spark.createDataFrame([(10, 5, 10)], ["subj", "rel", "obj"])
    g = fg.build_graph(
        np_pairs=np_pairs, ent_cands=ent_cands, rel_cands=rel_cands,
        triples=triples, ckb_facts=facts, use_transitivity=False,
        use_consistency=False,
    )
    uf = g.assign.where(F.col("ftype") == "Uf")
    # subject x: 2 states, pred p: 2, object y: 1 -> 4 combos x 3 vars
    assert uf.count() == 12
    feats = {r["combo_id"]: r["val"]
             for r in g.feats.where(F.col("feat") == "fact").collect()}
    # combo (ss=0 -> ent 10, sp=0 -> rel 5, so=0 -> ent 10) is the fact
    hit_combo = 0 * fg.MAXK * fg.MAXK + 0 * fg.MAXK + 0
    assert feats[hit_combo] == pytest.approx(fg.FACT_HIGH)
    miss_combo = 1 * fg.MAXK * fg.MAXK + 0 * fg.MAXK + 0
    assert feats[miss_combo] == pytest.approx(fg.FACT_LOW)


def test_self_loop_triples_skipped(spark, ent_cands, rel_cands):
    triples = spark.createDataFrame([("x", "p", "x")], ["subj", "pred", "obj"])
    facts = spark.createDataFrame([(10, 5, 10)], ["subj", "rel", "obj"])
    g = fg.build_graph(
        ent_cands=ent_cands, rel_cands=rel_cands, triples=triples,
        ckb_facts=facts,
    )
    assert g.assign.where(F.col("ftype") == "Uf").count() == 0


def test_consistency_scores(spark, np_pairs, ent_cands):
    g = fg.build_graph(np_pairs=np_pairs, ent_cands=ent_cands,
                       use_transitivity=False, use_consistency=True)
    unc = g.assign.where(F.col("ftype") == "Unc")
    assert unc.count() > 0
    feats = g.feats.where(F.col("feat") == "np_cons")
    vals = {r["val"] for r in feats.collect()}
    assert vals <= {fg.CONS_HIGH, fg.CONS_LOW}
    # pair (x, y): both can link to ent 10; combo with sa=0 (ent 10),
    # sb=0 (ent 10), x=1 must be consistent
    combo = 0 * fg.MAXK * 2 + 0 * 2 + 1
    row = feats.where(
        (F.col("factor_id") == "Unc:x|y") & (F.col("combo_id") == combo)
    ).collect()
    assert row[0]["val"] == pytest.approx(fg.CONS_HIGH)
    # same entities but x=0 is inconsistent
    row = feats.where(
        (F.col("factor_id") == "Unc:x|y") & (F.col("combo_id") == combo - 1)
    ).collect()
    assert row[0]["val"] == pytest.approx(fg.CONS_LOW)


def test_broken_factors_pruned(spark, np_pairs, ent_cands, rel_cands):
    # triple whose object "w" has no candidates -> its Uf factor must
    # be dropped wholesale
    triples = spark.createDataFrame(
        [("x", "p", "w")], ["subj", "pred", "obj"]
    )
    facts = spark.createDataFrame([(10, 5, 10)], ["subj", "rel", "obj"])
    g = fg.build_graph(
        ent_cands=ent_cands, rel_cands=rel_cands, triples=triples,
        ckb_facts=facts,
    )
    assert g.assign.where(F.col("ftype") == "Uf").count() == 0


def test_empty_graph_raises(spark):
    with pytest.raises(ValueError):
        fg.build_graph()


def test_edge_states_unique(spark, np_pairs, ent_cands):
    g = fg.build_graph(np_pairs=np_pairs, ent_cands=ent_cands)
    es = g.edge_states()
    assert es.count() == es.distinct().count()


def test_feat_names_ordered_unique(spark, np_pairs, ent_cands):
    g = fg.build_graph(np_pairs=np_pairs, ent_cands=ent_cands)
    assert len(g.feat_names) == len(set(g.feat_names))
    assert "np_cons" in g.feat_names
