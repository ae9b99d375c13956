"""Decoding and conflict-resolution tests."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import factor_graph as fg
from repro.core.inference import (
    decode_variables,
    extract,
    resolve_conflicts,
)
from repro.core.lbp import run_lbp


@pytest.fixture(scope="module")
def decoded_setup(spark):
    np_pairs = spark.createDataFrame(pd.DataFrame({
        "a": ["x"], "b": ["y"],
        "sim_idf": [0.95], "sim_emb": [0.9], "sim_ppdb": [1.0],
    }))
    ent_cands = spark.createDataFrame(pd.DataFrame({
        "np": ["x", "y"], "ent_id": [7, 7],
        "f_pop": [0.9, 0.8], "f_emb": [0.9, 0.9], "f_ppdb": [1.0, 1.0],
        "rank": [1, 1],
    }))
    g = fg.build_graph(np_pairs=np_pairs, ent_cands=ent_cands,
                       use_transitivity=False)
    st = run_lbp(g, {f: 1.0 for f in g.feat_names}, max_iter=4, damping=0.0)
    return g, decode_variables(st, g)


def test_decode_one_state_per_variable(decoded_setup):
    g, dec = decoded_setup
    n_vars = g.var_states.select("var_id").distinct().count()
    assert dec.count() == n_vars
    assert dec.select("var_id").distinct().count() == n_vars


def test_decode_picks_obvious_states(decoded_setup):
    _, dec = decoded_setup
    rows = {r["var_id"]: (r["state"], r["label"]) for r in dec.collect()}
    assert rows["npp:x|y"][0] == 1          # strong merge signals
    assert rows["npl:x"][1] == "7"


def test_extract_builds_outputs(spark, decoded_setup):
    _, dec = decoded_setup
    out = extract(spark, dec)
    clusters = {r["np"]: r["cluster"] for r in out.np_clusters.collect()}
    assert clusters["x"] == clusters["y"]
    links = {r["np"]: r["ent_id"] for r in out.np_links.collect()}
    assert links == {"x": 7, "y": 7}
    assert out.rp_clusters is None
    assert out.rp_links is None


# --------------------------------------------------- conflict resolution

def test_resolve_conflicts_larger_group_wins():
    links = pd.DataFrame({
        "np": ["a", "b", "c", "d"],
        "ent_id": [1, 1, 1, 2],
    })
    edges = pd.DataFrame({"a": ["c"], "b": ["d"]})  # pair (c, d) decoded 1
    out = resolve_conflicts(links, edges, "np", "ent_id")
    got = dict(zip(out["np"], out["ent_id"]))
    # group of entity 1 has three members vs one -> both get entity 1
    assert got["c"] == 1 and got["d"] == 1
    assert got["a"] == 1 and got["b"] == 1


def test_resolve_conflicts_no_conflict_noop():
    links = pd.DataFrame({"np": ["a", "b"], "ent_id": [1, 1]})
    edges = pd.DataFrame({"a": ["a"], "b": ["b"]})
    out = resolve_conflicts(links, edges, "np", "ent_id")
    assert dict(zip(out["np"], out["ent_id"])) == {"a": 1, "b": 1}


def test_resolve_conflicts_ignores_unlinked():
    links = pd.DataFrame({"np": ["a"], "ent_id": [1]})
    edges = pd.DataFrame({"a": ["a"], "b": ["zz"]})  # zz unlinked
    out = resolve_conflicts(links, edges, "np", "ent_id")
    assert dict(zip(out["np"], out["ent_id"])) == {"a": 1}


def test_resolve_conflicts_processes_big_winners_first():
    links = pd.DataFrame({
        "np": ["a", "b", "c", "d", "e"],
        "ent_id": [1, 1, 2, 3, 3],
    })
    # c conflicts with both groups; winner must end as the bigger group
    edges = pd.DataFrame({"a": ["a", "c"], "b": ["c", "d"]})
    out = resolve_conflicts(links, edges, "np", "ent_id")
    got = dict(zip(out["np"], out["ent_id"]))
    assert got["c"] in (1, 3)
