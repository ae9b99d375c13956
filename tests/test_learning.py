"""Learning tests: clamping, expectations, and gradient direction."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import factor_graph as fg
from repro.core.learning import clamp_graph, feature_expectations, fit_weights
from repro.core.lbp import run_lbp


@pytest.fixture(scope="module")
def graph(spark):
    np_pairs = spark.createDataFrame(pd.DataFrame({
        "a": ["x", "x"], "b": ["y", "z"],
        # sim_idf says MERGE for both pairs; sim_ppdb says SPLIT
        "sim_idf": [0.9, 0.9],
        "sim_emb": [0.5, 0.5],
        "sim_ppdb": [0.1, 0.1],
    }))
    return fg.build_graph(np_pairs=np_pairs, use_transitivity=False)


@pytest.fixture(scope="module")
def labels(spark):
    # gold: both pairs are indeed the same entity
    return spark.createDataFrame(
        [("npp:x|y", 1), ("npp:x|z", 1)], ["var_id", "state"]
    )


def test_clamp_removes_wrong_state_combos(graph, labels):
    clamped = clamp_graph(graph, labels)
    assert graph.assign.count() == 4  # 2 unary factors x 2 combos
    assert clamped.assign.count() == 2  # only state-1 combos survive
    states = clamped.var_states.collect()
    assert all(r["state"] == 1 for r in states)


def test_clamp_keeps_unlabeled_variables(spark, graph):
    one_label = spark.createDataFrame([("npp:x|y", 0)], ["var_id", "state"])
    clamped = clamp_graph(graph, one_label)
    states = {(r["var_id"], r["state"]) for r in clamped.var_states.collect()}
    assert ("npp:x|z", 0) in states and ("npp:x|z", 1) in states
    assert ("npp:x|y", 1) not in states


def test_feature_expectations_bounds(graph):
    w = {f: 1.0 for f in graph.feat_names}
    st = run_lbp(graph, w, max_iter=3, damping=0.0)
    e = feature_expectations(graph, st)
    assert set(e) == set(graph.feat_names)
    for v in e.values():
        assert 0.0 <= v <= 1.0


def test_clamped_expectation_matches_labels(graph, labels):
    """With both variables clamped to 1, E[h_idf] is exactly the mean
    state-1 feature value 0.9."""
    clamped = clamp_graph(graph, labels)
    w = {f: 1.0 for f in graph.feat_names}
    st = run_lbp(clamped, w, max_iter=3, damping=0.0)
    e = feature_expectations(clamped, st)
    assert e["np_idf"] == pytest.approx(0.9, abs=1e-6)
    assert e["np_ppdb"] == pytest.approx(0.1, abs=1e-6)


def test_gradient_moves_weights_toward_agreeing_signal(graph, labels):
    """Labels say 'merge'; sim_idf agrees, sim_ppdb disagrees — after
    fitting, the idf weight must rise relative to the ppdb weight."""
    fit = fit_weights(graph, labels, epochs=2, lr=1.0, lbp_iters=3,
                      damping=0.0)
    assert fit.weights["np_idf"] > fit.weights["np_ppdb"]
    assert len(fit.history) == 2


def test_weights_clipped(graph, labels):
    fit = fit_weights(graph, labels, epochs=1, lr=1e6, lbp_iters=2,
                      damping=0.0)
    for v in fit.weights.values():
        assert -8.0 <= v <= 8.0
