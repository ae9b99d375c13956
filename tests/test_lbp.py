"""LBP correctness against exact enumeration, plus message invariants."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import factor_graph as fg
from repro.core.lbp import log_potentials, run_lbp, var_beliefs
from repro.core.reference import exact_var_marginals


@pytest.fixture(scope="module")
def chain_graph(spark):
    """Three independent pair variables (tree: unary factors only)."""
    np_pairs = spark.createDataFrame(pd.DataFrame({
        "a": ["x", "x", "y"], "b": ["y", "z", "z"],
        "sim_idf": [0.9, 0.8, 0.2],
        "sim_emb": [0.85, 0.7, 0.3],
        "sim_ppdb": [1.0, 0.0, 0.0],
    }))
    return fg.build_graph(np_pairs=np_pairs, use_transitivity=False)


@pytest.fixture(scope="module")
def loopy_graph(spark):
    """Same pairs plus the transitivity triangle (one loop)."""
    np_pairs = spark.createDataFrame(pd.DataFrame({
        "a": ["x", "x", "y"], "b": ["y", "z", "z"],
        "sim_idf": [0.9, 0.8, 0.2],
        "sim_emb": [0.85, 0.7, 0.3],
        "sim_ppdb": [1.0, 0.0, 0.0],
    }))
    return fg.build_graph(np_pairs=np_pairs, use_transitivity=True)


def _compare(graph, state, atol):
    vb = var_beliefs(state, graph.var_states).toPandas()
    ex = exact_var_marginals(graph, {f: 1.0 for f in graph.feat_names})
    m = vb.merge(ex, on=["var_id", "state"])
    assert len(m) == len(ex)
    err = (np.exp(m["logp"]) - m["p"]).abs().max()
    assert err < atol, f"max marginal error {err}"


def test_tree_marginals_exact(chain_graph):
    w = {f: 1.0 for f in chain_graph.feat_names}
    state = run_lbp(chain_graph, w, max_iter=5, damping=0.0, tol=1e-10,
                    check_every=1)
    assert state.iterations <= 3
    _compare(chain_graph, state, atol=1e-9)


def test_loopy_marginals_close(loopy_graph):
    w = {f: 1.0 for f in loopy_graph.feat_names}
    state = run_lbp(loopy_graph, w, max_iter=12, damping=0.2, tol=1e-6)
    _compare(loopy_graph, state, atol=0.02)


def test_messages_normalized(chain_graph):
    w = {f: 1.0 for f in chain_graph.feat_names}
    state = run_lbp(chain_graph, w, max_iter=3, damping=0.0)
    sums = (
        state.msg_fv.groupBy("factor_id", "var_id")
        .agg(F.sum(F.exp("m")).alias("s"))
        .collect()
    )
    for r in sums:
        assert r["s"] == pytest.approx(1.0, abs=1e-9)


def test_log_potentials_sum_features(chain_graph):
    w = {"np_idf": 2.0, "np_emb": 0.5, "np_ppdb": 1.0}
    pot = {
        (r["factor_id"], r["combo_id"]): r["pot"]
        for r in log_potentials(chain_graph, w).collect()
    }
    # factor Fnp:x|y combo 1: 2*0.9 + 0.5*0.85 + 1*1.0
    assert pot[("Fnp:x|y", 1)] == pytest.approx(2 * 0.9 + 0.5 * 0.85 + 1.0)
    assert pot[("Fnp:x|y", 0)] == pytest.approx(2 * 0.1 + 0.5 * 0.15 + 0.0)


def test_weights_shift_marginals(chain_graph):
    low = run_lbp(chain_graph, {"np_idf": 0.1, "np_emb": 0.1, "np_ppdb": 0.1},
                  max_iter=3, damping=0.0)
    high = run_lbp(chain_graph, {"np_idf": 5.0, "np_emb": 5.0, "np_ppdb": 5.0},
                   max_iter=3, damping=0.0)
    def p1(state):
        vb = var_beliefs(state, chain_graph.var_states).toPandas()
        row = vb[(vb.var_id == "npp:x|y") & (vb.state == 1)]
        return float(np.exp(row["logp"].iloc[0]))
    assert p1(high) > p1(low)
    assert p1(high) > 0.95


def test_convergence_reported(loopy_graph):
    w = {f: 1.0 for f in loopy_graph.feat_names}
    state = run_lbp(loopy_graph, w, max_iter=20, damping=0.2, tol=1e-5,
                    check_every=2)
    assert state.delta < 1e-5
    assert state.iterations < 20


def test_exact_reference_rejects_huge_graphs(spark):
    pairs = pd.DataFrame({
        "a": [f"v{i}" for i in range(25)],
        "b": [f"w{i}" for i in range(25)],
        "sim_idf": [0.5] * 25, "sim_emb": [0.5] * 25, "sim_ppdb": [0.0] * 25,
    })
    g = fg.build_graph(np_pairs=spark.createDataFrame(pairs),
                       use_transitivity=False)
    with pytest.raises(ValueError, match="too large"):
        exact_var_marginals(g, {"np_idf": 1.0})
