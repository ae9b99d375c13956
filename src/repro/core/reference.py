"""Exact inference by enumeration — the correctness oracle for LBP.

Collects a (tiny) factor graph to the driver and computes exact joint /
marginal probabilities by enumerating every joint assignment.  On
tree-structured graphs sum-product LBP is exact, so the Spark LBP's
marginals must match these to numerical precision; on small loopy
graphs they must be close.  Only usable for graphs with a handful of
variables (the state space is the product of state counts).
"""
from __future__ import annotations

import itertools
import math
from collections import defaultdict

import pandas as pd

from repro.core.factor_graph import FactorGraph


def _collect(graph: FactorGraph, weights: dict[str, float]):
    vs = graph.var_states.toPandas()
    assign = graph.assign.toPandas()
    feats = graph.feats.toPandas()
    pot = defaultdict(float)
    for r in feats.itertuples():
        pot[(r.factor_id, r.combo_id)] += weights.get(r.feat, 0.0) * r.val
    combos: dict[str, dict[int, dict[str, int]]] = defaultdict(dict)
    for r in assign.itertuples():
        combos[r.factor_id].setdefault(r.combo_id, {})[r.var_id] = r.state
    states = {v: sorted(g["state"]) for v, g in vs.groupby("var_id")}
    return states, combos, pot


def exact_var_marginals(
    graph: FactorGraph, weights: dict[str, float]
) -> pd.DataFrame:
    """Exact P(var = state) as a DataFrame (var_id, state, p)."""
    states, combos, pot = _collect(graph, weights)
    var_ids = sorted(states)
    if not var_ids:
        return pd.DataFrame(columns=["var_id", "state", "p"])
    total_space = math.prod(len(states[v]) for v in var_ids)
    if total_space > 2_000_000:
        raise ValueError(f"graph too large for enumeration: {total_space} states")

    marg: dict[tuple[str, int], float] = defaultdict(float)
    z = 0.0
    for joint in itertools.product(*(states[v] for v in var_ids)):
        y = dict(zip(var_ids, joint))
        logw = 0.0
        ok = True
        for fid, cdict in combos.items():
            match = None
            for cid, vmap in cdict.items():
                if all(y[v] == s for v, s in vmap.items()):
                    match = cid
                    break
            if match is None:
                ok = False
                break
            logw += pot[(fid, match)]
        if not ok:
            continue
        w = math.exp(logw)
        z += w
        for v, s in y.items():
            marg[(v, s)] += w
    rows = [
        {"var_id": v, "state": s, "p": (marg[(v, s)] / z if z else 0.0)}
        for v in var_ids
        for s in states[v]
    ]
    return pd.DataFrame(rows)
