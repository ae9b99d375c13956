"""Weight learning: gradient ascent on the log-likelihood (§3.4).

The gradient of the objective (eq. 6) is the difference of two feature
expectations:

    ∂O/∂ω = E_{p(Y | Y^L)}[Q] − E_{p(Y)}[Q]

both approximated from LBP clique marginals: the *clamped* expectation
runs LBP on the graph with every labeled variable's non-gold states
removed from the assignment table (conditioning = relational filtering),
the *free* expectation runs LBP on the untouched graph.

Each feature's expectation is normalized by the number of factors
carrying the feature so the step size is scale-free (the paper's raw
sum merely absorbs this constant into the learning rate; without the
normalization the same lr = 0.05 would diverge on a 10× larger OKB).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.factor_graph import FactorGraph
from repro.core.lbp import LBPState, combo_beliefs, run_lbp

_W_CLIP = 8.0


def clamp_graph(graph: FactorGraph, labels: DataFrame) -> FactorGraph:
    """Condition the graph on gold labels.

    ``labels`` is (var_id, state): for every labeled variable, combos
    placing it in any other state are deleted — the relational form of
    conditioning a factor graph.
    """
    gold = labels.select("var_id", F.col("state").alias("_gold"))
    bad = (
        graph.assign.join(gold, on="var_id")
        .where(F.col("state") != F.col("_gold"))
        .select("factor_id", "combo_id")
        .distinct()
    )
    assign = graph.assign.join(bad, ["factor_id", "combo_id"], "left_anti")
    feats = graph.feats.join(bad, ["factor_id", "combo_id"], "left_anti")
    var_states = (
        graph.var_states.join(gold, on="var_id", how="left")
        .where(F.col("_gold").isNull() | (F.col("state") == F.col("_gold")))
        .drop("_gold")
    )
    return FactorGraph(var_states, assign, feats, graph.feat_names)


def feature_expectations(
    graph: FactorGraph, state: LBPState,
    factor_filter: DataFrame | None = None,
    *, normalize: bool = True,
) -> dict[str, float]:
    """E[Σ h_f] per feature under the LBP clique marginals.

    ``factor_filter`` (factor_id) restricts the sum to those factors.
    Learning restricts both expectations to factors touching labeled
    variables (an untouched factor contributes (nearly) identically to
    the clamped and free runs) and uses the *raw sums*, as the paper's
    eq. 6 does — the gradient scale is what makes lr = 0.05 move the
    weights.  ``normalize=True`` divides by the factor count, giving a
    per-factor average useful for diagnostics and tests.
    """
    assign, feats = graph.assign, graph.feats
    if factor_filter is not None:
        assign = assign.join(factor_filter, "factor_id", "left_semi")
        feats = feats.join(factor_filter, "factor_id", "left_semi")
    cb = combo_beliefs(state, assign)
    joined = feats.join(cb, ["factor_id", "combo_id"])
    rows = (
        joined.groupBy("feat")
        .agg(
            F.sum(F.exp("logb") * F.col("val")).alias("e"),
            F.countDistinct("factor_id").alias("n"),
        )
        .collect()
    )
    if normalize:
        return {r["feat"]: r["e"] / r["n"] for r in rows if r["n"]}
    return {r["feat"]: r["e"] for r in rows}


@dataclass
class FitResult:
    weights: dict[str, float]
    history: list[dict[str, float]] = field(default_factory=list)


def fit_weights(
    graph: FactorGraph,
    labels: DataFrame,
    *,
    init: dict[str, float] | None = None,
    epochs: int = 3,
    lr: float = 0.05,
    lbp_iters: int = 5,
    damping: float = 0.3,
) -> FitResult:
    """Gradient ascent: ω ← ω + lr · (E_clamped[h] − E_free[h])."""
    weights = {f: 1.0 for f in graph.feat_names}
    if init:
        weights.update(init)
    clamped = clamp_graph(graph, labels).checkpointed()
    free = graph.checkpointed()
    touched = (
        free.assign.join(labels.select("var_id").distinct(), "var_id",
                         "left_semi")
        .select("factor_id").distinct().localCheckpoint(eager=True)
    )
    history = []
    for _ in range(epochs):
        st_cl = run_lbp(clamped, weights, max_iter=lbp_iters, damping=damping)
        st_fr = run_lbp(free, weights, max_iter=lbp_iters, damping=damping)
        e_cl = feature_expectations(clamped, st_cl, touched, normalize=False)
        e_fr = feature_expectations(free, st_fr, touched, normalize=False)
        grad = {
            f: e_cl.get(f, 0.0) - e_fr.get(f, 0.0) for f in graph.feat_names
        }
        for f in weights:
            weights[f] = max(-_W_CLIP, min(_W_CLIP, weights[f] + lr * grad[f]))
        history.append(dict(weights))
    return FitResult(weights=weights, history=history)
