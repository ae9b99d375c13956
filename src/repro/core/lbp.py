"""Loopy Belief Propagation over the relational factor graph (§3.4).

Messages live in two DataFrames, both in log domain and normalized per
(factor, variable):

* ``msg_vf(factor_id, var_id, state, m)`` — variable → factor
* ``msg_fv(factor_id, var_id, state, m)`` — factor → variable

One iteration is pure relational algebra:

factor → variable (sum-product):
    m_{f→v}(s) = logsumexp over combos of f with v=s of
                 [ potential(combo) + Σ_{u∈f, u≠v} m_{u→f}(state_u(combo)) ]
computed as: join the (assignment ⋈ potential) table with the current
variable→factor messages, take per-combo message totals with a window
over (factor, combo), subtract the receiver's own message, add the
potential, and log-sum-exp with a window over (factor, var, state).

variable → factor:
    m_{v→f}(s) = Σ_{g∋v, g≠f} m_{g→v}(s)
computed with a window over (var, state) on the factor→variable table —
no join at all.

Shuffle economy: the only join per iteration broadcasts the message
table (one row per (factor, var, state) — MBs even for large OKBs)
against the pre-joined assignment/potential table, so each iteration is
a handful of window shuffles over the assignment table plus two eager
``localCheckpoint``s that truncate lineage.

The paper's §3.4 schedule (F1–F3, then U1–U3, then F4–F6, then U4, then
U5–U7; afterwards canonicalization variables before linking variables)
is honoured structurally: every factor→variable message in the listed
groups depends only on the variable→factor snapshot taken *before* the
sweep, and vice versa, so executing the groups as one unioned relational
pass computes exactly the same messages as executing them in the listed
order — flooding with the schedule's two half-steps.

Convergence is declared when the max absolute change of the
variable→factor messages drops below ``tol`` (the paper reports
convergence within twenty iterations); the check is amortized with
``check_every``.  Factor→variable messages are damped for stability on
loopy sections (transitivity triangles).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.factor_graph import FactorGraph

_KEY = ["factor_id", "var_id", "state"]


def _norm(df: DataFrame, col: str = "m") -> DataFrame:
    """Normalize per (factor, var) so exp(col) sums to 1 — one window
    shuffle, no joins."""
    w = Window.partitionBy("factor_id", "var_id")
    mx = F.max(col).over(w)
    lse = mx + F.log(F.sum(F.exp(F.col(col) - mx)).over(w))
    return df.withColumn(col, F.col(col) - lse)


def log_potentials(graph: FactorGraph, weights: dict[str, float]) -> DataFrame:
    """(factor_id, combo_id, pot) = Σ_f ω_f · h_f(combo).

    Every combo appears (a factor family whose features were all
    disabled still has combos; they get potential 0).
    """
    spark = graph.assign.sparkSession
    w = spark.createDataFrame(
        [(k, float(v)) for k, v in weights.items()], ["feat", "w"]
    )
    summed = (
        graph.feats.join(F.broadcast(w), on="feat")
        .groupBy("factor_id", "combo_id")
        .agg(F.sum(F.col("val") * F.col("w")).alias("pot"))
    )
    combos = graph.assign.select("factor_id", "combo_id").distinct()
    return combos.join(summed, ["factor_id", "combo_id"], "left").fillna(
        {"pot": 0.0}
    )


@dataclass
class LBPState:
    """Converged (or iteration-capped) message state of one LBP run."""

    msg_fv: DataFrame
    msg_vf: DataFrame
    pot: DataFrame
    iterations: int
    delta: float


def _update_fv(assign_pot: DataFrame, msg_vf: DataFrame) -> DataFrame:
    j = assign_pot.join(F.broadcast(msg_vf), _KEY)
    wc = Window.partitionBy("factor_id", "combo_id")
    ws = Window.partitionBy(*_KEY)
    j = j.withColumn("_tot", F.sum("m").over(wc)).withColumn(
        "_c", F.col("pot") + F.col("_tot") - F.col("m")
    )
    mx = F.max("_c").over(ws)
    j = j.withColumn(
        "_lse", mx + F.log(F.sum(F.exp(F.col("_c") - mx)).over(ws))
    )
    # every row of a (factor, var, state) group carries the same LSE;
    # the groupBy reuses the window's hash partitioning
    return _norm(j.groupBy(*_KEY).agg(F.max("_lse").alias("m")))


def _update_vf(msg_fv: DataFrame) -> DataFrame:
    w = Window.partitionBy("var_id", "state")
    raw = msg_fv.withColumn("m", F.sum("m").over(w) - F.col("m"))
    return _norm(raw)


def _damp(new: DataFrame, old: DataFrame, d: float) -> DataFrame:
    if d <= 0:
        return new
    mixed = (
        new.withColumnRenamed("m", "_new")
        .join(F.broadcast(old.withColumnRenamed("m", "_old")), _KEY)
        .withColumn("m", (1.0 - d) * F.col("_new") + d * F.col("_old"))
        .drop("_new", "_old")
    )
    return _norm(mixed)


def run_lbp(
    graph: FactorGraph,
    weights: dict[str, float],
    *,
    max_iter: int = 20,
    damping: float = 0.3,
    tol: float = 1e-3,
    check_every: int = 3,
) -> LBPState:
    """Run sum-product LBP to convergence (or ``max_iter``)."""
    pot = log_potentials(graph, weights)
    assign_pot = graph.assign.join(pot, ["factor_id", "combo_id"]) \
        .localCheckpoint(eager=True)
    pot = pot.localCheckpoint(eager=True)

    msg_vf = (
        assign_pot.select(*_KEY).distinct().withColumn("m", F.lit(0.0))
        .localCheckpoint(eager=True)
    )
    msg_fv = msg_vf

    delta = float("inf")
    it = 0
    for it in range(1, max_iter + 1):
        new_fv = _damp(_update_fv(assign_pot, msg_vf), msg_fv, damping) \
            .localCheckpoint(eager=True)
        new_vf = _update_vf(new_fv).localCheckpoint(eager=True)
        if it % check_every == 0 or it == max_iter:
            delta_row = (
                new_vf.withColumnRenamed("m", "_a")
                .join(F.broadcast(msg_vf.withColumnRenamed("m", "_b")), _KEY)
                .agg(F.max(F.abs(F.col("_a") - F.col("_b"))).alias("d"))
                .collect()[0]
            )
            delta = float(delta_row["d"] if delta_row["d"] is not None else 0.0)
            msg_fv, msg_vf = new_fv, new_vf
            if delta < tol:
                break
        else:
            msg_fv, msg_vf = new_fv, new_vf
    return LBPState(msg_fv=msg_fv, msg_vf=msg_vf, pot=pot,
                    iterations=it, delta=delta)


# -------------------------------------------------------------- beliefs

def var_beliefs(state: LBPState, var_states: DataFrame) -> DataFrame:
    """(var_id, vtype, state, label, logp): marginal of every variable
    (product of all incoming factor messages, normalized)."""
    b = state.msg_fv.groupBy("var_id", "state").agg(F.sum("m").alias("m"))
    w = Window.partitionBy("var_id")
    mx = F.max("m").over(w)
    b = b.withColumn(
        "m", F.col("m") - (mx + F.log(F.sum(F.exp(F.col("m") - mx)).over(w)))
    )
    return var_states.join(b, ["var_id", "state"], "left").fillna(
        {"m": 0.0}
    ).withColumnRenamed("m", "logp")


def combo_beliefs(state: LBPState, assign: DataFrame) -> DataFrame:
    """(factor_id, combo_id, logb): joint belief of each factor's
    assignment combos — potential plus incoming variable messages,
    normalized per factor.  This is the clique marginal LBP estimates,
    used for the learning expectations (eq. 6)."""
    in_m = assign.join(F.broadcast(state.msg_vf), _KEY)
    tot = in_m.groupBy("factor_id", "combo_id").agg(F.sum("m").alias("_tot"))
    b = (
        state.pot.join(tot, ["factor_id", "combo_id"], "left")
        .fillna({"_tot": 0.0})
        .withColumn("m", F.col("pot") + F.col("_tot"))
        .select("factor_id", "combo_id", "m")
    )
    w = Window.partitionBy("factor_id")
    mx = F.max("m").over(w)
    return b.withColumn(
        "logb", F.col("m") - (mx + F.log(F.sum(F.exp(F.col("m") - mx)).over(w)))
    ).select("factor_id", "combo_id", "logb")
