"""JOCL's factor graph as Spark DataFrames (§3.1–§3.3).

The graph is four relational tables, every one a Spark DataFrame so the
whole model scales with the OKB:

* ``var_states(var_id, vtype, state, label)`` — one row per state of a
  latent variable.  Pair (canonicalization) variables have the two
  states {0, 1}; linking variables have one state per candidate with
  ``label`` carrying the candidate entity/relation id.
* ``assign(factor_id, ftype, combo_id, var_id, state)`` — the exploded
  joint-assignment table: one row per (variable of a factor) per joint
  state combination of that factor.  Unary signal factors have 2 or K
  combos; ternary structural factors have the product of their state
  counts.
* ``feats(factor_id, combo_id, feat, val)`` — feature-function values
  per combination.  A factor's log-potential under weights ω is
  ``Σ_f ω_f · val`` (the exponential-linear form of eq. 1).

Variable and factor ids are human-readable strings ("npl:umd",
"Fnp:umd|university of maryland"), which keeps every construction step
a pure join on phrases.

Factor inventory (paper name → ``ftype`` here; subject and object
factors are merged because NP-space variables are phrase-level and the
paper gives F1/F3, U1/U3, U5/U7 identical signal sets — see DESIGN.md):

    F1,F3 → Fnp   F2 → Frp   F4,F6 → Fel   F5 → Frl
    U1,U3 → Unt   U2 → Urt   U4 → Uf   U5,U7 → Unc   U6 → Urc
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping, Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: cap on candidate-list length used to pack combo ids; candidate
#: generation must respect k <= MAXK.
MAXK = 8

#: structural-factor scores from the paper (§3.1.5, §3.2.5, §3.3)
TRANS_HIGH, TRANS_MID, TRANS_LOW = 0.9, 0.5, 0.1
FACT_HIGH, FACT_LOW = 0.9, 0.1
CONS_HIGH, CONS_LOW = 0.7, 0.3

#: signal-column → feature-name maps per factor type
NP_FEATS: Mapping[str, str] = {
    "sim_idf": "np_idf", "sim_emb": "np_emb", "sim_ppdb": "np_ppdb"}
RP_FEATS: Mapping[str, str] = {
    "sim_idf": "rp_idf", "sim_emb": "rp_emb", "sim_ppdb": "rp_ppdb",
    "sim_amie": "rp_amie", "sim_kbp": "rp_kbp"}
EL_FEATS: Mapping[str, str] = {
    "f_pop": "el_pop", "f_emb": "el_emb", "f_ppdb": "el_ppdb"}
RL_FEATS: Mapping[str, str] = {
    "f_ngram": "rl_ngram", "f_ld": "rl_ld", "f_emb": "rl_emb",
    "f_ppdb": "rl_ppdb"}
STRUCT_FEATS = ("np_trans", "rp_trans", "fact", "np_cons", "rp_cons")


@dataclass
class FactorGraph:
    """The relational factor graph plus its feature vocabulary."""

    var_states: DataFrame
    assign: DataFrame
    feats: DataFrame
    feat_names: tuple[str, ...]

    def edge_states(self) -> DataFrame:
        """(factor_id, var_id, state) — the message index."""
        return self.assign.select("factor_id", "var_id", "state").distinct()

    def cache(self) -> "FactorGraph":
        for df in (self.var_states, self.assign, self.feats):
            df.cache()
        return self

    def checkpointed(self) -> "FactorGraph":
        """Materialize all tables and truncate lineage — the graph is
        consumed by 10s of LBP iterations, each a multi-join."""
        return FactorGraph(
            self.var_states.localCheckpoint(eager=True),
            self.assign.localCheckpoint(eager=True),
            self.feats.localCheckpoint(eager=True),
            self.feat_names,
        )


def _melt_feats(df: DataFrame, mapping: Mapping[str, str],
                use: Sequence[str]) -> DataFrame:
    """Long-format (factor_id, combo_id, feat, val) from wide columns."""
    pairs = [(col, name) for col, name in mapping.items() if name in use]
    structs = [
        F.struct(F.lit(name).alias("feat"), F.col(col).cast("double").alias("val"))
        for col, name in pairs
    ]
    return df.select(
        "factor_id", "combo_id", F.explode(F.array(*structs)).alias("fv")
    ).select("factor_id", "combo_id", F.col("fv.feat").alias("feat"),
             F.col("fv.val").alias("val"))


def _pair_part(
    pairs: DataFrame, *, vprefix: str, fprefix: str, ftype: str,
    mapping: Mapping[str, str], use: Sequence[str],
):
    """Variables + unary signal factor for one pair family (Fnp / Frp)."""
    base = pairs.withColumn(
        "var_id", F.concat(F.lit(vprefix), F.col("a"), F.lit("|"), F.col("b"))
    ).withColumn(
        "factor_id", F.concat(F.lit(fprefix), F.col("a"), F.lit("|"), F.col("b"))
    )
    states = base.select(
        "var_id", F.explode(F.array(F.lit(0), F.lit(1))).alias("state")
    ).withColumn("vtype", F.lit(vprefix.rstrip(":"))).withColumn(
        "label", F.col("state").cast("string")
    )
    combos = base.withColumn(
        "state", F.explode(F.array(F.lit(0), F.lit(1)))
    ).withColumn("combo_id", F.col("state"))
    assign = combos.select(
        "factor_id", F.lit(ftype).alias("ftype"), "combo_id", "var_id", "state"
    )
    # feature value is Sim when the variable is 1, 1 − Sim when it is 0
    feat_src = combos
    for col in mapping:
        feat_src = feat_src.withColumn(
            col,
            F.when(F.col("state") == 1, F.col(col)).otherwise(1.0 - F.col(col)),
        )
    feats = _melt_feats(feat_src, mapping, use)
    return states, assign, feats


def _link_part(
    cands: DataFrame, *, phrase_col: str, label_col: str, vprefix: str,
    fprefix: str, ftype: str, mapping: Mapping[str, str], use: Sequence[str],
):
    """Variables + unary signal factor for one linking family (Fel/Frl)."""
    base = cands.withColumn(
        "var_id", F.concat(F.lit(vprefix), F.col(phrase_col))
    ).withColumn(
        "factor_id", F.concat(F.lit(fprefix), F.col(phrase_col))
    ).withColumn("state", F.col("rank") - 1).withColumn(
        "combo_id", F.col("state")
    )
    states = base.select(
        "var_id", "state", F.lit(vprefix.rstrip(":")).alias("vtype"),
        F.col(label_col).cast("string").alias("label"),
    )
    assign = base.select(
        "factor_id", F.lit(ftype).alias("ftype"), "combo_id", "var_id", "state"
    )
    feats = _melt_feats(base, mapping, use)
    return states, assign, feats


def _triangle_part(pairs: DataFrame, *, vprefix: str, fprefix: str,
                   ftype: str, feat: str):
    """Transitive-relation factors over pair-variable triangles (U1–U3).

    Triangles (a < b < c) with all three blocked pairs present; the
    single feature scores 0.9 when all three variables are 1, 0.1 when
    exactly two are (a transitivity violation), else 0.5.
    """
    e = pairs.select("a", "b")
    t1 = (
        e.alias("p")
        .join(e.alias("q"), F.col("p.b") == F.col("q.a"))
        .select(F.col("p.a").alias("a"), F.col("p.b").alias("b"),
                F.col("q.b").alias("c"))
    )
    closing = e.select(F.col("a").alias("_ca"), F.col("b").alias("_cc"))
    tri = t1.join(
        closing,
        (F.col("_ca") == F.col("a")) & (F.col("_cc") == F.col("c")),
    ).select("a", "b", "c")

    tri = tri.withColumn(
        "factor_id",
        F.concat(F.lit(fprefix), F.col("a"), F.lit("|"), F.col("b"),
                 F.lit("|"), F.col("c")),
    )
    combos = tri.withColumn(
        "combo_id", F.explode(F.array(*[F.lit(i) for i in range(8)]))
    )
    s_ab = (F.col("combo_id") / 4).cast("int") % 2
    s_bc = (F.col("combo_id") / 2).cast("int") % 2
    s_ac = F.col("combo_id") % 2
    combos = combos.withColumn("s_ab", s_ab).withColumn("s_bc", s_bc) \
                   .withColumn("s_ac", s_ac)

    def pair_var(x: str, y: str):
        return F.concat(F.lit(vprefix), F.col(x), F.lit("|"), F.col(y))

    parts = []
    for var_expr, st in (
        (pair_var("a", "b"), "s_ab"),
        (pair_var("b", "c"), "s_bc"),
        (pair_var("a", "c"), "s_ac"),
    ):
        parts.append(
            combos.select(
                "factor_id", F.lit(ftype).alias("ftype"), "combo_id",
                var_expr.alias("var_id"), F.col(st).alias("state"),
            )
        )
    assign = parts[0].union(parts[1]).union(parts[2])

    ssum = F.col("s_ab") + F.col("s_bc") + F.col("s_ac")
    feats = combos.select(
        "factor_id", "combo_id", F.lit(feat).alias("feat"),
        F.when(ssum == 3, TRANS_HIGH)
        .when(ssum == 2, TRANS_LOW)
        .otherwise(TRANS_MID)
        .alias("val"),
    )
    return assign, feats


def _fact_part(triples: DataFrame, ent_states: DataFrame,
               rel_states: DataFrame, ckb_facts: DataFrame):
    """Fact-inclusion factors U4: one per distinct (s, p, o) phrase
    triple whose three slots all have linking variables; feature 0.9
    when the joint candidate assignment is a CKB fact, else 0.1."""
    t = triples.select("subj", "pred", "obj").where(
        F.col("subj") != F.col("obj")
    ).distinct()
    es = ent_states.select(F.col("np").alias("subj"),
                           F.col("state").alias("ss"),
                           F.col("ent_id").alias("ls"))
    ep = rel_states.select(F.col("rp").alias("pred"),
                           F.col("state").alias("sp"),
                           F.col("rel_id").alias("lp"))
    eo = ent_states.select(F.col("np").alias("obj"),
                           F.col("state").alias("so"),
                           F.col("ent_id").alias("lo"))
    combos = (
        t.join(es, on="subj").join(ep, on="pred").join(eo, on="obj")
        .withColumn(
            "combo_id",
            F.col("ss") * MAXK * MAXK + F.col("sp") * MAXK + F.col("so"),
        )
        .withColumn(
            "factor_id",
            F.concat(F.lit("Uf:"), F.col("subj"), F.lit("|"), F.col("pred"),
                     F.lit("|"), F.col("obj")),
        )
    )
    facts = ckb_facts.select(
        F.col("subj").alias("ls"), F.col("rel").alias("lp"),
        F.col("obj").alias("lo"), F.lit(1).alias("_in_ckb"),
    )
    combos = combos.join(facts, on=["ls", "lp", "lo"], how="left")

    parts = []
    for vpre, pcol, scol in (("npl:", "subj", "ss"), ("rpl:", "pred", "sp"),
                             ("npl:", "obj", "so")):
        parts.append(
            combos.select(
                "factor_id", F.lit("Uf").alias("ftype"), "combo_id",
                F.concat(F.lit(vpre), F.col(pcol)).alias("var_id"),
                F.col(scol).alias("state"),
            )
        )
    assign = parts[0].union(parts[1]).union(parts[2])
    feats = combos.select(
        "factor_id", "combo_id", F.lit("fact").alias("feat"),
        F.when(F.col("_in_ckb").isNotNull(), FACT_HIGH)
        .otherwise(FACT_LOW).alias("val"),
    )
    return assign, feats


def _consistency_part(pairs: DataFrame, link_states: DataFrame, *,
                      phrase_col: str, label_col: str, pair_vprefix: str,
                      link_vprefix: str, fprefix: str, ftype: str, feat: str):
    """Consistency factors U5–U7 over (link_a, link_b, pair_ab).

    Feature 0.7 when (label_a == label_b) agrees with the pair variable,
    else 0.3.  Only pairs whose both phrases have linking variables get
    a factor.
    """
    la = link_states.select(F.col(phrase_col).alias("a"),
                            F.col("state").alias("sa"),
                            F.col(label_col).alias("lab_a"))
    lb = link_states.select(F.col(phrase_col).alias("b"),
                            F.col("state").alias("sb"),
                            F.col(label_col).alias("lab_b"))
    combos = (
        pairs.select("a", "b")
        .join(la, on="a").join(lb, on="b")
        .withColumn("x", F.explode(F.array(F.lit(0), F.lit(1))))
        .withColumn(
            "combo_id",
            F.col("sa") * MAXK * 2 + F.col("sb") * 2 + F.col("x"),
        )
        .withColumn(
            "factor_id",
            F.concat(F.lit(fprefix), F.col("a"), F.lit("|"), F.col("b")),
        )
    )
    parts = [
        combos.select(
            "factor_id", F.lit(ftype).alias("ftype"), "combo_id",
            F.concat(F.lit(link_vprefix), F.col("a")).alias("var_id"),
            F.col("sa").alias("state"),
        ),
        combos.select(
            "factor_id", F.lit(ftype).alias("ftype"), "combo_id",
            F.concat(F.lit(link_vprefix), F.col("b")).alias("var_id"),
            F.col("sb").alias("state"),
        ),
        combos.select(
            "factor_id", F.lit(ftype).alias("ftype"), "combo_id",
            F.concat(F.lit(pair_vprefix), F.col("a"), F.lit("|"),
                     F.col("b")).alias("var_id"),
            F.col("x").alias("state"),
        ),
    ]
    assign = parts[0].union(parts[1]).union(parts[2])
    agree = (F.col("lab_a") == F.col("lab_b")) == (F.col("x") == 1)
    feats = combos.select(
        "factor_id", "combo_id", F.lit(feat).alias("feat"),
        F.when(agree, CONS_HIGH).otherwise(CONS_LOW).alias("val"),
    )
    return assign, feats


def build_graph(
    *,
    np_pairs: DataFrame | None = None,
    rp_pairs: DataFrame | None = None,
    ent_cands: DataFrame | None = None,
    rel_cands: DataFrame | None = None,
    triples: DataFrame | None = None,
    ckb_facts: DataFrame | None = None,
    np_feats: Sequence[str] = tuple(NP_FEATS.values()),
    rp_feats: Sequence[str] = tuple(RP_FEATS.values()),
    el_feats: Sequence[str] = tuple(EL_FEATS.values()),
    rl_feats: Sequence[str] = tuple(RL_FEATS.values()),
    use_transitivity: bool = True,
    use_fact_inclusion: bool = True,
    use_consistency: bool = True,
    eager: bool = True,
) -> FactorGraph:
    """Assemble the JOCL factor graph from the signal tables.

    Passing ``None`` for a signal family drops that part of the graph —
    this is how the JOCL_cano / JOCL_link ablations (§4.4) and the
    Table 5 feature variants are expressed.

    With ``eager`` (the default) every part is materialized via
    ``localCheckpoint`` as it is built: the final tables are unions of a
    dozen join-heavy sub-plans, and without the cut Catalyst re-analyzes
    the whole tree for each of the three outputs (and the LBP loop after
    them) — graph construction dominates end-to-end time otherwise.
    """
    state_parts, assign_parts, feat_parts = [], [], []
    feat_names: list[str] = []

    def _ck(df: DataFrame) -> DataFrame:
        return df.localCheckpoint(eager=True) if eager else df

    if np_pairs is not None:
        s, a, f = _pair_part(np_pairs, vprefix="npp:", fprefix="Fnp:",
                             ftype="Fnp", mapping=NP_FEATS, use=np_feats)
        state_parts.append(_ck(s)); assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names += [n for n in NP_FEATS.values() if n in np_feats]
        if use_transitivity:
            a, f = _triangle_part(np_pairs, vprefix="npp:", fprefix="Unt:",
                                  ftype="Unt", feat="np_trans")
            assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
            feat_names.append("np_trans")

    if rp_pairs is not None:
        s, a, f = _pair_part(rp_pairs, vprefix="rpp:", fprefix="Frp:",
                             ftype="Frp", mapping=RP_FEATS, use=rp_feats)
        state_parts.append(_ck(s)); assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names += [n for n in RP_FEATS.values() if n in rp_feats]
        if use_transitivity:
            a, f = _triangle_part(rp_pairs, vprefix="rpp:", fprefix="Urt:",
                                  ftype="Urt", feat="rp_trans")
            assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
            feat_names.append("rp_trans")

    ent_states = rel_states = None
    if ent_cands is not None:
        ent_states = ent_cands.withColumn("state", F.col("rank") - 1)
        s, a, f = _link_part(ent_cands, phrase_col="np", label_col="ent_id",
                             vprefix="npl:", fprefix="Fel:", ftype="Fel",
                             mapping=EL_FEATS, use=el_feats)
        state_parts.append(_ck(s)); assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names += [n for n in EL_FEATS.values() if n in el_feats]

    if rel_cands is not None:
        rel_states = rel_cands.withColumn("state", F.col("rank") - 1)
        s, a, f = _link_part(rel_cands, phrase_col="rp", label_col="rel_id",
                             vprefix="rpl:", fprefix="Frl:", ftype="Frl",
                             mapping=RL_FEATS, use=rl_feats)
        state_parts.append(_ck(s)); assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names += [n for n in RL_FEATS.values() if n in rl_feats]

    if (use_fact_inclusion and triples is not None and ckb_facts is not None
            and ent_states is not None and rel_states is not None):
        a, f = _fact_part(triples, ent_states, rel_states, ckb_facts)
        assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names.append("fact")

    if use_consistency and np_pairs is not None and ent_states is not None:
        a, f = _consistency_part(
            np_pairs, ent_states, phrase_col="np", label_col="ent_id",
            pair_vprefix="npp:", link_vprefix="npl:", fprefix="Unc:",
            ftype="Unc", feat="np_cons")
        assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names.append("np_cons")

    if use_consistency and rp_pairs is not None and rel_states is not None:
        a, f = _consistency_part(
            rp_pairs, rel_states, phrase_col="rp", label_col="rel_id",
            pair_vprefix="rpp:", link_vprefix="rpl:", fprefix="Urc:",
            ftype="Urc", feat="rp_cons")
        assign_parts.append(_ck(a)); feat_parts.append(_ck(f))
        feat_names.append("rp_cons")

    if not assign_parts:
        raise ValueError("empty factor graph: no signal family supplied")

    def _union(parts: list[DataFrame]) -> DataFrame:
        out = parts[0]
        for p in parts[1:]:
            out = out.unionByName(p)
        return out

    var_states = _union(state_parts).distinct()
    assign = _union(assign_parts)
    feats = _union(feat_parts)

    # Structural factors reference pair/link variables by name; factors
    # whose variables were dropped (e.g. an NP without candidates breaks
    # a Uf/Unc factor) must be removed wholesale, or messages would flow
    # to nonexistent variables.
    known = var_states.select("var_id").distinct()
    bad = (
        assign.join(known, on="var_id", how="left_anti")
        .select("factor_id").distinct()
    )
    assign = assign.join(bad, on="factor_id", how="left_anti")
    feats = feats.join(bad, on="factor_id", how="left_anti")

    return FactorGraph(
        var_states=var_states,
        assign=assign,
        feats=feats,
        feat_names=tuple(dict.fromkeys(feat_names)),
    )
