"""KBP substitute tests."""
import pandas as pd

from repro.mining.kbp import KBPModel
from repro.okbgen.world import build_world


def _world():
    return build_world(n_entities=20, n_relations=8, n_facts=40, seed=4)


def test_full_coverage_classifies_all_phrases():
    w = _world()
    m = KBPModel.from_world(w, coverage=1.0, confusion=0.0, seed=1)
    # every phrase classified; nearly all to their own relation (verb
    # reuse can make a phrase ambiguous between two relations)
    cats = [m.category(p) for p in w.rel_phrases["phrase"]]
    assert all(c is not None for c in cats)
    correct = sum(
        c == r for c, r in zip(cats, w.rel_phrases["rel_id"])
    )
    assert correct >= 0.9 * len(cats)


def test_same_relation_phrases_agree():
    w = _world()
    m = KBPModel.from_world(w, coverage=1.0, confusion=0.0, seed=1)
    g = w.rel_phrases[w.rel_phrases["rel_id"] == 0]["phrase"].tolist()
    assert m.sim(g[0], g[1]) == 1.0


def test_cross_relation_phrases_disagree():
    w = _world()
    m = KBPModel.from_world(w, coverage=1.0, confusion=0.0, seed=1)
    a = w.rel_phrases[w.rel_phrases["rel_id"] == 0]["phrase"].iloc[0]
    b = w.rel_phrases[w.rel_phrases["rel_id"] == 1]["phrase"].iloc[0]
    # verbs can be reused across relations; only assert when distinct
    if m.category(a) != m.category(b):
        assert m.sim(a, b) == 0.0


def test_partial_coverage_misses():
    w = _world()
    m = KBPModel.from_world(w, coverage=0.3, confusion=0.0, seed=2)
    known = sum(m.category(p) is not None for p in w.rel_phrases["phrase"])
    assert known < len(w.rel_phrases)
    assert m.sim("unknown phrase", "another unknown") == 0.0


def test_deterministic():
    w = _world()
    a = KBPModel.from_world(w, seed=9).category_of
    b = KBPModel.from_world(w, seed=9).category_of
    assert a == b


def test_sim_series():
    w = _world()
    m = KBPModel.from_world(w, coverage=1.0, confusion=0.0, seed=1)
    g = w.rel_phrases[w.rel_phrases["rel_id"] == 2]["phrase"].tolist()
    out = m.sim_series(pd.Series([g[0]]), pd.Series([g[1]]))
    assert list(out) == [1.0]
