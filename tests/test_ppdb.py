"""Unit tests for the synthetic PPDB index."""
import pandas as pd

from repro.text.ppdb import PPDBIndex


def test_full_coverage_groups_share_representative():
    idx = PPDBIndex.from_groups(
        [["a", "b", "c"], ["x", "y"]], coverage=1.0, false_merge=0.0, seed=1
    )
    assert idx.sim("a", "b") == 1.0
    assert idx.sim("b", "c") == 1.0
    assert idx.sim("a", "x") == 0.0


def test_unindexed_phrase_scores_zero():
    idx = PPDBIndex.from_groups([["a", "b"]], coverage=1.0, seed=0)
    assert idx.sim("a", "unknown") == 0.0
    assert idx.sim("unknown", "unknown") == 0.0


def test_coverage_drops_entries():
    groups = [[f"p{i}", f"q{i}"] for i in range(50)]
    full = PPDBIndex.from_groups(groups, coverage=1.0, false_merge=0.0, seed=2)
    partial = PPDBIndex.from_groups(groups, coverage=0.4, false_merge=0.0, seed=2)
    assert len(partial.rep_of) < len(full.rep_of)


def test_deterministic_in_seed():
    groups = [["a", "b"], ["c", "d"]]
    one = PPDBIndex.from_groups(groups, coverage=0.6, seed=7)
    two = PPDBIndex.from_groups(groups, coverage=0.6, seed=7)
    assert one.rep_of == two.rep_of


def test_false_merge_can_join_groups():
    groups = [[f"g{i}a", f"g{i}b"] for i in range(100)]
    idx = PPDBIndex.from_groups(groups, coverage=1.0, false_merge=0.5, seed=3)
    reps = set(idx.rep_of.values())
    assert len(reps) < 100  # some groups merged


def test_sim_series_and_frame():
    idx = PPDBIndex.from_groups([["a", "b"]], coverage=1.0, seed=0)
    out = idx.sim_series(pd.Series(["a", "a"]), pd.Series(["b", "zz"]))
    assert list(out) == [1.0, 0.0]
    frame = idx.as_frame()
    assert set(frame.columns) == {"phrase", "rep"}
    assert len(frame) == len(idx.rep_of)
