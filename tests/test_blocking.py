"""Blocking tests: the inverted-index pair generator must agree with a
brute-force all-pairs computation."""
import itertools

import pytest

from repro.canon.blocking import blocked_pairs
from repro.text.similarity import idf_token_overlap

PHRASES = [
    "university of maryland",
    "maryland",
    "umd",
    "university of virginia",
    "virginia",
    "john smith",
    "smith",
    "president smith",
]
FREQ = {"university": 100, "of": 100, "maryland": 2, "umd": 1,
        "virginia": 2, "john": 50, "smith": 3, "president": 80}


def _brute(tau, stem=False):
    out = {}
    for a, b in itertools.combinations(sorted(PHRASES), 2):
        s = idf_token_overlap(a, b, FREQ, stem=stem)
        if s >= tau:
            out[(a, b)] = s
    return out


@pytest.fixture(scope="module")
def phrases_df(spark):
    return spark.createDataFrame([(p,) for p in PHRASES], ["phrase"])


@pytest.mark.parametrize("tau", [0.3, 0.5, 0.7])
def test_blocked_pairs_match_bruteforce(spark, phrases_df, tau):
    got = {
        (r["a"], r["b"]): r["sim_idf"]
        for r in blocked_pairs(phrases_df, tau=tau, freq=FREQ).collect()
    }
    expected = _brute(tau)
    assert set(got) == set(expected)
    for k in got:
        assert got[k] == pytest.approx(expected[k])


def test_pairs_are_ordered_and_unique(spark, phrases_df):
    rows = blocked_pairs(phrases_df, tau=0.1, freq=FREQ).collect()
    keys = [(r["a"], r["b"]) for r in rows]
    assert all(a < b for a, b in keys)
    assert len(keys) == len(set(keys))


def test_no_token_overlap_never_blocked(spark, phrases_df):
    rows = blocked_pairs(phrases_df, tau=0.0, freq=FREQ).collect()
    keys = {(r["a"], r["b"]) for r in rows}
    # "umd" shares no token with anything
    assert not any("umd" in k for k in keys)


def test_stemmed_blocking_catches_morph_variants(spark):
    df = spark.createDataFrame(
        [("kaba of",), ("kabas of",), ("other out",)], ["phrase"]
    )
    plain = blocked_pairs(df, tau=0.5, freq={"kaba": 2}).collect()
    stemmed = blocked_pairs(
        df, tau=0.5, freq={"kaba": 2}, stem=True
    ).collect()
    assert len(plain) == 0
    assert {(r["a"], r["b"]) for r in stemmed} == {("kaba of", "kabas of")}


def test_tau_monotone(spark, phrases_df):
    low = blocked_pairs(phrases_df, tau=0.2, freq=FREQ).count()
    high = blocked_pairs(phrases_df, tau=0.8, freq=FREQ).count()
    assert high <= low


def test_freq_computed_from_input_when_missing(spark, phrases_df):
    rows = blocked_pairs(phrases_df, tau=0.01).collect()
    assert rows  # shared-token pairs exist regardless of freq source
