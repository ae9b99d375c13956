"""Canonicalization pair signals (§3.1.3–§3.1.4).

Given the blocked pair table, these helpers attach one column per
signal similarity.  The factor graph later expands each similarity
``Sim`` into the paper's two-state feature function (``Sim`` when the
canonicalization variable is 1, ``1 − Sim`` when it is 0).

NP pairs get ⟨IDF token overlap, word embedding, PPDB⟩ (the paper's
``f_1 = f_3``); RP pairs additionally get ⟨AMIE, KBP⟩ (``f_2``).
"""
from __future__ import annotations

from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType

from repro.mining.amie import AMIESim
from repro.mining.kbp import KBPModel
from repro.text.embeddings import EmbeddingModel
from repro.text.ppdb import PPDBIndex

PairSim = Callable[[pd.Series, pd.Series], pd.Series]


def add_pair_sim(pairs: DataFrame, name: str, fn: PairSim,
                 a: str = "a", b: str = "b") -> DataFrame:
    """Attach a pair-similarity column computed by a vectorized scalar
    function (runs as a pandas UDF on each partition)."""

    @F.pandas_udf(DoubleType())
    def udf(x: pd.Series, y: pd.Series) -> pd.Series:
        return fn(x, y)

    return pairs.withColumn(name, udf(a, b))


NP_SIGNALS = ("sim_idf", "sim_emb", "sim_ppdb")
RP_SIGNALS = ("sim_idf", "sim_emb", "sim_ppdb", "sim_amie", "sim_kbp")


def np_pair_signals(
    pairs: DataFrame, embeddings: EmbeddingModel, ppdb: PPDBIndex
) -> DataFrame:
    """NP pair table (must already carry ``sim_idf`` from blocking) with
    the full ``f_1`` signal vector attached."""
    pairs = add_pair_sim(pairs, "sim_emb", embeddings.sim_series)
    pairs = add_pair_sim(pairs, "sim_ppdb", ppdb.sim_series)
    return pairs


def rp_pair_signals(
    pairs: DataFrame,
    embeddings: EmbeddingModel,
    ppdb: PPDBIndex,
    amie: AMIESim,
    kbp: KBPModel,
) -> DataFrame:
    """RP pair table with the full ``f_2`` signal vector attached."""
    pairs = np_pair_signals(pairs, embeddings, ppdb)
    pairs = add_pair_sim(pairs, "sim_amie", amie.sim_series)
    pairs = add_pair_sim(pairs, "sim_kbp", kbp.sim_series)
    return pairs
