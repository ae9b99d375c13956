"""Synthetic PPDB 2.0 substitute (§3.1.3 "PPDB").

PPDB 2.0 clusters equivalent English phrases and assigns each cluster a
random representative; two phrases are equivalent iff they share a
representative.  We reproduce the *index structure and its noise
profile* from the synthetic world's gold paraphrase groups:

* a phrase is indexed at all with probability ``coverage`` (PPDB misses
  many NPs/RPs, especially named entities);
* with probability ``false_merge`` a whole group is merged into another
  group's representative (paraphrase databases over-merge near-synonyms).

``Sim_PPDB`` is then exactly the paper's: 1 if both phrases are indexed
and share a representative, else 0.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


class PPDBIndex:
    """phrase -> cluster-representative index."""

    def __init__(self, rep_of: dict[str, str]) -> None:
        self.rep_of = dict(rep_of)

    @classmethod
    def from_groups(
        cls,
        groups: list[list[str]],
        *,
        coverage: float = 0.7,
        false_merge: float = 0.03,
        seed: int = 0,
    ) -> "PPDBIndex":
        """Build a noisy index from gold paraphrase groups.

        ``groups`` is a list of phrase lists, one per gold concept.
        """
        rng = np.random.default_rng(seed)
        rep_of: dict[str, str] = {}
        reps: list[str] = []
        for group in groups:
            if not group:
                continue
            rep = group[int(rng.integers(len(group)))]
            if reps and rng.random() < false_merge:
                rep = reps[int(rng.integers(len(reps)))]
            reps.append(rep)
            for phrase in group:
                if rng.random() < coverage:
                    rep_of[phrase] = rep
        return cls(rep_of)

    def sim(self, a: str, b: str) -> float:
        """``Sim_PPDB``: 1.0 iff both phrases map to one representative."""
        ra, rb = self.rep_of.get(a), self.rep_of.get(b)
        if ra is None or rb is None:
            return 0.0
        return 1.0 if ra == rb else 0.0

    def sim_series(self, a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [self.sim(x, y) for x, y in zip(a, b)], index=a.index, dtype="float64"
        )

    def as_frame(self) -> pd.DataFrame:
        """(phrase, rep) table for Spark-join use."""
        return pd.DataFrame(
            {"phrase": list(self.rep_of), "rep": list(self.rep_of.values())}
        )
