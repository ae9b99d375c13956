"""Stanford-KBP substitute: RP -> CKB relation category (§3.1.4 "KBP").

The paper calls the Stanford KBP system to map a relation phrase to a
relation in a CKB; two RPs whose relations fall in the same category
score ``Sim_KBP = 1``.  Offline we simulate the trained system with a
dictionary classifier over the world's relation paraphrases:

* it knows the morph-normalized form of a *subset* of each relation's
  paraphrases (``coverage`` < 1 — KBP's recall is far from perfect);
* with probability ``confusion`` a known phrase is assigned a wrong
  category (KBP's precision is also imperfect).

This exercises the identical code path: a phrase-level categorical
matcher whose agreement yields a binary similarity.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.okbgen.world import World
from repro.text.tokens import morph_normalize


class KBPModel:
    """Noisy phrase -> relation-category classifier."""

    def __init__(self, category_of: dict[str, int]):
        self.category_of = dict(category_of)

    @classmethod
    def from_world(
        cls,
        world: World,
        *,
        coverage: float = 0.6,
        confusion: float = 0.05,
        seed: int = 7,
    ) -> "KBPModel":
        rng = np.random.default_rng(seed)
        n_rel = len(world.relations)
        cat: dict[str, int] = {}
        for row in world.rel_phrases.itertuples():
            if rng.random() >= coverage:
                continue
            rel = int(row.rel_id)
            if rng.random() < confusion:
                rel = int(rng.integers(n_rel))
            cat[morph_normalize(row.phrase)] = rel
        return cls(cat)

    def category(self, rp: str) -> int | None:
        return self.category_of.get(morph_normalize(rp))

    def sim(self, a: str, b: str) -> float:
        """``Sim_KBP``: 1 iff both RPs are classified and agree."""
        ca, cb = self.category(a), self.category(b)
        if ca is None or cb is None:
            return 0.0
        return 1.0 if ca == cb else 0.0

    def sim_series(self, a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(
            [self.sim(x, y) for x, y in zip(a, b)], index=a.index, dtype="float64"
        )
