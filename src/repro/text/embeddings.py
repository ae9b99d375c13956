"""Deterministic synthetic word embeddings (fastText substitute).

The paper scores ``Sim_emb`` with fastText vectors trained on Common
Crawl.  The container is offline, so we build a deterministic embedding
model with the property that matters for every signal that consumes it:
*surface forms of the same concept land close in cosine space, surface
forms of different concepts land far apart, with tunable noise*.

Construction: every latent concept (an entity or a relation of the
synthetic world) gets a unit Gaussian "latent" vector seeded by its id.
Every word gets a hash-seeded Gaussian "form" vector; words that the
world associates with a concept (the concept's name tokens, acronyms,
…) are blended toward that concept's latent — an offline stand-in for
"distributional semantics": words that co-occur with a concept in a
corpus end up near it.  A phrase embedding is the mean of its word
vectors (exactly the paper's "average the vectors of all the single
words in the phrase"), and ``Sim_emb`` is cosine similarity mapped to
[0, 1].
"""
from __future__ import annotations

import hashlib

import numpy as np
import pandas as pd

from repro.text.tokens import tokenize

_DEF_DIM = 32


def _seeded_unit(key: str, dim: int) -> np.ndarray:
    """Deterministic unit Gaussian vector for an arbitrary string key."""
    seed = int.from_bytes(hashlib.sha256(key.encode()).digest()[:8], "little")
    v = np.random.default_rng(seed).normal(size=dim)
    return v / np.linalg.norm(v)


class EmbeddingModel:
    """Word/phrase embeddings with a concept-latent structure.

    Parameters
    ----------
    latent_of_word:
        word -> concept-key map.  A word mapped to a concept is pulled
        toward that concept's latent vector; unmapped words are pure
        hash noise (function words, typos).  An ambiguous surface (e.g.
        an acronym shared by two entities) should be mapped to only one
        of them — exactly the failure mode real embeddings have.
    latent_weight:
        blend factor in [0, 1]; higher -> cleaner separation between
        concepts.  0.75 gives alias-pair cosines ~0.8-0.95 and
        cross-entity cosines ~0.0-0.3, matching the magnitudes quoted
        in the paper (Sim_emb("Barack Obama","President Obama")=0.873).
    """

    def __init__(
        self,
        latent_of_word: dict[str, str] | None = None,
        *,
        dim: int = _DEF_DIM,
        latent_weight: float = 0.75,
    ) -> None:
        self.dim = dim
        self.latent_weight = float(latent_weight)
        self.latent_of_word = dict(latent_of_word or {})
        self._word_cache: dict[str, np.ndarray] = {}

    # -- vectors ---------------------------------------------------------
    def word_vec(self, word: str) -> np.ndarray:
        v = self._word_cache.get(word)
        if v is None:
            form = _seeded_unit("w:" + word, self.dim)
            concept = self.latent_of_word.get(word)
            if concept is None:
                v = form
            else:
                lat = _seeded_unit("c:" + concept, self.dim)
                v = self.latent_weight * lat + (1 - self.latent_weight) * form
                v = v / np.linalg.norm(v)
            self._word_cache[word] = v
        return v

    def phrase_vec(self, phrase: str) -> np.ndarray:
        toks = tokenize(phrase)
        if not toks:
            return np.zeros(self.dim)
        return np.mean([self.word_vec(t) for t in toks], axis=0)

    # -- similarity ------------------------------------------------------
    def sim(self, a: str, b: str) -> float:
        """``Sim_emb``: cosine similarity rescaled from [-1, 1] to [0, 1]
        so it composes with the other feature functions (all of which
        live in [0, 1])."""
        va, vb = self.phrase_vec(a), self.phrase_vec(b)
        na, nb = np.linalg.norm(va), np.linalg.norm(vb)
        if na == 0 or nb == 0:
            return 0.5
        cos = float(np.dot(va, vb) / (na * nb))
        return (cos + 1.0) / 2.0

    def sim_series(self, a: pd.Series, b: pd.Series) -> pd.Series:
        """Vectorized pair similarity for pandas-UDF use."""
        return pd.Series(
            [self.sim(x, y) for x, y in zip(a, b)], index=a.index, dtype="float64"
        )
