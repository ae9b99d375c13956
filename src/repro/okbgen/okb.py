"""OIE-triple dataset emitters: ReVerb45K-lite and NYTimes2018-lite.

A dataset is a set of OIE triples ``(subj, pred, obj)`` sampled from a
synthetic :class:`~repro.okbgen.world.World`: each triple realizes a
world fact through sampled surface forms (an alias for each entity, a
paraphrase for the relation).  Every occurrence carries its generating
gold labels — standing in for ReVerb45K's Freebase annotations and for
the paper's manually labeled NYTimes2018 samples.

Scale-factor convention matches the repo: ``sf=1.0`` ≈ the real
dataset's size (45K / 34K triples); tests use ``sf≈0.005``, benchmarks
``sf≈0.03`` (overridable via ``REPRO_BENCH_SF``).
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import cached_property

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.okbgen.world import (
    NYT_PROFILE,
    REVERB_PROFILE,
    World,
    WorldProfile,
    build_world,
)
from repro.text.embeddings import EmbeddingModel
from repro.text.ppdb import PPDBIndex

#: surface-form emission mix; deliberately non-canonical-heavy — OIE
#: output is dominated by short forms, morphological variants and noisy
#: mentions, which is what separates dictionary-less linkers from
#: anchor-based ones in Table 3
_ALIAS_KIND_W = {"canonical": 0.27, "short": 0.24, "acronym": 0.18,
                 "prefix": 0.09, "long": 0.05, "typo": 0.05, "given": 0.06,
                 "plural": 0.08}


@dataclass
class OKBDataset:
    """An emitted OIE dataset plus the world it came from."""

    name: str
    world: World
    triples: pd.DataFrame  # triple_id, subj, pred, obj, gold_subj, gold_rel, gold_obj, fold

    def to_spark(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.triples)

    # ------------------------------------------------------- resources
    @cached_property
    def embeddings(self) -> EmbeddingModel:
        """fastText substitute wired to this world's concept latents."""
        return EmbeddingModel(self.world.latent_of_word)

    @cached_property
    def ppdb(self) -> PPDBIndex:
        """PPDB 2.0 substitute built from the world's gold paraphrase
        groups with the profile's coverage noise."""
        groups = self.world.np_groups() + self.world.rp_groups()
        return PPDBIndex.from_groups(
            groups, coverage=self.world.profile.ppdb_coverage,
            seed=len(self.triples),
        )

    # ------------------------------------------------------ gold labels
    def gold_np_labels(self) -> pd.DataFrame:
        """(np, gold_ent) per distinct NP: the majority generating
        entity across occurrences (ambiguous surfaces occur with more
        than one gold entity, exactly like real annotated corpora)."""
        occ = pd.concat(
            [
                self.triples[["subj", "gold_subj"]].rename(
                    columns={"subj": "np", "gold_subj": "gold_ent"}),
                self.triples[["obj", "gold_obj"]].rename(
                    columns={"obj": "np", "gold_obj": "gold_ent"}),
            ]
        )
        counts = occ.groupby(["np", "gold_ent"]).size().reset_index(name="n")
        top = counts.sort_values(["np", "n"], ascending=[True, False])
        return top.drop_duplicates("np")[["np", "gold_ent"]].reset_index(drop=True)

    def gold_rp_labels(self) -> pd.DataFrame:
        """(rp, gold_rel) per distinct RP (majority, as above)."""
        counts = (
            self.triples.groupby(["pred", "gold_rel"]).size().reset_index(name="n")
        )
        top = counts.sort_values(["pred", "n"], ascending=[True, False])
        out = top.drop_duplicates("pred")[["pred", "gold_rel"]]
        return out.rename(columns={"pred": "rp"}).reset_index(drop=True)


def _emit(
    world: World, *, n_triples: int, name: str, seed: int, val_frac: float
) -> OKBDataset:
    rng = np.random.default_rng(seed)
    facts = world.facts
    # Zipf sampling over facts so head facts repeat with varied phrasing
    # (this is what gives the AMIE substrate its support counts).
    ranks = rng.permutation(len(facts)) + 1
    w = 1.0 / ranks**0.9
    w /= w.sum()
    idx = rng.choice(len(facts), size=n_triples, p=w)

    alias_by_ent = {
        ent: (g["alias"].tolist(),
              np.asarray([_ALIAS_KIND_W[k] for k in g["kind"]], dtype=float))
        for ent, g in world.aliases.groupby("ent_id")
    }
    phrase_by_rel = {
        rel: g["phrase"].tolist() for rel, g in world.rel_phrases.groupby("rel_id")
    }

    def surface(ent: int) -> str:
        names, kw = alias_by_ent[ent]
        return names[int(rng.choice(len(names), p=kw / kw.sum()))]

    rows = []
    for t_id, fi in enumerate(idx):
        f = facts.iloc[fi]
        phrases = phrase_by_rel[int(f.rel)]
        rows.append(
            {
                "triple_id": t_id,
                "subj": surface(int(f.subj)),
                "pred": phrases[int(rng.integers(len(phrases)))],
                "obj": surface(int(f.obj)),
                "gold_subj": int(f.subj),
                "gold_rel": int(f.rel),
                "gold_obj": int(f.obj),
            }
        )
    triples = pd.DataFrame(rows)

    # Validation fold: triples whose gold subject entity falls in a 20 %
    # entity sample (the paper's protocol: "triples associated with 20%
    # selected Freebase entities of ReVerb45K as the validation set").
    ents = triples["gold_subj"].unique()
    n_val = int(len(ents) * val_frac)
    val_ents = set(rng.choice(ents, size=n_val, replace=False)) if n_val else set()
    triples["fold"] = np.where(
        triples["gold_subj"].isin(list(val_ents)), "val", "test"
    )
    return OKBDataset(name=name, world=world, triples=triples)


def _sized_world(n_triples: int, profile: WorldProfile, seed: int) -> World:
    n_entities = max(16, n_triples // 5)
    n_relations = max(6, n_entities // 6)
    n_facts = max(30, int(n_triples * 0.55))
    return build_world(
        n_entities=n_entities, n_relations=n_relations, n_facts=n_facts,
        profile=profile, seed=seed,
    )


def reverb45k_lite(*, sf: float = 0.01, seed: int = 0) -> OKBDataset:
    """ReVerb45K substitute: cleaner profile, 20 % validation fold."""
    n = max(60, int(45_000 * sf))
    world = _sized_world(n, REVERB_PROFILE, seed)
    return _emit(world, n_triples=n, name="reverb45k_lite", seed=seed + 1,
                 val_frac=0.2)


def nytimes2018_lite(*, sf: float = 0.01, seed: int = 10) -> OKBDataset:
    """NYTimes2018 substitute: noisier profile, no validation fold
    (the real corpus is unlabeled; weights are trained on ReVerb)."""
    n = max(50, int(34_000 * sf))
    world = _sized_world(n, NYT_PROFILE, seed)
    return _emit(world, n_triples=n, name="nytimes2018_lite", seed=seed + 1,
                 val_frac=0.0)
