"""Ground-truth synthetic world behind both OIE datasets and the CKB.

The paper evaluates on ReVerb45K (ClueWeb09 triples annotated against
Freebase) and NYTimes2018, with side resources (Wikipedia anchor
statistics, fastText, PPDB).  None of those exist offline, so this
module builds a seeded world that plants all of the structure every
JOCL signal depends on:

* **entities** with canonical names and alias sets (short forms,
  acronyms, honorific prefixes, misspellings) — including genuinely
  ambiguous surfaces shared by several entities (the paper's "UMD");
* **relations** with canonical phrases and paraphrase sets (auxiliary /
  determiner / modifier variants, synonym verbs) — the paper's
  "be a member of" vs "be an early member of";
* **facts** ⟨e, r, e⟩, a subset of which is included in the CKB (drives
  the fact-inclusion factor U4);
* **anchor statistics** ``(surface, entity, count)`` standing in for
  Wikipedia anchor links (drives entity popularity f_pop and candidate
  generation), with configurable coverage holes and spurious targets;
* a **word -> concept map** feeding the synthetic embedding model.

Everything is a deterministic function of ``(profile, n_entities,
n_relations, seed)``.  Dataframes are plain pandas here — the world is
metadata-scale; the OIE triples built *from* it (``okb.py``) are the
Spark-scale artifact.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.text.tokens import acronym_of, tokenize

_SYLLABLES = [
    "ba", "do", "ri", "ka", "lu", "men", "tor", "vin", "sha", "gol",
    "ner", "pa", "qui", "zet", "mar", "fen", "cor", "dal", "wes", "tia",
]
_ORG_TYPES = ["university", "institute", "company", "bank", "college", "group"]
_PLACE_TYPES = ["city", "county", "valley", "harbor"]
_FIRST_NAMES = ["john", "mary", "james", "anna", "robert", "linda", "david", "sara"]
_HONORIFICS = ["president", "professor", "senator", "dr"]
_REL_TEMPLATES = ["be {v} of", "{v} in", "be {v} at", "have {v} with"]


def _pseudo_word(rng: np.random.Generator, n_syll: int = 2) -> str:
    return "".join(rng.choice(_SYLLABLES) for _ in range(n_syll))


def _typo(rng: np.random.Generator, word: str) -> str:
    """Single-character perturbation (swap or drop) — misspelled alias."""
    if len(word) < 4:
        return word + "e"
    i = int(rng.integers(1, len(word) - 1))
    if rng.random() < 0.5:
        return word[:i] + word[i + 1] + word[i] + word[i + 2 :]
    return word[:i] + word[i + 1 :]


@dataclass
class WorldProfile:
    """Noise knobs that differentiate the two datasets.

    ``reverb`` ~ ReVerb45K: cleaner, well covered by anchors, more of
    its facts already in the CKB.  ``nyt`` ~ NYTimes2018: noisier
    surfaces, more ambiguity, worse anchor coverage, fewer CKB facts —
    which is why every linking system scores lower on it (Table 3).
    """

    head_reuse: float = 0.08      # P(entity reuses an existing head word)
    typo_rate: float = 0.15       # P(entity gets a misspelled alias)
    anchor_miss: float = 0.05     # P(an alias-entity anchor row is dropped)
    anchor_spurious: float = 0.06 # P(alias also anchors to a wrong entity)
    fact_in_ckb: float = 0.4      # P(a fact is present in the CKB)
    ppdb_coverage: float = 0.7
    verb_reuse: float = 0.05      # P(relation reuses an existing verb)


REVERB_PROFILE = WorldProfile(
    head_reuse=0.30,
    anchor_miss=0.10,
    anchor_spurious=0.30,
)
NYT_PROFILE = WorldProfile(
    head_reuse=0.35,
    typo_rate=0.30,
    anchor_miss=0.28,
    anchor_spurious=0.35,
    fact_in_ckb=0.18,
    ppdb_coverage=0.5,
    verb_reuse=0.12,
)


@dataclass
class World:
    entities: pd.DataFrame      # ent_id, name, kind, popularity
    aliases: pd.DataFrame       # ent_id, alias, kind
    relations: pd.DataFrame     # rel_id, name
    rel_phrases: pd.DataFrame   # rel_id, phrase, kind
    facts: pd.DataFrame         # fact_id, subj, rel, obj, in_ckb
    anchors: pd.DataFrame       # surface, ent_id, count
    latent_of_word: dict[str, str] = field(default_factory=dict)
    profile: WorldProfile = field(default_factory=WorldProfile)
    #: corpus-scale word counts for generically common words (first
    #: names, org/place types, honorifics, filler modifiers).  The
    #: paper's f(x) is computed over ClueWeb-scale text where such
    #: words are frequent; a small synthetic corpus cannot expose that
    #: frequency gap, so IDF consumers add these background counts.
    background_freq: dict[str, int] = field(default_factory=dict)

    # -- gold groupings used for evaluation and for the PPDB substrate --
    def np_groups(self) -> list[list[str]]:
        """Alias surfaces grouped by entity (gold NP paraphrase groups)."""
        return [g["alias"].tolist() for _, g in self.aliases.groupby("ent_id")]

    def rp_groups(self) -> list[list[str]]:
        """Relation phrases grouped by relation (gold RP groups)."""
        return [g["phrase"].tolist() for _, g in self.rel_phrases.groupby("rel_id")]


def build_world(
    *,
    n_entities: int,
    n_relations: int,
    n_facts: int,
    profile: WorldProfile = REVERB_PROFILE,
    seed: int = 0,
) -> World:
    """Deterministically build a world; see module docstring."""
    rng = np.random.default_rng(seed)
    latent: dict[str, str] = {}

    # ---------------------------------------------------------- entities
    ent_rows, alias_rows = [], []
    heads: list[str] = []
    for ent_id in range(n_entities):
        ckey = f"e{ent_id}"
        if heads and rng.random() < profile.head_reuse:
            head = heads[int(rng.integers(len(heads)))]  # planted ambiguity
        else:
            head = _pseudo_word(rng, int(rng.integers(2, 4)))
        heads.append(head)
        latent.setdefault(head, ckey)

        kind = ["person", "org", "place"][int(rng.integers(3))]
        aliases: list[tuple[str, str]] = []
        if kind == "person":
            first = _FIRST_NAMES[int(rng.integers(len(_FIRST_NAMES)))]
            name = f"{first} {head}"
            aliases += [(name, "canonical"), (head, "short")]
            aliases.append((f"{_HONORIFICS[int(rng.integers(len(_HONORIFICS)))]} {head}", "prefix"))
            # bare given name: massively ambiguous, like real mentions
            aliases.append((first, "given"))
        elif kind == "org":
            otype = _ORG_TYPES[int(rng.integers(len(_ORG_TYPES)))]
            latent.setdefault(otype, f"type:{otype}")
            name = f"{otype} of {head}" if rng.random() < 0.5 else f"{head} {otype}"
            aliases += [(name, "canonical"), (head, "short")]
            acro = "".join(t[0] for t in tokenize(name))
            if len(acro) >= 2:
                aliases.append((acro, "acronym"))
                latent.setdefault(acro, ckey)
        else:
            ptype = _PLACE_TYPES[int(rng.integers(len(_PLACE_TYPES)))]
            latent.setdefault(ptype, f"type:{ptype}")
            name = head
            aliases += [(name, "canonical"), (f"{ptype} of {head}", "long")]
        if rng.random() < 0.5:
            # trivial morphological variant (plural of the head word):
            # the share of alias variation Morph Norm alone can resolve
            aliases.append((name + "s" if not name.endswith("s")
                            else name[:-1], "plural"))
        if rng.random() < profile.typo_rate:
            aliases.append((_typo(rng, head), "typo"))
        ent_rows.append(
            {"ent_id": ent_id, "name": name, "kind": kind, "popularity": 0.0}
        )
        seen = set()
        for surface, akind in aliases:
            if surface not in seen:
                seen.add(surface)
                alias_rows.append({"ent_id": ent_id, "alias": surface, "kind": akind})

    entities = pd.DataFrame(ent_rows)
    # Zipf popularity over entities (drives anchors and fact sampling).
    ranks = rng.permutation(n_entities) + 1
    entities["popularity"] = 1.0 / ranks**1.05
    entities["popularity"] /= entities["popularity"].sum()
    aliases_df = pd.DataFrame(alias_rows)

    # --------------------------------------------------------- relations
    rel_rows, phrase_rows = [], []
    verbs: list[str] = []
    for rel_id in range(n_relations):
        rkey = f"r{rel_id}"
        if verbs and rng.random() < profile.verb_reuse:
            verb = verbs[int(rng.integers(len(verbs)))]
        else:
            verb = _pseudo_word(rng, 2)
        verbs.append(verb)
        latent.setdefault(verb, rkey)
        template = _REL_TEMPLATES[int(rng.integers(len(_REL_TEMPLATES)))]
        canonical = template.format(v=verb)
        variants = {canonical}
        variants.add(template.format(v=verb + "s"))
        variants.add("be the " + canonical.removeprefix("be ")
                     if canonical.startswith("be ") else "do " + canonical)
        variants.add(canonical.replace("be ", "be an early ", 1)
                     if canonical.startswith("be ") else canonical + " now")
        if rng.random() < 0.3:  # synonym verb mapped to the same latent
            syn = _pseudo_word(rng, 2)
            latent.setdefault(syn, rkey)
            variants.add(template.format(v=syn))
        if rng.random() < 0.5:
            # cross-template paraphrase (same verb, different frame):
            # "be kaba of" vs "kaba with ...".  Morphological classes
            # cannot merge these — only embedding/PPDB/KBP signals can,
            # which is what separates SIST/JOCL from AMIE in Table 2.
            alt = _REL_TEMPLATES[int(rng.integers(len(_REL_TEMPLATES)))]
            if alt != template:
                variants.add(alt.format(v=verb))
        # The CKB names its relations in ontology style ("organizations
        # founded"), not in the OKB's verbal style ("be a member of"):
        # most relation names share the concept latent (embeddings can
        # bridge them) but not the surface string — which is exactly why
        # relation linking is so much harder than entity linking (§4.3.2).
        if rng.random() < 0.45:
            ckb_name = f"{verb} of"
        else:
            noun = _pseudo_word(rng, 2)
            latent.setdefault(noun, rkey)
            ckb_name = f"{noun} relation"
        rel_rows.append({"rel_id": rel_id, "name": ckb_name})
        for ph in sorted(variants):
            phrase_rows.append(
                {
                    "rel_id": rel_id,
                    "phrase": ph,
                    "kind": "canonical" if ph == canonical else "variant",
                }
            )
    relations = pd.DataFrame(rel_rows)
    rel_phrases = pd.DataFrame(phrase_rows)

    # ------------------------------------------------------------- facts
    pop = entities["popularity"].to_numpy()
    subj = rng.choice(n_entities, size=n_facts, p=pop)
    obj = rng.choice(n_entities, size=n_facts, p=pop)
    same = subj == obj
    obj[same] = (obj[same] + 1) % n_entities
    facts = pd.DataFrame(
        {
            "fact_id": np.arange(n_facts),
            "subj": subj,
            "rel": rng.integers(0, n_relations, n_facts),
            "obj": obj,
            "in_ckb": rng.random(n_facts) < profile.fact_in_ckb,
        }
    ).drop_duplicates(subset=["subj", "rel", "obj"], keep="first")

    # ----------------------------------------------------------- anchors
    anchor_rows = []
    kind_w = {"canonical": 1.0, "short": 0.6, "acronym": 0.4,
              "prefix": 0.25, "long": 0.3, "typo": 0.05, "given": 0.15,
              "plural": 0.3}
    pop_by_ent = entities.set_index("ent_id")["popularity"]
    for row in aliases_df.itertuples():
        if rng.random() < profile.anchor_miss:
            continue
        base = 1000.0 * pop_by_ent[row.ent_id] * kind_w[row.kind]
        count = int(np.ceil(base * (0.5 + rng.random())))
        anchor_rows.append({"surface": row.alias, "ent_id": row.ent_id, "count": count})
        if rng.random() < profile.anchor_spurious:
            wrong = int(rng.integers(n_entities))
            if wrong != row.ent_id:
                # spurious target can out-rank the true one: the
                # popularity trap every commonness-based linker falls in
                anchor_rows.append(
                    {"surface": row.alias, "ent_id": wrong,
                     "count": max(1, int(count * (0.3 + 1.7 * rng.random())))}
                )
    anchors = (
        pd.DataFrame(anchor_rows)
        .groupby(["surface", "ent_id"], as_index=False)["count"]
        .sum()
    )

    common = (_ORG_TYPES + _PLACE_TYPES + _FIRST_NAMES + _HONORIFICS
              + ["early", "now", "in", "on", "at", "with", "by", "for"])
    background = {w: 30 * n_entities for w in common}

    return World(
        entities=entities,
        aliases=aliases_df,
        relations=relations,
        rel_phrases=rel_phrases,
        facts=facts.reset_index(drop=True),
        anchors=anchors,
        latent_of_word=latent,
        profile=profile,
        background_freq=background,
    )
