"""Tokenization and morphological normalization for NPs and RPs.

The paper's pipeline tokenizes noun phrases (NPs) and relation phrases
(RPs) for the IDF-token-overlap signal (§3.1.3) and applies
"morphological normalization" (removing tenses, pluralization,
auxiliary verbs, determiners) both as the Morph Norm baseline [11] and
as the preprocessing step before AMIE rule mining (§3.1.4).

Everything here is pure Python so it can run inside pandas UDFs; Spark
helpers wrap the scalar functions.
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, StringType

# Determiners / auxiliaries / copulas stripped by morphological
# normalization.  Kept deliberately small: the synthetic world only
# emits function words from this list, so normalization behaviour on
# the substrate matches its behaviour on English OIE output.
# Prepositions that carry relational meaning (in/on/at/with/by/for) are
# deliberately NOT stopwords: "member of" and "member in" are different
# relations, and collapsing them merges distinct RP clusters.
STOPWORDS = frozenset(
    """a an the be is are was were been being am do does did have has had
    will would can could shall should may might must of to as
    early now""".split()
)
# "early"/"now" are the filler modifiers the synthetic relation
# paraphraser inserts; the paper's normalization rule removes
# "tense, pluralization, auxiliary verb, determiner, and modifier",
# and its own running example maps "be a member of" and
# "be an early member of" to the same relation.

_TOKEN_RE = re.compile(r"[a-z0-9]+")


def tokenize(phrase: str) -> list[str]:
    """Lowercase word tokens of a phrase ("University of Maryland" ->
    ["university", "of", "maryland"])."""
    return _TOKEN_RE.findall(phrase.lower())


def content_tokens(phrase: str, *, stem: bool = False) -> list[str]:
    """Tokens with stopwords removed; used by IDF overlap and AMIE
    normalization so that "be a member of" ~ "member".  With ``stem``
    the morphological suffix stripper is applied per token — relation
    phrases are blocked on stemmed tokens so tense/plural verb variants
    ("kaba in" / "kabas in") become candidate pairs."""
    toks = [t for t in tokenize(phrase) if t not in STOPWORDS]
    return [_strip_morph(t) for t in toks] if stem else toks


def _strip_morph(tok: str) -> str:
    """Heuristic stemmer: drop plural "-s/-es" and tense "-ed/-ing".

    This mirrors the simple normalization operations Morph Norm [11]
    applies (no full Porter stemming in the original either).
    """
    for suf in ("ing", "ed", "es"):
        if tok.endswith(suf) and len(tok) - len(suf) >= 3:
            return tok[: -len(suf)]
    if tok.endswith("s") and len(tok) >= 4:
        return tok[:-1]
    return tok


def morph_normalize(phrase: str) -> str:
    """Morphologically normalized form: stopwords dropped, suffixes
    stripped, tokens joined by single spaces.  Empty content falls back
    to the stemmed full token list so no phrase normalizes to ""."""
    toks = [_strip_morph(t) for t in content_tokens(phrase)]
    if not toks:
        toks = [_strip_morph(t) for t in tokenize(phrase)]
    return " ".join(toks)


def acronym_of(phrase: str) -> str:
    """First letters of the content tokens ("university of maryland"
    -> "um"); the synthetic world uses this to mint acronym aliases."""
    return "".join(t[0] for t in content_tokens(phrase))


# ---------------------------------------------------------------- Spark

tokenize_udf = F.udf(lambda s: tokenize(s), ArrayType(StringType()))
content_tokens_udf = F.udf(lambda s: content_tokens(s), ArrayType(StringType()))
stemmed_tokens_udf = F.udf(
    lambda s: content_tokens(s, stem=True), ArrayType(StringType())
)


@F.pandas_udf(StringType())
def morph_normalize_udf(s: pd.Series) -> pd.Series:  # pragma: no cover - thin wrapper
    return s.map(morph_normalize)


def with_tokens(col: str | Column, *, content_only: bool = True,
                stem: bool = False) -> Column:
    """Column expression producing the token array of a phrase column."""
    c = F.col(col) if isinstance(col, str) else col
    if stem:
        return stemmed_tokens_udf(c)
    return content_tokens_udf(c) if content_only else tokenize_udf(c)
