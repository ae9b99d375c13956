"""String similarity measures used as JOCL signals and by baselines.

* IDF token overlap (§3.1.3) — the blocking and canonicalization signal.
* ngram Jaccard and normalized Levenshtein (§3.2.4) — relation-linking
  signals ("we adopt a python library to compute those different string
  similarities"; the container is offline, so the measures are
  implemented here directly).
* Jaro-Winkler — the Text Similarity baseline [13].

All scalar functions are pure Python (usable inside pandas UDFs and in
unit tests); :func:`idf_weights` computes the corpus word-frequency
table with Spark.
"""
from __future__ import annotations

import math

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.text.tokens import content_tokens, with_tokens


# ------------------------------------------------------ IDF token overlap

def idf_weights(phrases: DataFrame, col: str = "phrase",
                *, stem: bool = False) -> dict[str, int]:
    """Word -> frequency over the collection of all words appearing in
    the given phrases (the paper's ``f(x)``).  Computed with Spark
    (explode + groupBy) and collected: the vocabulary is small even when
    the triple set is large."""
    rows = (
        phrases.select(F.explode(with_tokens(col, stem=stem)).alias("w"))
        .groupBy("w")
        .count()
        .collect()
    )
    return {r["w"]: r["count"] for r in rows}


def idf_token_overlap(a: str, b: str, freq: dict[str, int],
                      *, stem: bool = False) -> float:
    """``Sim_idf`` of §3.1.3: IDF-weighted Jaccard over content tokens.

    Unknown words get frequency 0 (weight 1/log(1+0+1) -> treated as
    maximally infrequent via +1 smoothing on the count to keep the
    weight finite).  ``stem`` must match how ``freq`` was computed.
    """
    ta = set(content_tokens(a, stem=stem))
    tb = set(content_tokens(b, stem=stem))
    if not ta and not tb:
        return 1.0 if a.strip().lower() == b.strip().lower() else 0.0

    def w(x: str) -> float:
        return 1.0 / math.log(1.0 + freq.get(x, 0) + 1.0)

    inter = sum(w(x) for x in ta & tb)
    union = sum(w(x) for x in ta | tb)
    return inter / union if union > 0 else 0.0


# ------------------------------------------------------------- ngram sim

def ngrams(s: str, n: int = 3) -> set[str]:
    """Character n-grams of a padded lowercase string."""
    s = f"^{s.strip().lower()}$"
    if len(s) <= n:
        return {s}
    return {s[i : i + n] for i in range(len(s) - n + 1)}


def ngram_jaccard(a: str, b: str, n: int = 3) -> float:
    """Jaccard similarity between character-ngram sets (§3.2.4 Ngram)."""
    ga, gb = ngrams(a, n), ngrams(b, n)
    if not ga and not gb:
        return 1.0
    return len(ga & gb) / len(ga | gb)


# ---------------------------------------------------------- Levenshtein

def levenshtein(a: str, b: str) -> int:
    """Classic dynamic-programming edit distance."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


def levenshtein_sim(a: str, b: str) -> float:
    """LD normalized to a 0..1 similarity (1 - dist / max_len), as the
    paper normalizes LD "to a range from 0 to 1"."""
    a, b = a.strip().lower(), b.strip().lower()
    m = max(len(a), len(b))
    if m == 0:
        return 1.0
    return 1.0 - levenshtein(a, b) / m


# ---------------------------------------------------------- Jaro-Winkler

def jaro(a: str, b: str) -> float:
    if a == b:
        return 1.0
    la, lb = len(a), len(b)
    if la == 0 or lb == 0:
        return 0.0
    window = max(la, lb) // 2 - 1
    match_a = [False] * la
    match_b = [False] * lb
    matches = 0
    for i in range(la):
        lo, hi = max(0, i - window), min(lb, i + window + 1)
        for j in range(lo, hi):
            if not match_b[j] and a[i] == b[j]:
                match_a[i] = match_b[j] = True
                matches += 1
                break
    if matches == 0:
        return 0.0
    transpositions = 0
    j = 0
    for i in range(la):
        if match_a[i]:
            while not match_b[j]:
                j += 1
            if a[i] != b[j]:
                transpositions += 1
            j += 1
    t = transpositions / 2
    m = matches
    return (m / la + m / lb + (m - t) / m) / 3.0


def jaro_winkler(a: str, b: str, p: float = 0.1, max_prefix: int = 4) -> float:
    """Jaro-Winkler similarity [53], used by the Text Similarity
    baseline of Galárraga et al. [13]."""
    a, b = a.strip().lower(), b.strip().lower()
    j = jaro(a, b)
    prefix = 0
    for ca, cb in zip(a, b):
        if ca != cb or prefix == max_prefix:
            break
        prefix += 1
    return j + prefix * p * (1.0 - j)
