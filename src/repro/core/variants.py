"""Named JOCL variants used by the evaluation (§4.4, §4.5).

* ``JOCL``        — the full framework.
* ``JOCL_cano``   — consistency factors removed and the linking side
  dropped: JOCL working on OKB canonicalization alone (Table 4).
* ``JOCL_link``   — canonicalization side dropped: JOCL working on OKB
  linking alone (Table 4).
* ``JOCL-single`` / ``JOCL-double`` / ``JOCL-all`` — the Table 5
  feature-combination variants (Figure 4): each signal factor keeps
  one / two / all of its feature functions.
"""
from __future__ import annotations

from dataclasses import replace

from repro.core.jocl import JOCLConfig

FULL = JOCLConfig()

CANO_ONLY = replace(FULL, use_link=False, use_consistency=False)
LINK_ONLY = replace(FULL, use_canon=False, use_consistency=False)

# Table 5: F1,F3 / F2 / F4,F6 / F5 feature sets per variant
SINGLE = replace(
    FULL,
    np_feats=("np_idf",),
    rp_feats=("rp_idf",),
    el_feats=("el_pop",),
    rl_feats=("rl_ngram",),
)
DOUBLE = replace(
    FULL,
    np_feats=("np_idf", "np_emb"),
    rp_feats=("rp_idf", "rp_emb"),
    el_feats=("el_pop", "el_emb"),
    rl_feats=("rl_ngram", "rl_emb"),
)
ALL = FULL

VARIANTS: dict[str, JOCLConfig] = {
    "JOCL": FULL,
    "JOCL_cano": CANO_ONLY,
    "JOCL_link": LINK_ONLY,
    "JOCL-single": SINGLE,
    "JOCL-double": DOUBLE,
    "JOCL-all": ALL,
}
