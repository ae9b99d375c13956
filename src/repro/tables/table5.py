"""Table 5 + Figure 4 — feature-combination variants on ReVerb45K.

JOCL-single / JOCL-double / JOCL-all restrict the feature vectors of
the signal factors per Table 5; Figure 4 reports their NP
canonicalization average F1 and entity linking accuracy (bar charts —
paper values below are approximate read-offs; -all equals the full
JOCL numbers from Tables 1 and 3).
"""
from __future__ import annotations

from repro.tables.common import TableContext, fmt_table

#: Figure 4, approximate read-offs: (average F1, accuracy)
PAPER = {
    "JOCL-single": (0.70, 0.60),
    "JOCL-double": (0.77, 0.70),
    "JOCL-all": (0.818, 0.761),
}

COLUMNS = ["variant", "average_f1", "accuracy",
           "paper_avg_f1_approx", "paper_accuracy_approx"]


def run(ctx: TableContext) -> list[dict]:
    rows = []
    for variant in ("JOCL-single", "JOCL-double", "JOCL-all"):
        res = ctx.jocl("reverb", variant)
        sc = ctx.np_canon_scores("reverb", res.decode.np_clusters)
        acc = ctx.entity_accuracy("reverb", res.decode.np_links)
        rows.append(
            {"variant": variant, "average_f1": round(sc.average_f1, 3),
             "accuracy": round(acc, 3),
             "paper_avg_f1_approx": PAPER[variant][0],
             "paper_accuracy_approx": PAPER[variant][1]}
        )
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
