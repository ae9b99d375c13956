"""Table 4 — ablation of the task interaction on ReVerb45K.

JOCL_cano (canonicalization alone), JOCL_link (linking alone), and the
full joint JOCL: the joint model must beat both single-task variants.
"""
from __future__ import annotations

from repro.tables.common import TableContext, fmt_table

#: Table 4 of the paper: (macro, micro, pairwise, average F1, accuracy)
PAPER = {
    "JOCL_cano": (0.571, 0.846, 0.787, 0.735, None),
    "JOCL_link": (None, None, None, None, 0.744),
    "JOCL": (0.684, 0.892, 0.877, 0.818, 0.761),
}

COLUMNS = ["variant", "macro_f1", "micro_f1", "pairwise_f1", "average_f1",
           "accuracy", "paper_avg_f1", "paper_accuracy"]


def run(ctx: TableContext) -> list[dict]:
    rows = []
    for variant in ("JOCL_cano", "JOCL_link", "JOCL"):
        res = ctx.jocl("reverb", variant)
        row: dict = {"variant": variant}
        if res.decode.np_clusters is not None:
            row.update(ctx.np_canon_scores("reverb", res.decode.np_clusters).row())
        else:
            row.update({"macro_f1": "-", "micro_f1": "-", "pairwise_f1": "-",
                        "average_f1": "-"})
        if res.decode.np_links is not None:
            row["accuracy"] = round(
                ctx.entity_accuracy("reverb", res.decode.np_links), 3
            )
        else:
            row["accuracy"] = "-"
        row["paper_avg_f1"] = PAPER[variant][3] if PAPER[variant][3] else "-"
        row["paper_accuracy"] = PAPER[variant][4] if PAPER[variant][4] else "-"
        rows.append(row)
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
