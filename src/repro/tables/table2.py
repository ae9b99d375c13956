"""Table 2 — RP canonicalization over ReVerb45K: AMIE, PATTY, SIST, JOCL."""
from __future__ import annotations

from repro.baselines.rp_canon import RP_CANON_BASELINES
from repro.tables.common import TableContext, fmt_table

#: Table 2 of the paper: (macro, micro, pairwise, average) F1
PAPER = {
    "AMIE": (0.703, 0.820, 0.760, 0.761),
    "PATTY": (0.782, 0.872, 0.802, 0.819),
    "SIST": (0.875, 0.872, 0.845, 0.864),
    "JOCL": (0.848, 0.923, 0.851, 0.874),
}

COLUMNS = ["method", "macro_f1", "micro_f1", "pairwise_f1", "average_f1",
           "paper_avg_f1"]


def run(ctx: TableContext) -> list[dict]:
    rows = []
    signals = ctx.signals("reverb")
    for method, fn in RP_CANON_BASELINES.items():
        clusters = fn(ctx.spark, signals)
        sc = ctx.rp_canon_scores("reverb", clusters)
        rows.append({"method": method, **sc.row(),
                     "paper_avg_f1": PAPER[method][3]})
    sc = ctx.rp_canon_scores("reverb", ctx.jocl("reverb").decode.rp_clusters)
    rows.append({"method": "JOCL", **sc.row(), "paper_avg_f1": PAPER["JOCL"][3]})
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
