"""Figure 3 (table-shaped) — OKB relation linking accuracy on ReVerb45K.

The paper shows these accuracies as a bar chart; the values below are
read off the figure and are therefore approximate (the text only
states that JOCL beats all four baselines and that relation linking
scores much lower than entity linking).
"""
from __future__ import annotations

from repro.baselines.relation_linking import RELATION_LINKING_BASELINES
from repro.tables.common import TableContext, fmt_table

#: read off Figure 3 — approximate
PAPER = {"Falcon": 0.40, "EARL": 0.15, "Rematch": 0.42, "KBPearl": 0.50,
         "JOCL": 0.57}

COLUMNS = ["method", "accuracy", "paper_accuracy_approx"]


def run(ctx: TableContext) -> list[dict]:
    rows = []
    signals = ctx.signals("reverb")
    for method, fn in RELATION_LINKING_BASELINES.items():
        links = fn(ctx.spark, signals)
        acc = ctx.relation_accuracy("reverb", links)
        rows.append({"method": method, "accuracy": round(acc, 3),
                     "paper_accuracy_approx": PAPER[method]})
    acc = ctx.relation_accuracy("reverb", ctx.jocl("reverb").decode.rp_links)
    rows.append({"method": "JOCL", "accuracy": round(acc, 3),
                 "paper_accuracy_approx": PAPER["JOCL"]})
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
