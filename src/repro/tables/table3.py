"""Table 3 — OKB entity linking accuracy: 6 methods × 2 datasets."""
from __future__ import annotations

from repro.baselines.entity_linking import ENTITY_LINKING_BASELINES
from repro.tables.common import TableContext, fmt_table

#: Table 3 of the paper
PAPER = {
    "reverb": {"Falcon": 0.541, "EARL": 0.473, "Spotlight": 0.716,
               "Tagme": 0.316, "KBPearl": 0.522, "JOCL": 0.761},
    "nyt": {"Falcon": 0.33, "EARL": 0.25, "Spotlight": 0.26,
            "Tagme": 0.3, "KBPearl": 0.46, "JOCL": 0.48},
}

COLUMNS = ["dataset", "method", "accuracy", "paper_accuracy"]


def run(ctx: TableContext, datasets: tuple[str, ...] = ("reverb", "nyt")
        ) -> list[dict]:
    rows = []
    for name in datasets:
        signals = ctx.signals(name)
        for method, fn in ENTITY_LINKING_BASELINES.items():
            links = fn(ctx.spark, signals)
            acc = ctx.entity_accuracy(name, links)
            rows.append({"dataset": name, "method": method,
                         "accuracy": round(acc, 3),
                         "paper_accuracy": PAPER[name][method]})
        acc = ctx.entity_accuracy(name, ctx.jocl(name).decode.np_links)
        rows.append({"dataset": name, "method": "JOCL",
                     "accuracy": round(acc, 3),
                     "paper_accuracy": PAPER[name]["JOCL"]})
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
