"""Table 1 — NP canonicalization: 8 methods × {ReVerb45K, NYTimes2018}.

Reproduces macro/micro/pairwise/average F1 for every baseline plus
JOCL; paper values are embedded for the EXPERIMENTS.md diff.
"""
from __future__ import annotations

from repro.baselines.np_canon import NP_CANON_BASELINES
from repro.tables.common import TableContext, fmt_table

#: Table 1 of the paper: (macro, micro, pairwise, average) F1
PAPER = {
    "reverb": {
        "Morph Norm": (0.281, 0.699, 0.653, 0.544),
        "Wikidata Integrator": (0.563, 0.839, 0.783, 0.728),
        "Text Similarity": (0.543, 0.821, 0.689, 0.684),
        "IDF Token Overlap": (0.598, 0.571, 0.505, 0.558),
        "Attribute Overlap": (0.598, 0.599, 0.587, 0.595),
        "CESI": (0.618, 0.845, 0.819, 0.761),
        "SIST": (0.691, 0.889, 0.823, 0.801),
        "JOCL": (0.684, 0.892, 0.877, 0.818),
    },
    "nyt": {
        "Morph Norm": (0.471, 0.658, 0.643, 0.591),
        "Wikidata Integrator": (0.476, 0.839, 0.783, 0.699),
        "Text Similarity": (0.581, 0.796, 0.658, 0.678),
        "IDF Token Overlap": (0.551, 0.612, 0.527, 0.563),
        "Attribute Overlap": (0.551, 0.612, 0.527, 0.563),
        "CESI": (0.586, 0.842, 0.778, 0.735),
        "SIST": (0.675, 0.816, 0.838, 0.776),
        "JOCL": (0.561, 0.921, 0.934, 0.805),
    },
}

COLUMNS = ["dataset", "method", "macro_f1", "micro_f1", "pairwise_f1",
           "average_f1", "paper_avg_f1"]


def run(ctx: TableContext, datasets: tuple[str, ...] = ("reverb", "nyt")
        ) -> list[dict]:
    rows = []
    for name in datasets:
        signals = ctx.signals(name)
        for method, fn in NP_CANON_BASELINES.items():
            clusters = fn(ctx.spark, signals).withColumnRenamed("cluster", "cluster")
            sc = ctx.np_canon_scores(name, clusters)
            rows.append(
                {"dataset": name, "method": method, **sc.row(),
                 "paper_avg_f1": PAPER[name][method][3]}
            )
        sc = ctx.np_canon_scores(name, ctx.jocl(name).decode.np_clusters)
        rows.append(
            {"dataset": name, "method": "JOCL", **sc.row(),
             "paper_avg_f1": PAPER[name]["JOCL"][3]}
        )
    return rows


def render(rows: list[dict]) -> str:
    return fmt_table(rows, COLUMNS)
