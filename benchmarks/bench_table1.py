"""Benchmark + reproduction harness for Table 1 (NP canonicalization)."""
from benchmarks.conftest import check_and_save
from repro.tables import table1

VALUE_COLS = ["macro_f1", "micro_f1", "pairwise_f1", "average_f1"]


def test_table1(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: table1.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, table1.render, out_dir, "table1", VALUE_COLS)
    jocl = {r["dataset"]: r for r in rows if r["method"] == "JOCL"}
    # shape: JOCL leads on average F1 on ReVerb (ties within noise)
    best = max(r["average_f1"] for r in rows if r["dataset"] == "reverb")
    assert jocl["reverb"]["average_f1"] >= best - 0.08
