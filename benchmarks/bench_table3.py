"""Benchmark + reproduction harness for Table 3 (entity linking)."""
from benchmarks.conftest import check_and_save
from repro.tables import table3


def test_table3(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: table3.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, table3.render, out_dir, "table3", ["accuracy"])
    for ds in ("reverb", "nyt"):
        sub = [r for r in rows if r["dataset"] == ds]
        jocl = next(r for r in sub if r["method"] == "JOCL")
        best = max(r["accuracy"] for r in sub)
        assert jocl["accuracy"] >= best - 0.08
