"""Benchmark + reproduction harness for Figure 3 (relation linking)."""
from benchmarks.conftest import check_and_save
from repro.tables import fig3


def test_fig3(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: fig3.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, fig3.render, out_dir, "fig3", ["accuracy"])
