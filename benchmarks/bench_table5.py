"""Benchmark + reproduction harness for Table 5 / Figure 4 (feature variants)."""
from benchmarks.conftest import check_and_save
from repro.tables import table5


def test_table5(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: table5.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, table5.render, out_dir, "table5",
                   ["average_f1", "accuracy"])
    by = {r["variant"]: r for r in rows}
    # more feature functions must not hurt (within noise)
    assert by["JOCL-all"]["average_f1"] >= by["JOCL-single"]["average_f1"] - 0.05
    assert by["JOCL-all"]["accuracy"] >= by["JOCL-single"]["accuracy"] - 0.05
