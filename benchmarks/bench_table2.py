"""Benchmark + reproduction harness for Table 2 (RP canonicalization)."""
from benchmarks.conftest import check_and_save
from repro.tables import table2

VALUE_COLS = ["macro_f1", "micro_f1", "pairwise_f1", "average_f1"]


def test_table2(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: table2.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, table2.render, out_dir, "table2", VALUE_COLS)
