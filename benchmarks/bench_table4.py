"""Benchmark + reproduction harness for Table 4 (task-interaction ablation)."""
from benchmarks.conftest import check_and_save
from repro.tables import table4


def test_table4(benchmark, ctx, out_dir):
    rows = benchmark.pedantic(
        lambda: table4.run(ctx), rounds=1, iterations=1
    )
    check_and_save(rows, table4.render, out_dir, "table4", [])
    by = {r["variant"]: r for r in rows}
    # the joint model must not lose to either single-task ablation
    assert by["JOCL"]["average_f1"] >= by["JOCL_cano"]["average_f1"] - 0.03
    assert by["JOCL"]["accuracy"] >= by["JOCL_link"]["accuracy"] - 0.03
