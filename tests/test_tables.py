"""Table-harness tests: context caching, eval protocol, rendering.

The full table sweeps live in ``benchmarks/``; here we exercise the
harness machinery and the cheapest table end-to-end at tiny scale.
"""
import pytest
from pyspark.sql import functions as F

from repro.tables import fig3, table2
from repro.tables.common import TableContext, _non_singleton, fmt_table, quick_config


@pytest.fixture(scope="module")
def ctx(spark):
    return TableContext(spark, sf=0.004,
                        base_config=quick_config(lbp_iters=4, epochs=1))


def test_dataset_memoized(ctx):
    assert ctx.dataset("reverb") is ctx.dataset("reverb")
    assert ctx.dataset("nyt") is not ctx.dataset("reverb")
    with pytest.raises(KeyError):
        ctx.dataset("nope")


def test_signals_memoized_per_family(ctx):
    a = ctx.signals("reverb", "JOCL")
    b = ctx.signals("reverb", "JOCL-single")  # same use_canon/use_link
    assert a is b
    c = ctx.signals("reverb", "JOCL_cano")
    assert c is not a


def test_jocl_all_aliases_full(ctx):
    assert ctx.config("JOCL-all") == ctx.config("JOCL")


def test_non_singleton_filter(spark):
    asg = spark.createDataFrame(
        [("a", "p1", "g1"), ("b", "p2", "g1"), ("c", "p3", "g2")],
        ["item", "pred", "gold"],
    )
    kept = _non_singleton(asg)
    assert {r["item"] for r in kept.collect()} == {"a", "b"}


def test_fmt_table_alignment():
    rows = [{"x": "long-value", "y": 0.5}, {"x": "s", "y": 1.0}]
    text = fmt_table(rows, ["x", "y"])
    lines = text.splitlines()
    assert len(lines) == 4
    assert lines[0].startswith("x")
    assert all(len(line) <= len(lines[1]) for line in lines)


def test_table2_runs_end_to_end(ctx):
    rows = table2.run(ctx)
    methods = [r["method"] for r in rows]
    assert methods == ["AMIE", "PATTY", "SIST", "JOCL"]
    for r in rows:
        assert 0.0 <= r["average_f1"] <= 1.0
        assert r["paper_avg_f1"] > 0
    text = table2.render(rows)
    assert "JOCL" in text and "paper_avg_f1" in text


def test_fig3_runs_end_to_end(ctx):
    rows = fig3.run(ctx)
    assert [r["method"] for r in rows] == [
        "Falcon", "EARL", "Rematch", "KBPearl", "JOCL"
    ]
    for r in rows:
        assert 0.0 <= r["accuracy"] <= 1.0


def test_entity_accuracy_none_is_zero(ctx):
    assert ctx.entity_accuracy("reverb", None) == 0.0
    assert ctx.relation_accuracy("reverb", None) == 0.0
