"""Connected components / threshold clustering vs a reference union-find."""
import numpy as np
import pytest

from repro.canon.clustering import (
    clusters_from_pandas,
    connected_components,
    threshold_cluster,
)


def _uf_components(items, edges):
    parent = {i: i for i in items}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[ra] = rb
    groups = {}
    for i in items:
        groups.setdefault(find(i), set()).add(i)
    return {frozenset(g) for g in groups.values()}


def _spark_components(df):
    groups = {}
    for r in df.collect():
        groups.setdefault(r["cluster"], set()).add(r["item"])
    return {frozenset(g) for g in groups.values()}


def test_singletons_only(spark):
    out = clusters_from_pandas(spark, ["a", "b", "c"], [])
    assert _spark_components(out) == {frozenset({"a"}), frozenset({"b"}),
                                      frozenset({"c"})}


def test_chain_merges_transitively(spark):
    out = clusters_from_pandas(
        spark, list("abcde"), [("a", "b"), ("b", "c"), ("d", "e")]
    )
    assert _spark_components(out) == {frozenset("abc"), frozenset("de")}


def test_cluster_label_is_min_member(spark):
    out = clusters_from_pandas(spark, ["x", "m", "a"], [("x", "m"), ("m", "a")])
    assert {r["cluster"] for r in out.collect()} == {"a"}


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_random_graphs_match_union_find(spark, seed):
    rng = np.random.default_rng(seed)
    items = [f"v{i}" for i in range(30)]
    edges = [
        (items[rng.integers(30)], items[rng.integers(30)])
        for _ in range(25)
    ]
    edges = [(a, b) for a, b in edges if a != b]
    out = clusters_from_pandas(spark, items, edges)
    assert _spark_components(out) == _uf_components(items, edges)


def test_threshold_cluster_cuts_at_tau(spark):
    v = spark.createDataFrame([("a",), ("b",), ("c",)], ["item"])
    pairs = spark.createDataFrame(
        [("a", "b", 0.9), ("b", "c", 0.3)], ["a", "b", "sim"]
    )
    out = threshold_cluster(v, pairs, sim_col="sim", tau=0.5)
    assert _spark_components(out) == {frozenset("ab"), frozenset("c")}


def test_every_vertex_labeled(spark):
    v = spark.createDataFrame([(f"v{i}",) for i in range(10)], ["item"])
    e = spark.createDataFrame([("v0", "v9")], ["a", "b"])
    out = connected_components(v, e)
    assert out.count() == 10
