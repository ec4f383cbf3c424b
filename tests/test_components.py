"""Tests for connected components, validated against a python union-find."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.graph import connected_components


def union_find(edges):
    parent = {}

    def find(x):
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    # min-label canonical form
    return {x: find(x) for x in parent}


def _run(spark, edges):
    df = spark.createDataFrame(edges, "src string, dst string")
    return {r["node"]: r["component"] for r in connected_components(df).collect()}


def test_single_edge(spark):
    assert _run(spark, [("b", "a")]) == {"a": "a", "b": "a"}


def test_chain(spark):
    edges = [("a", "b"), ("b", "c"), ("c", "d"), ("d", "e")]
    got = _run(spark, edges)
    assert set(got.values()) == {"a"}


def test_two_components(spark):
    got = _run(spark, [("a", "b"), ("c", "d")])
    assert got["a"] == got["b"] == "a"
    assert got["c"] == got["d"] == "c"


def test_self_loop(spark):
    got = _run(spark, [("a", "a"), ("a", "b")])
    assert got == {"a": "a", "b": "a"}


def test_duplicate_edges(spark):
    got = _run(spark, [("a", "b"), ("b", "a"), ("a", "b")])
    assert got == {"a": "a", "b": "a"}


def test_star_graph(spark):
    edges = [("hub", f"n{i}") for i in range(10)]
    got = _run(spark, edges)
    assert set(got.values()) == {"hub"}
    assert len(got) == 11


def test_matches_union_find_random(spark):
    rng = np.random.default_rng(1)
    nodes = [f"n{i:02d}" for i in range(40)]
    edges = [
        (nodes[rng.integers(40)], nodes[rng.integers(40)]) for _ in range(35)
    ]
    got = _run(spark, edges)
    want = union_find(edges)
    assert got == want


@given(
    st.lists(
        st.tuples(st.integers(0, 15), st.integers(0, 15)),
        min_size=1,
        max_size=12,
    )
)
@settings(max_examples=10, deadline=None)
def test_matches_union_find_property(spark, raw_edges):
    edges = [(f"v{a:02d}", f"v{b:02d}") for a, b in raw_edges]
    assert _run(spark, edges) == union_find(edges)
