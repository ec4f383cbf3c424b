"""Tests for Algorithm 4 — density-based pruning.

``classify_members`` is checked against an independent literal
re-implementation of Definitions 3–5 (written pair-by-pair, no vectorization)
and on crafted geometries including the paper's Figure 4 scenario.
"""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.pruning import classify_members, prune_tuples


def reference_classify(emb, eps, min_pts):
    """Literal Definitions 3–5, quadratic loops."""
    n = len(emb)
    dist = [[float(np.linalg.norm(emb[i] - emb[j])) for j in range(n)] for i in range(n)]
    core = [sum(1 for j in range(n) if dist[i][j] < eps) >= min_pts for i in range(n)]
    out = []
    for i in range(n):
        if core[i]:
            out.append("core")
        elif any(core[j] and dist[i][j] <= eps for j in range(n)):
            out.append("reachable")
        else:
            out.append("outlier")
    return out


def test_tight_cluster_all_core():
    emb = np.array([[0, 0], [0.1, 0], [0, 0.1]], dtype=float)
    assert classify_members(emb, eps=0.5, min_pts=2) == ["core"] * 3


def test_far_point_is_outlier():
    emb = np.array([[0, 0], [0.1, 0], [5, 5]], dtype=float)
    kinds = classify_members(emb, eps=0.5, min_pts=2)
    assert kinds == ["core", "core", "outlier"]


def test_figure4_chained_merge_outlier():
    """Paper Figure 4: e4 merged via locality becomes the tuple's outlier."""
    e1, e2, e3 = [0.0, 0.0], [0.3, 0.0], [0.0, 0.3]
    e4 = [2.0, 2.0]  # only got in via a chain of pairwise merges
    kinds = classify_members(np.array([e1, e2, e3, e4]), eps=1.0, min_pts=2)
    assert kinds[:3] == ["core", "core", "core"]
    assert kinds[3] == "outlier"


def test_reachable_entity():
    # b is within eps of core a (which has neighbor c), but b's only
    # eps-neighborhood member is a -> b is non-core yet reachable.
    a, b, c = [0.0, 0.0], [0.9, 0.0], [-0.9, 0.0]
    kinds = classify_members(np.array([a, b, c]), eps=1.0, min_pts=3)
    assert kinds == ["core", "reachable", "reachable"]


def test_strict_core_boundary():
    # distance exactly eps does NOT count for the core test (Eq. 12: <)
    emb = np.array([[0.0], [1.0]])
    assert classify_members(emb, eps=1.0, min_pts=2) == ["outlier", "outlier"]


def test_min_pts_one_everything_core():
    emb = np.array([[0.0], [10.0], [20.0]])
    assert classify_members(emb, eps=0.5, min_pts=1) == ["core"] * 3


@given(
    st.lists(
        st.tuples(st.floats(-2, 2), st.floats(-2, 2)), min_size=2, max_size=9
    ),
    st.floats(0.2, 2.0),
    st.integers(1, 4),
)
@settings(max_examples=80, deadline=None)
def test_matches_reference_implementation(points, eps, min_pts):
    emb = np.array(points, dtype=float)
    # Skip boundary-degenerate cases: the gram-matrix distance and the
    # naive one can round differently exactly at dist == eps.
    d = np.sqrt(((emb[:, None, :] - emb[None, :, :]) ** 2).sum(axis=2))
    if np.any(np.abs(d - eps) < 1e-9):
        return
    assert classify_members(emb, eps, min_pts) == reference_classify(emb, eps, min_pts)


# ---- Spark-side prune_tuples -----------------------------------------------
def _items(spark, tuples):
    rows = [(f"t{i}", sorted(m)) for i, m in enumerate(tuples)]
    return spark.createDataFrame(rows, "item_id string, members array<string>")


def _emb(spark, mapping):
    rows = [(k, [float(x) for x in v]) for k, v in mapping.items()]
    return spark.createDataFrame(rows, "uid string, emb array<float>")


def test_prune_removes_outlier_member(spark):
    items = _items(spark, [{"a", "b", "c"}])
    emb = _emb(spark, {"a": [0, 0], "b": [0.1, 0], "c": [5, 5]})
    out = prune_tuples(items, emb, eps=1.0, min_pts=2)
    assert [r["members"] for r in out.collect()] == [["a", "b"]]


def test_prune_drops_tuple_below_two(spark):
    items = _items(spark, [{"a", "b"}])
    emb = _emb(spark, {"a": [0, 0], "b": [5, 5]})
    assert prune_tuples(items, emb, eps=1.0, min_pts=2).count() == 0


def test_prune_keeps_clean_tuple(spark):
    items = _items(spark, [{"a", "b", "c"}])
    emb = _emb(spark, {"a": [0, 0], "b": [0.1, 0], "c": [0, 0.1]})
    out = prune_tuples(items, emb, eps=1.0, min_pts=2)
    assert [r["members"] for r in out.collect()] == [["a", "b", "c"]]


def test_prune_ignores_singleton_items(spark):
    items = _items(spark, [{"a"}])
    emb = _emb(spark, {"a": [0, 0]})
    assert prune_tuples(items, emb).count() == 0


def test_prune_parallel_equals_serial(spark):
    tuples = [{"a", "b", "c"}, {"d", "e"}, {"f", "g", "h", "i"}]
    coords = {
        "a": [0, 0], "b": [0.1, 0], "c": [4, 4],
        "d": [1, 1], "e": [1.05, 1],
        "f": [2, 2], "g": [2.1, 2], "h": [2, 2.1], "i": [9, 9],
    }
    items, emb = _items(spark, tuples), _emb(spark, coords)
    par = sorted(r["members"] for r in prune_tuples(items, emb, parallel=True).collect())
    ser = sorted(r["members"] for r in prune_tuples(items, emb, parallel=False).collect())
    assert par == ser


def test_prune_eps_effect(spark):
    items = _items(spark, [{"a", "b"}])
    emb = _emb(spark, {"a": [0, 0], "b": [0.9, 0]})
    assert prune_tuples(items, emb, eps=1.0, min_pts=2).count() == 1
    assert prune_tuples(items, emb, eps=0.8, min_pts=2).count() == 0
