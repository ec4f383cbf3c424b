"""Tests for Algorithm 5 (pairs → tuples) and its transitive-closure variant."""
import pyspark.sql.functions as F

from repro.baselines import pairs_to_tuples, pairs_to_tuples_cc


def _pairs(spark, pairs):
    return spark.createDataFrame(list(pairs), "id_l string, id_r string")


def members(df):
    return sorted(tuple(r["members"]) for r in df.collect())


def test_single_pair(spark):
    out = pairs_to_tuples(_pairs(spark, [("a", "b")]))
    assert members(out) == [("a", "b")]


def test_star_expansion_not_transitive_closure(spark):
    """a-b, b-c: Algorithm 5 yields three overlapping star tuples."""
    out = pairs_to_tuples(_pairs(spark, [("a", "b"), ("b", "c")]))
    assert members(out) == [("a", "b"), ("a", "b", "c"), ("b", "c")]


def test_cc_variant_is_transitive(spark):
    out = pairs_to_tuples_cc(_pairs(spark, [("a", "b"), ("b", "c")]))
    assert members(out) == [("a", "b", "c")]


def test_disjoint_pairs(spark):
    out = pairs_to_tuples(_pairs(spark, [("a", "b"), ("c", "d")]))
    assert members(out) == [("a", "b"), ("c", "d")]


def test_duplicate_star_tuples_deduped(spark):
    # a and b generate the same star tuple {a,b}; emitted once
    out = pairs_to_tuples(_pairs(spark, [("a", "b"), ("b", "a")]))
    assert members(out) == [("a", "b")]


def test_triangle_collapses_to_one_tuple(spark):
    out = pairs_to_tuples(_pairs(spark, [("a", "b"), ("b", "c"), ("a", "c")]))
    assert members(out) == [("a", "b", "c")]


def test_hub_star(spark):
    out = pairs_to_tuples(_pairs(spark, [("h", "x"), ("h", "y"), ("h", "z")]))
    got = members(out)
    assert ("h", "x", "y", "z") in got  # the hub's star
    assert ("h", "x") in got  # each leaf's star
    assert len(got) == 4


def test_cc_chain_long(spark):
    chain = [(f"n{i}", f"n{i + 1}") for i in range(6)]
    out = pairs_to_tuples_cc(_pairs(spark, chain))
    assert members(out) == [tuple(f"n{i}" for i in range(7))]
