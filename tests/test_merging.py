"""Tests for Algorithms 2–3 — table-wise hierarchical merging."""
import numpy as np
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.core.merging import (
    MergeParams,
    hierarchical_merge,
    initial_items,
    merge_level,
    merge_matched_items,
)
from repro.embedding import encode_texts


def _items_df(spark, rows):
    """rows: (tid, item_id, members, emb(list), n)"""
    pdf = pd.DataFrame(rows, columns=["tid", "item_id", "members", "emb", "n"])
    return spark.createDataFrame(
        pdf, "tid int, item_id string, members array<string>, emb array<float>, n int"
    )


def _records_emb(spark, texts_by_src):
    rows = []
    for src, texts in texts_by_src.items():
        emb = encode_texts(texts)
        for i, t in enumerate(texts):
            rows.append((f"s{src}e{i}", src, list(map(float, emb[i]))))
    pdf = pd.DataFrame(rows, columns=["uid", "src", "emb"])
    return spark.createDataFrame(pdf, "uid string, src int, emb array<float>")


PARAMS = MergeParams(k=1, m=0.4, bands=24, bits=6, seed=0)


def test_initial_items_lift(spark):
    recs = _records_emb(spark, {0: ["aa bb"], 2: ["cc dd"]})
    items = initial_items(recs)
    rows = {r["item_id"]: r for r in items.collect()}
    assert rows["s0e0"]["members"] == ["s0e0"]
    assert rows["s0e0"]["n"] == 1
    # srcs {0, 2} compact to tids {0, 1}
    assert {r["tid"] for r in rows.values()} == {0, 1}


def test_initial_items_order_seed_permutes(spark):
    recs = _records_emb(spark, {0: ["aa"], 1: ["bb"], 2: ["cc"], 3: ["dd"]})
    a = {r["item_id"]: r["tid"] for r in initial_items(recs).collect()}
    b = {r["item_id"]: r["tid"] for r in initial_items(recs, order_seed=3).collect()}
    assert set(a.values()) == set(b.values()) == {0, 1, 2, 3}
    assert a != b  # seed 3 permutation differs for 4 tables


def test_merge_matched_items_centroid(spark):
    e1 = [1.0, 0.0]
    e2 = [0.0, 1.0]
    items = _items_df(
        spark,
        [
            (0, "a", ["a"], e1, 1),
            (1, "b", ["b"], e2, 1),
            (1, "c", ["c"], [1.0, 0.0], 1),
        ],
    )
    comp = spark.createDataFrame([("a", "a"), ("b", "a")], "node string, component string")
    merged, unmatched = merge_matched_items(items, comp)
    m = merged.first()
    assert m["members"] == ["a", "b"]
    assert m["n"] == 2
    want = np.array([1.0, 1.0]) / np.sqrt(2)
    assert np.allclose(np.array(m["emb"]), want, atol=1e-6)
    u = unmatched.first()
    assert u["item_id"] == "c"


def test_merge_matched_items_weighted_centroid(spark):
    # a 3-member item at [1,0] vs a single at [0,1]: centroid leans to [1,0]
    items = _items_df(
        spark,
        [(0, "big", ["x", "y", "z"], [1.0, 0.0], 3), (1, "s", ["s"], [0.0, 1.0], 1)],
    )
    comp = spark.createDataFrame(
        [("big", "big"), ("s", "big")], "node string, component string"
    )
    merged, _ = merge_matched_items(items, comp)
    emb = np.array(merged.first()["emb"])
    want = np.array([3.0, 1.0]) / np.linalg.norm([3.0, 1.0])
    assert np.allclose(emb, want, atol=1e-6)


def test_two_table_merge_pairs_duplicates(spark):
    recs = _records_emb(
        spark,
        {
            0: ["apple iphone eight silver", "samsung galaxy ultra"],
            1: ["aple iphone eight silvr", "totally different thing"],
        },
    )
    items, levels = hierarchical_merge(spark, initial_items(recs), PARAMS)
    assert levels == 1
    merged = [r for r in items.collect() if r["n"] >= 2]
    assert len(merged) == 1
    assert merged[0]["members"] == ["s0e0", "s1e0"]


def test_four_table_hierarchy_full_tuple(spark):
    texts = "north lake ridge point"
    recs = _records_emb(
        spark,
        {s: [texts, f"unrelated filler words {s} zzz qqq"] for s in range(4)},
    )
    items, levels = hierarchical_merge(spark, initial_items(recs), PARAMS)
    assert levels == 2
    best = max(items.collect(), key=lambda r: r["n"])
    assert best["members"] == [f"s{s}e0" for s in range(4)]


def test_odd_table_count_passthrough(spark):
    recs = _records_emb(
        spark, {0: ["aaa bbb ccc"], 1: ["ddd eee fff"], 2: ["ggg hhh iii"]}
    )
    items, levels = hierarchical_merge(spark, initial_items(recs), PARAMS)
    # 3 tables -> 2 -> 1
    assert levels == 2
    assert items.count() == 3  # nothing merged, all pass through
    assert items.select("tid").distinct().count() == 1


def test_serial_equals_parallel(spark, geo_emb):
    par = MergeParams(k=1, m=0.5, bands=16, bits=8, seed=0, parallel=True)
    ser = MergeParams(k=1, m=0.5, bands=16, bits=8, seed=0, parallel=False)
    a, _ = hierarchical_merge(spark, initial_items(geo_emb), par)
    b, _ = hierarchical_merge(spark, initial_items(geo_emb), ser)
    ka = sorted(r["members"] for r in a.collect())
    kb = sorted(r["members"] for r in b.collect())
    assert ka == kb


def test_merge_respects_distance_cap(spark):
    recs = _records_emb(
        spark, {0: ["alpha beta gamma"], 1: ["delta epsilon zeta"]}
    )
    p = MergeParams(k=1, m=0.05, bands=24, bits=6, seed=0)
    items, _ = hierarchical_merge(spark, initial_items(recs), p)
    assert items.where(F.col("n") >= 2).count() == 0


def test_merge_level_single_dataflow_matches_members(spark):
    recs = _records_emb(
        spark,
        {
            0: ["apple iphone eight", "blue suede shoes"],
            1: ["aple iphone eight", "red leather boots"],
            2: ["apple iphone 8", "green wool socks"],
            3: ["apple iphonee eight", "purple silk scarf"],
        },
    )
    items = initial_items(recs)
    lvl = merge_level(items, PARAMS)
    # after one level: pairs (0,1) and (2,3) may merge; tids collapse to {0,1}
    assert set(r["tid"] for r in lvl.collect()) == {0, 1}
    phones = [r for r in lvl.collect() if r["n"] == 2]
    assert all("e0" in r["members"][0] for r in phones)


def test_members_always_sorted(spark, geo_emb):
    items, _ = hierarchical_merge(
        spark, initial_items(geo_emb), MergeParams(m=0.5, bands=16, bits=8)
    )
    for r in items.where(F.col("n") >= 2).take(20):
        assert r["members"] == sorted(r["members"])


def test_n_equals_member_count(spark, geo_emb):
    items, _ = hierarchical_merge(
        spark, initial_items(geo_emb), MergeParams(m=0.5, bands=16, bits=8)
    )
    bad = items.where(F.size("members") != F.col("n")).count()
    assert bad == 0


def test_no_entity_lost_or_duplicated(spark, geo_emb):
    items, _ = hierarchical_merge(
        spark, initial_items(geo_emb), MergeParams(m=0.5, bands=16, bits=8)
    )
    members = items.select(F.explode("members").alias("uid"))
    assert members.count() == geo_emb.count()
    assert members.distinct().count() == geo_emb.count()
