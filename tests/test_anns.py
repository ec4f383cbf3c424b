"""Tests for the ANNS substrate: LSH signatures, candidate join, top-k joins.

The LSH path is validated against the exact brute-force join, and the
brute-force join itself against a DuckDB SQL oracle.
"""
import numpy as np
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.anns import (
    brute_knn_join,
    lsh_candidates,
    mutual_topk_join,
    topk_join,
    with_signatures,
)
from repro.anns.lsh import signatures_numpy
from repro.embedding import EMB_DIM, encode_texts
from repro.oracle import assert_equivalent


def _emb_df(spark, texts, prefix):
    emb = encode_texts(texts)
    pdf = pd.DataFrame(
        {"id": [f"{prefix}{i}" for i in range(len(texts))], "emb": list(emb)}
    )
    return spark.createDataFrame(pdf), emb


LEFT_TEXTS = [
    "apple iphone eight plus silver",
    "samsung galaxy s twenty ultra",
    "nokia brick phone classic",
    "google pixel seven pro",
    "sony walkman cassette player",
]
RIGHT_TEXTS = [
    "aple iphone eight plus silvr",  # typo'd match of L0
    "samsung galaxy s20 ultra phone",  # near-match of L1
    "completely unrelated garden hose",
    "googel pixel 7 pro",  # near-match of L3
    "sony walkman casette player",  # near-match of L4
]


def test_signatures_deterministic():
    e = encode_texts(["abc def", "ghi"])
    a = signatures_numpy(e, 8, 10, seed=0)
    b = signatures_numpy(e, 8, 10, seed=0)
    assert (a == b).all()


def test_signatures_shape_and_range():
    e = encode_texts(["abc", "def", "ghi"])
    s = signatures_numpy(e, bands=6, bits=5, seed=1)
    assert s.shape == (3, 6)
    assert (s >= 0).all() and (s < 2**5).all()


def test_identical_vectors_identical_signatures():
    e = encode_texts(["same text", "same text"])
    s = signatures_numpy(e, 16, 12, seed=0)
    assert (s[0] == s[1]).all()


def test_similar_collide_more_than_dissimilar():
    rng = np.random.default_rng(0)
    base = rng.standard_normal(EMB_DIM).astype(np.float32)
    base /= np.linalg.norm(base)
    near = base + 0.04 * rng.standard_normal(EMB_DIM).astype(np.float32)
    near /= np.linalg.norm(near)
    far = rng.standard_normal(EMB_DIM).astype(np.float32)
    far /= np.linalg.norm(far)
    s = signatures_numpy(np.stack([base, near, far]), 32, 8, seed=0)
    near_coll = (s[0] == s[1]).sum()
    far_coll = (s[0] == s[2]).sum()
    assert near_coll > far_coll


def test_with_signatures_column(spark):
    df, _ = _emb_df(spark, LEFT_TEXTS, "l")
    out = with_signatures(df, bands=4, bits=6).first()
    assert len(out["sigs"]) == 4


def test_lsh_candidates_contain_true_matches(spark):
    lf, _ = _emb_df(spark, LEFT_TEXTS, "l")
    rf, _ = _emb_df(spark, RIGHT_TEXTS, "r")
    cands = lsh_candidates(lf, rf, bands=24, bits=6, seed=0)
    got = {(r["id_l"], r["id_r"]) for r in cands.collect()}
    for pair in [("l0", "r0"), ("l3", "r3"), ("l4", "r4")]:
        assert pair in got


def test_lsh_candidates_key_cols_restrict(spark):
    lf, _ = _emb_df(spark, LEFT_TEXTS, "l")
    rf, _ = _emb_df(spark, LEFT_TEXTS, "r")
    lf = lf.withColumn("grp", F.when(F.col("id") < "l3", 0).otherwise(1))
    rf = rf.withColumn("grp", F.when(F.col("id") < "r3", 1).otherwise(0))
    cands = lsh_candidates(lf, rf, key_cols=["grp"], bands=24, bits=4, seed=0)
    for r in cands.collect():
        il, ir = int(r["id_l"][1:]), int(r["id_r"][1:])
        assert (il < 3) == (ir >= 3)  # only cross-group-consistent pairs


def test_brute_knn_matches_duckdb_oracle(spark):
    lf, le = _emb_df(spark, LEFT_TEXTS, "l")
    rf, re = _emb_df(spark, RIGHT_TEXTS, "r")
    got = brute_knn_join(lf, rf, k=2, max_dist=0.8).select("id_l", "id_r")

    def long_format(emb, prefix):
        rows = []
        for i, v in enumerate(emb):
            for d, x in enumerate(v):
                rows.append((f"{prefix}{i}", d, float(x)))
        return pd.DataFrame(rows, columns=["id", "dim", "v"])

    assert_equivalent(
        got,
        """
        WITH d AS (
          SELECT l.id AS id_l, r.id AS id_r, 1.0 - sum(l.v * r.v) AS dist
          FROM le l JOIN re r ON l.dim = r.dim
          GROUP BY l.id, r.id
        ), ranked AS (
          SELECT id_l, id_r,
                 row_number() OVER (PARTITION BY id_l ORDER BY dist, id_r) AS rn
          FROM d WHERE dist <= 0.8
        )
        SELECT id_l, id_r FROM ranked WHERE rn <= 2
        """,
        le=long_format(le, "l"),
        re=long_format(re, "r"),
    )


def test_brute_knn_refuses_explosive_input(spark):
    n = 6000
    pdf = pd.DataFrame({"id": [str(i) for i in range(n)],
                        "emb": [[0.0] * 4] * n})
    df = spark.createDataFrame(pdf)
    with pytest.raises(ValueError, match="brute"):
        brute_knn_join(df, df)


def test_mutual_topk_is_subset_of_directed(spark):
    lf, _ = _emb_df(spark, LEFT_TEXTS, "l")
    rf, _ = _emb_df(spark, RIGHT_TEXTS, "r")
    directed = {
        (r["id_l"], r["id_r"])
        for r in topk_join(lf, rf, k=1, max_dist=0.9, bands=24, bits=6).collect()
    }
    mutual = {
        (r["id_l"], r["id_r"])
        for r in mutual_topk_join(lf, rf, k=1, max_dist=0.9, bands=24, bits=6).collect()
    }
    assert mutual <= directed


def test_mutual_topk_respects_max_dist(spark):
    lf, _ = _emb_df(spark, LEFT_TEXTS, "l")
    rf, _ = _emb_df(spark, RIGHT_TEXTS, "r")
    rows = mutual_topk_join(lf, rf, k=3, max_dist=0.3, bands=24, bits=6).collect()
    assert all(r["dist"] <= 0.3 for r in rows)


def test_mutual_topk_k1_is_one_to_one(spark):
    lf, _ = _emb_df(spark, LEFT_TEXTS, "l")
    rf, _ = _emb_df(spark, RIGHT_TEXTS, "r")
    rows = mutual_topk_join(lf, rf, k=1, max_dist=1.0, bands=24, bits=6).collect()
    lids = [r["id_l"] for r in rows]
    rids = [r["id_r"] for r in rows]
    assert len(lids) == len(set(lids))
    assert len(rids) == len(set(rids))


def test_lsh_recall_vs_brute(spark, geo_emb):
    """LSH mutual-top-1 recovers >= 70% of brute-force mutual-top-1 pairs.

    geo_emb serializes ALL attributes (incl. the deliberately noisy
    coordinates), which drags duplicate similarity down — the regime where
    banding recall is worst.  The pipeline-level F1 assertions in
    test_pipeline.py cover the EER-selected (high-similarity) regime.
    """
    left = geo_emb.where("src = 0").select("uid", "emb").withColumnRenamed("uid", "id")
    right = geo_emb.where("src = 1").select("uid", "emb").withColumnRenamed("uid", "id")
    exact = {
        (r["id_l"], r["id_r"])
        for r in brute_knn_join(left, right, k=1, max_dist=0.5, mutual=True).collect()
    }
    approx = {
        (r["id_l"], r["id_r"])
        for r in mutual_topk_join(
            left, right, k=1, max_dist=0.5, bands=16, bits=8, seed=0
        ).collect()
    }
    assert len(exact) > 20
    recall = len(exact & approx) / len(exact)
    assert recall >= 0.70
