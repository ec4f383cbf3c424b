"""Tests for the baseline matchers (pw / chain / supervised / graph / HAC)."""
import numpy as np
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.baselines import (
    InfeasibleError,
    all_pairs_mutual_topk,
    chain_matching,
    graph_supervised_matching,
    hac_matching,
    learn_threshold,
    pairwise_matching,
)
from repro.baselines.hac import hac_cluster_labels
from repro.embedding import encode_texts
from repro.eval import evaluate

BITS = dict(bands=16, bits=8)


def test_all_pairs_restricted_to_cross_table(spark, geo_emb):
    pairs = all_pairs_mutual_topk(geo_emb, k=1, max_dist=0.5, **BITS)
    bad = pairs.where(F.col("src_l") >= F.col("src_r")).count()
    assert bad == 0


def test_all_pairs_mutual_one_to_one_per_table_pair(spark, geo_emb):
    pairs = all_pairs_mutual_topk(geo_emb, k=1, max_dist=0.5, **BITS)
    dup = (
        pairs.groupBy("src_l", "src_r", "id_l").count().where("count > 1").count()
    )
    assert dup == 0


def test_pairwise_matching_valid_tuples(spark, geo_emb, geo_truth):
    pred = pairwise_matching(geo_emb, threshold=0.3, **BITS)
    rows = pred.collect()
    assert rows
    assert all(len(r["members"]) >= 2 for r in rows)
    ev = evaluate(pred, geo_truth)
    assert ev["pair_F1"] > 40.0


def test_chain_matching_valid_tuples(spark, geo_emb, geo_truth):
    pred = chain_matching(spark, geo_emb, threshold=0.3, **BITS)
    rows = pred.collect()
    assert rows
    members = [m for r in rows for m in r["members"]]
    assert len(members) == len(set(members))  # chain tuples are disjoint
    ev = evaluate(pred, geo_truth)
    assert ev["pair_F1"] > 40.0


def test_learned_threshold_in_grid_range(spark, geo_emb, geo_truth_pairs):
    t = learn_threshold(spark, geo_emb, geo_truth_pairs, label_frac=0.5, **BITS)
    assert 0.05 <= t <= 0.9


def test_learned_beats_conservative_unsupervised(spark, geo_emb, geo_truth,
                                                 geo_truth_pairs):
    t = learn_threshold(spark, geo_emb, geo_truth_pairs, label_frac=0.5, **BITS)
    sup = evaluate(pairwise_matching(geo_emb, threshold=t, **BITS), geo_truth)
    uns = evaluate(pairwise_matching(geo_emb, threshold=0.1, **BITS), geo_truth)
    assert sup["pair_F1"] >= uns["pair_F1"] - 1.0


def test_learn_threshold_no_positives_fallback(spark, geo_emb):
    empty = spark.createDataFrame([], "u string, v string")
    assert learn_threshold(spark, geo_emb, empty, **BITS) == 0.15


def test_graph_sup_tuples_disjoint(spark, geo_emb, geo_truth, geo_truth_pairs):
    pred = graph_supervised_matching(
        spark, geo_emb, geo_truth_pairs, label_frac=0.5, **BITS
    )
    members = [m for r in pred.collect() for m in r["members"]]
    assert len(members) == len(set(members))
    ev = evaluate(pred, geo_truth)
    assert ev["pair_F1"] > 40.0


# ---- HAC --------------------------------------------------------------------
def test_hac_labels_two_clear_clusters():
    texts = ["apple iphone eight", "aple iphone eight", "apple iphonee eight",
             "garden hose green", "garden hosse green"]
    emb = encode_texts(texts).astype(np.float64)
    labels = hac_cluster_labels(emb, cut=0.5)
    assert labels[0] == labels[1] == labels[2]
    assert labels[3] == labels[4]
    assert labels[0] != labels[3]


def test_hac_cut_zero_no_merges():
    emb = encode_texts(["aaa", "bbb", "ccc"]).astype(np.float64)
    labels = hac_cluster_labels(emb, cut=0.0)
    assert len(set(labels)) == 3


def test_hac_matching_effectiveness(spark, geo_emb, geo_truth):
    pred = hac_matching(spark, geo_emb, cut=0.35)
    ev = evaluate(pred, geo_truth)
    assert ev["pair_F1"] > 60.0


def test_hac_infeasible_above_cap(spark, geo_emb):
    with pytest.raises(InfeasibleError):
        hac_matching(spark, geo_emb, max_n=10)


def test_hac_empty_result_schema(spark):
    pdf = pd.DataFrame(
        {"uid": ["a", "b"], "emb": [list(map(float, e)) for e in
                                    encode_texts(["xxx yyy", "ppp qqq"])]}
    )
    df = spark.createDataFrame(pdf, "uid string, emb array<float>")
    out = hac_matching(spark, df, cut=0.01)
    assert out.columns == ["members"]
    assert out.count() == 0
