"""Tests for tuple/pair metrics, including the paper's Example 2."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.eval.metrics import evaluate, expand_pairs, pair_metrics, tuple_metrics
from repro.oracle import assert_equivalent
from tests.conftest import tuples_df


def test_example2_from_paper(spark):
    """Truth (1,2,3) vs prediction (1,2,4): F1 = 0, pair-F1 = 1/3."""
    truth = tuples_df(spark, [{"1", "2", "3"}])
    pred = tuples_df(spark, [{"1", "2", "4"}])
    tm = tuple_metrics(pred, truth)
    pm = pair_metrics(pred, truth)
    assert tm["f1"] == 0.0
    assert pm["pair_precision"] == pytest.approx(1 / 3)
    assert pm["pair_recall"] == pytest.approx(1 / 3)
    assert pm["pair_f1"] == pytest.approx(1 / 3)


def test_perfect_prediction(spark):
    t = tuples_df(spark, [{"a", "b"}, {"c", "d", "e"}])
    ev = evaluate(t, t)
    assert ev["F1"] == 100.0
    assert ev["pair_F1"] == 100.0


def test_member_order_irrelevant(spark):
    pred = spark.createDataFrame([(["b", "a"],)], "members array<string>")
    truth = spark.createDataFrame([(["a", "b"],)], "members array<string>")
    assert tuple_metrics(pred, truth)["f1"] == 1.0


def test_duplicate_prediction_tuples_counted_once(spark):
    pred = spark.createDataFrame(
        [(["a", "b"],), (["b", "a"],)], "members array<string>"
    )
    truth = tuples_df(spark, [{"a", "b"}])
    tm = tuple_metrics(pred, truth)
    assert tm["n_pred"] == 1
    assert tm["f1"] == 1.0


def test_partial_overlap_counts(spark):
    truth = tuples_df(spark, [{"a", "b"}, {"c", "d"}, {"e", "f"}])
    pred = tuples_df(spark, [{"a", "b"}, {"c", "x"}])
    tm = tuple_metrics(pred, truth)
    assert tm["precision"] == pytest.approx(1 / 2)
    assert tm["recall"] == pytest.approx(1 / 3)


def test_empty_prediction(spark):
    truth = tuples_df(spark, [{"a", "b"}])
    pred = spark.createDataFrame(
        pd.DataFrame({"members": pd.Series([], dtype=object)}),
        "members array<string>",
    )
    tm = tuple_metrics(pred, truth)
    pm = pair_metrics(pred, truth)
    assert tm == {**tm, "precision": 0.0, "recall": 0.0, "f1": 0.0}
    assert pm["pair_f1"] == 0.0


def test_expand_pairs_counts(spark):
    t = tuples_df(spark, [{"a", "b", "c", "d"}, {"x", "y"}])
    assert expand_pairs(t).count() == 6 + 1


def test_expand_pairs_ordered_and_distinct(spark):
    t = tuples_df(spark, [{"a", "b"}, {"b", "a"}])
    rows = expand_pairs(t).collect()
    assert len(rows) == 1
    assert rows[0]["u"] < rows[0]["v"]


def test_expand_pairs_oracle(spark):
    """Pair expansion matches DuckDB's self-join over exploded members."""
    t = tuples_df(spark, [{"a", "b", "c"}, {"p", "q"}, {"z", "w", "v", "u"}])
    exploded = t.select(
        F.array_join("members", "|").alias("tid"), F.explode("members").alias("m")
    )
    got = expand_pairs(t)
    assert_equivalent(
        got,
        """
        SELECT DISTINCT a.m AS u, b.m AS v
        FROM e a JOIN e b ON a.tid = b.tid AND a.m < b.m
        """,
        e=exploded,
    )


def test_evaluate_percent_scale(spark):
    t = tuples_df(spark, [{"a", "b"}])
    ev = evaluate(t, t)
    assert ev["P"] == 100.0 and ev["R"] == 100.0
    assert "detail" in ev


def test_f1_harmonic_mean(spark):
    truth = tuples_df(spark, [{"a", "b"}, {"c", "d"}])
    pred = tuples_df(spark, [{"a", "b"}, {"x", "y"}, {"p", "q"}, {"r", "s"}])
    tm = tuple_metrics(pred, truth)
    p, r = 1 / 4, 1 / 2
    assert tm["f1"] == pytest.approx(2 * p * r / (p + r))
