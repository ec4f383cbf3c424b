"""Matching metrics (paper §IV-A).

* **F1** (strict): a prediction tuple is correct only if it equals a truth
  tuple exactly (as a set of record uids).
* **pair-F1** (loose): tuples are parsed into unordered member pairs and
  precision/recall computed over pairs — paper Example 2: truth (1,2,3) vs
  prediction (1,2,4) scores F1 = 0 but pair-F1 = 1/3.

Both metrics are DataFrame computations: tuples are canonicalized as sorted
member arrays; pair expansion is a self-join on the exploded members.
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def _f1(p: float, r: float) -> float:
    return 0.0 if p + r == 0 else 2 * p * r / (p + r)


def _canon(tuples: DataFrame) -> DataFrame:
    """Distinct canonical tuple keys (sorted members joined by '|')."""
    return (
        tuples.select(F.array_join(F.sort_array("members"), "|").alias("key"))
        .distinct()
    )


def tuple_metrics(pred: DataFrame, truth: DataFrame) -> dict:
    """Strict tuple-level precision/recall/F1 (exact set equality)."""
    p_keys = _canon(pred).persist()
    t_keys = _canon(truth).persist()
    n_pred, n_truth = p_keys.count(), t_keys.count()
    n_hit = p_keys.join(t_keys, "key").count()
    p_keys.unpersist()
    t_keys.unpersist()
    prec = n_hit / n_pred if n_pred else 0.0
    rec = n_hit / n_truth if n_truth else 0.0
    return {"precision": prec, "recall": rec, "f1": _f1(prec, rec),
            "n_pred": n_pred, "n_truth": n_truth, "n_hit": n_hit}


MAX_EXPAND_TUPLE = 10_000  # a tuple this size yields ~5e7 pairs — degenerate


def expand_pairs(tuples: DataFrame) -> DataFrame:
    """All unordered member pairs (u < v) of each tuple, distinct.

    Tuples above :data:`MAX_EXPAND_TUPLE` members are skipped: their O(size²)
    expansion is a single-key join hotspot, and a prediction that lumps >10k
    records into one entity is wrong regardless of how it is scored.
    """
    t = tuples.where(F.size("members") <= MAX_EXPAND_TUPLE).select(
        F.monotonically_increasing_id().alias("tid"), "members"
    )
    a = t.select("tid", F.explode("members").alias("u"))
    b = t.select("tid", F.explode("members").alias("v"))
    return (
        a.join(b, "tid")
        .where(F.col("u") < F.col("v"))
        .select("u", "v")
        .distinct()
    )


def pair_metrics(pred: DataFrame, truth: DataFrame) -> dict:
    """Pairwise precision/recall/F1 over expanded tuple pairs."""
    p_pairs = expand_pairs(pred).persist()
    t_pairs = expand_pairs(truth).persist()
    n_pred, n_truth = p_pairs.count(), t_pairs.count()
    n_hit = p_pairs.join(t_pairs, ["u", "v"]).count()
    p_pairs.unpersist()
    t_pairs.unpersist()
    prec = n_hit / n_pred if n_pred else 0.0
    rec = n_hit / n_truth if n_truth else 0.0
    return {"pair_precision": prec, "pair_recall": rec,
            "pair_f1": _f1(prec, rec)}


def evaluate(pred: DataFrame, truth: DataFrame) -> dict:
    """Full Table IV row fragment: P, R, F1 and pair-F1 (all in percent)."""
    tm = tuple_metrics(pred, truth)
    pm = pair_metrics(pred, truth)
    return {
        "P": 100 * tm["precision"],
        "R": 100 * tm["recall"],
        "F1": 100 * tm["f1"],
        "pair_F1": 100 * pm["pair_f1"],
        "detail": {**tm, **pm},
    }
