"""Supervised two-table matcher stand-in (Ditto / PromptEM rows).

The paper's supervised baselines fine-tune a PLM on a 5% labeled sample.
Offline we keep the structural role — "a pairwise match/no-match decision
learned from 5% of the ground truth" — by fitting the accept-distance
threshold that maximizes train-F1 over labeled LSH candidate pairs
(positives: sampled truth pairs; negatives: candidate pairs that are not
matches, i.e. hard negatives).  The fitted threshold then drives the same
pairwise / chain extensions the unsupervised matcher uses.
"""
import numpy as np
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.baselines.two_table import all_pairs_mutual_topk

_MAX_TRAIN_ROWS = 100_000


def learn_threshold(
    spark: SparkSession,
    entity_emb: DataFrame,
    truth_pairs: DataFrame,
    *,
    label_frac: float = 0.05,
    k: int = 3,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> float:
    """Fit the accept-distance threshold on a ``label_frac`` labeled sample.

    ``truth_pairs``: (u, v) ground-truth matched pairs (u < v).  Candidates
    come from a mutual top-k sweep over all table pairs (k=3 to see some
    sub-optimal candidates); each candidate is labeled by truth membership,
    the truth side is down-sampled to ``label_frac`` (the paper's train
    split), and the returned threshold maximizes F1 on that sample.
    """
    cands = all_pairs_mutual_topk(
        entity_emb, k=k, max_dist=1.0, bands=bands, bits=bits, seed=seed
    ).select(
        F.least("id_l", "id_r").alias("u"),
        F.greatest("id_l", "id_r").alias("v"),
        "dist",
    )
    sample = truth_pairs.sample(fraction=min(1.0, label_frac), seed=seed)
    labeled = cands.join(
        sample.withColumn("is_match", F.lit(True)), ["u", "v"], "left"
    ).select("dist", F.coalesce("is_match", F.lit(False)).alias("is_match"))
    pdf = labeled.limit(_MAX_TRAIN_ROWS).toPandas()
    if pdf.empty or not pdf["is_match"].any():
        return 0.15  # no labeled positives seen — fall back to conservative
    dists = pdf["dist"].to_numpy()
    pos = pdf["is_match"].to_numpy()
    n_pos = int(pos.sum())
    best_t, best_f1 = 0.15, -1.0
    for t in np.linspace(0.05, 0.9, 35):
        accepted = dists <= t
        tp = int((accepted & pos).sum())
        if not accepted.any():
            continue
        prec = tp / accepted.sum()
        rec = tp / n_pos
        f1 = 0.0 if prec + rec == 0 else 2 * prec * rec / (prec + rec)
        if f1 > best_f1:
            best_t, best_f1 = float(t), f1
    return best_t
