"""Algorithm 1 — Automated Attribute Selection (the EER module).

For each attribute: shuffle its values across the (sampled) concatenated
table, re-embed, and measure how far the embeddings move.  The significance
score of an attribute is the **mean cosine similarity** between original and
shuffled embeddings — paper Example 1 expresses exactly this (id: 0.91,
album: 0.79) and the γ grid {0.8, 0.9} separates them.  Attributes with
score <= γ (shuffling moves the embedding a lot → informative) are selected.

Everything is DataFrame work: the sample is shuffled by joining two
row_number orderings (stable uid order vs. seeded random order), re-embedded
with the same pandas-UDF encoder, and the score is one aggregation.
"""
from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession, Window

from repro.anns.dist import cosine_dist_udf
from repro.embedding import with_embeddings, with_text


@dataclass(frozen=True)
class AttrSelection:
    """Outcome of Algorithm 1: per-attribute scores and the selected subset."""

    scores: dict  # attr -> mean cosine similarity under shuffle (high = insignificant)
    selected: list
    gamma: float
    r: float


def _shuffle_attr(sample: DataFrame, attr: str, seed: int) -> DataFrame:
    """Return ``sample`` with ``attr``'s values permuted across rows."""
    w_uid = Window.orderBy("uid")
    w_rand = Window.orderBy(F.rand(seed), "_tiebreak")
    uids = sample.select("uid").withColumn("rn", F.row_number().over(w_uid))
    vals = (
        sample.select(F.col(attr).alias("_newval"), F.col("uid").alias("_tiebreak"))
        .withColumn("rn", F.row_number().over(w_rand))
        .drop("_tiebreak")
    )
    permuted = uids.join(vals, "rn").select("uid", "_newval")
    return (
        sample.drop(attr)
        .join(permuted, "uid")
        .withColumnRenamed("_newval", attr)
    )


def select_attributes(
    spark: SparkSession,
    records: DataFrame,
    attrs: list[str],
    *,
    gamma: float = 0.8,
    r: float = 0.2,
    seed: int = 0,
    encoder_seed: int = 7,
) -> AttrSelection:
    """Run Algorithm 1 over ``records`` (already the concat of all tables).

    ``r`` is the sampling ratio (paper line 2); ``gamma`` the selection
    threshold on the similarity score.  Always selects at least the single
    most significant attribute so downstream serialization is never empty.
    """
    if len(attrs) == 1:
        return AttrSelection(scores={attrs[0]: 0.0}, selected=list(attrs),
                             gamma=gamma, r=r)

    sample = records.select("uid", *attrs).sample(fraction=min(1.0, r), seed=seed)
    sample = sample.persist()
    base = with_embeddings(
        with_text(sample, attrs), seed=encoder_seed
    ).select("uid", F.col("emb").alias("emb_base"))
    base = base.persist()
    base.count()

    scores: dict = {}
    for i, attr in enumerate(attrs):
        shuffled = _shuffle_attr(sample, attr, seed=seed * 1000 + i)
        shuffled_emb = with_embeddings(
            with_text(shuffled, attrs), seed=encoder_seed
        ).select("uid", "emb")
        row = (
            base.join(shuffled_emb, "uid")
            .select(
                (F.lit(1.0) - cosine_dist_udf(F.col("emb_base"), F.col("emb"))).alias(
                    "sim"
                )
            )
            .agg(F.avg("sim").alias("mean_sim"))
            .first()
        )
        scores[attr] = float(row["mean_sim"])

    base.unpersist()
    sample.unpersist()
    selected = [a for a in attrs if scores[a] <= gamma]
    if not selected:
        selected = [min(scores, key=scores.get)]
    return AttrSelection(scores=scores, selected=selected, gamma=gamma, r=r)
