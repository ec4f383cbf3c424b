"""Multi-source supervised graph baseline (ALMSER-GB stand-in).

ALMSER-GB builds a multi-source similarity graph and learns pair decisions
with (active-learning boosted) supervision.  The stand-in keeps the
structure: all-table-pairs mutual top-k similarity graph, accept threshold
fit on the 5% labeled sample, connected components over accepted edges →
tuples.  Being pair-graph oriented, it scores better on pair-F1 than on
strict tuple F1 — the contrast the paper reports for ALMSER-GB.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.baselines.extension import pairs_to_tuples_cc
from repro.baselines.supervised import learn_threshold
from repro.baselines.two_table import all_pairs_mutual_topk


def graph_supervised_matching(
    spark: SparkSession,
    entity_emb: DataFrame,
    truth_pairs: DataFrame,
    *,
    label_frac: float = 0.05,
    k: int = 1,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Graph-supervised baseline.  Returns prediction tuples (members).

    Components larger than 4x the number of sources are discarded as
    degenerate: a real-world entity has at most one record per source, so
    such components are transitive-conflict blowups (they would be wrong
    predictions anyway, and their O(size²) pair expansion would dominate
    evaluation cost).
    """
    import pyspark.sql.functions as F

    threshold = learn_threshold(
        spark, entity_emb, truth_pairs,
        label_frac=label_frac, bands=bands, bits=bits, seed=seed,
    )
    pairs = all_pairs_mutual_topk(
        entity_emb, k=k, max_dist=threshold, bands=bands, bits=bits, seed=seed
    )
    n_sources = entity_emb.select("src").distinct().count()
    tuples = pairs_to_tuples_cc(pairs.select("id_l", "id_r"))
    return tuples.where(F.size("members") <= 4 * n_sources)
