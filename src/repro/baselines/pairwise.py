"""Figure 2(a) — pairwise matching extension of two-table EM.

Every one of the S·(S-1)/2 table pairs is matched independently (mutual
top-k with a distance threshold), then the pair predictions are converted
to tuples with Algorithm 5.  Quadratic in S — the inefficiency the paper's
Lemma 1 formalizes — and star-expansion makes it the most exposed to
transitive conflicts.
"""
from pyspark.sql import DataFrame

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.baselines.extension import pairs_to_tuples
from repro.baselines.two_table import all_pairs_mutual_topk


def pairwise_matching(
    entity_emb: DataFrame,
    *,
    threshold: float = 0.15,
    k: int = 1,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Pairwise-matching baseline.  Returns prediction tuples (members).

    ``threshold`` is the two-table matcher's accept distance: the
    unsupervised (AutoFJ-like) rows use a conservative fixed value; the
    supervised rows pass a threshold fit on labeled data.
    """
    pairs = all_pairs_mutual_topk(
        entity_emb, k=k, max_dist=threshold, bands=bands, bits=bits, seed=seed
    )
    return pairs_to_tuples(pairs.select("id_l", "id_r"))
