"""MultiEM end-to-end (paper Figure 3), with ablation and parallel switches.

Phases and their Figure-5 abbreviations:
  S — automated attribute selection (Algorithm 1; skipped by ``use_eer=False``)
  R — entity representation (serialize selected attrs + encode)
  M — table-wise hierarchical merging (Algorithms 2–3)
  P — density-based pruning (Algorithm 4; skipped by ``use_dp=False``)

Each phase is forced (persist/count or localCheckpoint) so per-phase wall
times are real, reproducing the Figure 5 breakdown and the Table V rows.
"""
import time
from dataclasses import dataclass, field

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.core.attr_select import AttrSelection, select_attributes
from repro.core.merging import MergeParams, hierarchical_merge, initial_items
from repro.core.pruning import prune_tuples
from repro.embedding import with_embeddings, with_text


@dataclass(frozen=True)
class MultiEMParams:
    """All MultiEM hyperparameters (paper §IV-A defaults)."""

    gamma: float = 0.8  # EER selection threshold, grid {0.8, 0.9}
    r: float = 0.2  # EER sample ratio (0.05 for the largest dataset)
    k: int = 1
    m: float = 0.35  # merging distance cap, grid {0.05, 0.2, 0.35, 0.5}
    eps: float = 1.0  # pruning radius, grid {0.8, 1.0} (euclidean)
    min_pts: int = 2
    bands: int = DEFAULT_BANDS
    bits: int = DEFAULT_BITS
    seed: int = 0
    encoder_seed: int = 7
    use_eer: bool = True  # False = "MultiEM w/o EER" ablation
    use_dp: bool = True  # False = "MultiEM w/o DP" ablation
    parallel: bool = True  # False = non-parallel MultiEM (Tables V/VI)
    order_seed: int | None = None  # table order sensitivity (Fig. 6(b))


@dataclass
class MultiEMResult:
    """Pipeline output: prediction tuples plus phase metadata."""

    tuples: DataFrame  # (members array<string>), size >= 2
    selection: AttrSelection
    timings: dict = field(default_factory=dict)  # phase -> seconds
    n_levels: int = 0


def run_multiem(
    spark: SparkSession,
    records: DataFrame,
    attrs: list[str],
    params: MultiEMParams = MultiEMParams(),
) -> MultiEMResult:
    """Run MultiEM over ``records`` (uid, src, <attrs...>).

    Returns prediction tuples (sorted member-uid arrays, size >= 2) and the
    per-phase timings.  The records DataFrame should be cached by the
    caller if it is expensive to recompute.
    """
    timings: dict = {}

    t = time.perf_counter()
    if params.use_eer and len(attrs) > 1:
        selection = select_attributes(
            spark,
            records,
            list(attrs),
            gamma=params.gamma,
            r=params.r,
            seed=params.seed,
            encoder_seed=params.encoder_seed,
        )
    else:
        selection = AttrSelection(
            scores={}, selected=list(attrs), gamma=params.gamma, r=params.r
        )
    timings["S"] = time.perf_counter() - t

    t = time.perf_counter()
    entity_emb = with_embeddings(
        with_text(records, selection.selected), seed=params.encoder_seed
    ).select("uid", "src", "emb")
    entity_emb = entity_emb.persist()
    entity_emb.count()
    timings["R"] = time.perf_counter() - t

    t = time.perf_counter()
    mp = MergeParams(
        k=params.k,
        m=params.m,
        bands=params.bands,
        bits=params.bits,
        seed=params.seed,
        parallel=params.parallel,
        order_seed=params.order_seed,
    )
    items = initial_items(entity_emb, order_seed=params.order_seed)
    final_items, n_levels = hierarchical_merge(spark, items, mp)
    timings["M"] = time.perf_counter() - t

    t = time.perf_counter()
    if params.use_dp:
        tuples = prune_tuples(
            final_items,
            entity_emb,
            eps=params.eps,
            min_pts=params.min_pts,
            parallel=params.parallel,
        )
    else:
        tuples = final_items.where(F.size("members") >= 2).select("members")
    tuples = tuples.localCheckpoint(eager=True)
    timings["P"] = time.perf_counter() - t

    entity_emb.unpersist()
    return MultiEMResult(
        tuples=tuples, selection=selection, timings=timings, n_levels=n_levels
    )
