"""The experiment engine behind Tables IV, V and VI.

One sweep runs every method on a dataset and records effectiveness
(P/R/F1/pair-F1), wall time, and approximate memory — the three tables are
different projections of the same runs, exactly like the paper's setup.

Method rows and their paper counterparts (DESIGN.md §2 mapping):
  multiem            MultiEM (parallel merging + pruning)
  multiem_serial     MultiEM non-parallel (Table V/VI contrast row)
  multiem_wo_eer     ablation: all attributes, no selection
  multiem_wo_dp      ablation: merging output, no pruning
  unsup_pw/_c        AutoFuzzyJoin stand-in, pairwise / chain extension
  sup_pw/_c          Ditto & PromptEM stand-in (5% labels), pw / chain
  graph_sup          ALMSER-GB stand-in (5% labels, similarity graph + CC)
  hac                MSCD-HAC stand-in (driver HAC, infeasible beyond cap)
"""
import sys
import traceback

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import TUNED  # noqa: E402

from repro.baselines import (
    InfeasibleError,
    chain_matching,
    graph_supervised_matching,
    hac_matching,
    learn_threshold,
    pairwise_matching,
)
from repro.core import MultiEMParams, run_multiem
from repro.datasets import generate, get_config
from repro.embedding import with_embeddings, with_text
from repro.eval import evaluate, measure
from repro.eval.metrics import expand_pairs

UNSUP_THRESHOLD = 0.15  # conservative fixed accept distance (AutoFJ-like)


def _multiem_params(name: str, **overrides) -> MultiEMParams:
    t = TUNED[name]
    base = dict(
        m=t["m"], gamma=t["gamma"], eps=t["eps"], r=t["r"],
        bands=t["bands"], bits=t["bits"],
    )
    base.update(overrides)
    return MultiEMParams(**base)


def run_dataset(
    spark,
    name: str,
    scale: float,
    *,
    include_baselines: bool = True,
    hac_cap: int = 6000,
    seed: int = 0,
) -> list[dict]:
    """Run all methods on one dataset; returns one result dict per method."""
    cfg = get_config(name)
    data = generate(spark, cfg, scale=scale, seed=seed)
    records = data.records.persist()
    n_entities = records.count()
    truth = data.truth_tuples().persist()
    truth.count()
    attrs = cfg.attr_names()

    results: list[dict] = []

    def run(method: str, fn) -> None:
        try:
            meas = measure(spark, fn)
            ev = evaluate(meas.result, truth)
            results.append(
                {
                    "dataset": name, "scale": scale, "entities": n_entities,
                    "method": method, "P": round(ev["P"], 1),
                    "R": round(ev["R"], 1), "F1": round(ev["F1"], 1),
                    "pair_F1": round(ev["pair_F1"], 1),
                    "seconds": round(meas.seconds, 1),
                    "mem_mb": round(meas.mem_mb),
                    "status": "ok",
                }
            )
        except InfeasibleError as e:
            results.append(
                {"dataset": name, "scale": scale, "entities": n_entities,
                 "method": method, "status": f"infeasible: {e}"}
            )
        except Exception:
            traceback.print_exc()
            results.append(
                {"dataset": name, "scale": scale, "entities": n_entities,
                 "method": method, "status": "error"}
            )

    # --- MultiEM + ablations + serial variant -------------------------------
    phase_timings: dict = {}

    def multiem_with(**over):
        def _go():
            res = run_multiem(spark, records, attrs, _multiem_params(name, **over))
            if not over:
                phase_timings.update(res.timings)
            return res.tuples
        return _go

    run("multiem", multiem_with())
    run("multiem_serial", multiem_with(parallel=False))
    run("multiem_wo_eer", multiem_with(use_eer=False))
    run("multiem_wo_dp", multiem_with(use_dp=False))
    if phase_timings:
        results.append(
            {"dataset": name, "scale": scale, "entities": n_entities,
             "method": "multiem_phases", "status": "ok",
             "phase_seconds": {k: round(v, 1) for k, v in phase_timings.items()}}
        )

    if include_baselines:
        t = TUNED[name]
        # All-pairs baselines need the sharper baseline banding (see
        # repro.tuned docstring) to keep S^2-pair candidate volume bounded.
        lsh = dict(bands=t["bl_bands"], bits=t["bl_bits"], seed=seed)

        def embed_all():
            emb = (
                with_embeddings(with_text(records, attrs))
                .select("uid", "src", "emb")
                .persist()
            )
            emb.count()
            return emb

        emb = embed_all()
        truth_pairs = expand_pairs(truth).persist()
        truth_pairs.count()

        run("unsup_pw",
            lambda: pairwise_matching(emb, threshold=UNSUP_THRESHOLD, **lsh))
        run("unsup_c",
            lambda: chain_matching(spark, emb, threshold=UNSUP_THRESHOLD, **lsh))

        def sup_pw():
            th = learn_threshold(spark, emb, truth_pairs, label_frac=0.05, **lsh)
            return pairwise_matching(emb, threshold=th, **lsh)

        def sup_c():
            th = learn_threshold(spark, emb, truth_pairs, label_frac=0.05, **lsh)
            return chain_matching(spark, emb, threshold=th, **lsh)

        run("sup_pw", sup_pw)
        run("sup_c", sup_c)
        run("graph_sup",
            lambda: graph_supervised_matching(
                spark, emb, truth_pairs, label_frac=0.05, **lsh))
        run("hac", lambda: hac_matching(spark, emb, cut=TUNED[name]["m"],
                                        max_n=hac_cap))
        truth_pairs.unpersist()
        emb.unpersist()
    records.unpersist()
    truth.unpersist()
    return results
