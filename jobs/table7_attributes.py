"""Reproduce Table VII — automatically selected attributes per dataset.

Runs Algorithm 1 on every dataset at its reproduction scale and prints the
selected subset next to the paper's (which matched domain experts).
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import TUNED, get_spark, save_results  # noqa: E402

from repro.core import select_attributes
from repro.datasets import DATASETS, generate
from repro.datasets.registry import REPRO_SCALE


def table7(spark, *, datasets=None, scale_override=None) -> list[dict]:
    rows = []
    for name, cfg in DATASETS.items():
        if datasets and name not in datasets:
            continue
        scale = scale_override or REPRO_SCALE[name]
        data = generate(spark, cfg, scale=scale, seed=0)
        data.records = data.records.persist()
        t = TUNED[name]
        sel = select_attributes(
            spark, data.records, cfg.attr_names(),
            gamma=t["gamma"], r=t["r"], seed=0,
        )
        rows.append(
            {
                "dataset": name,
                "all_attrs": cfg.attr_names(),
                "selected": sel.selected,
                "paper_selected": cfg.paper_stats["selected_attrs"],
                "gamma": t["gamma"],
                "scores": {k: round(v, 4) for k, v in sel.scores.items()},
            }
        )
        data.records.unpersist()
    return rows


def main() -> None:
    spark = get_spark("table7")
    rows = table7(spark)
    print("\nTABLE VII — automatically selected attributes")
    for r in rows:
        print(f"  {r['dataset']:<12} all={','.join(r['all_attrs'])}")
        print(f"  {'':<12} selected={','.join(r['selected'])}  "
              f"(paper: {','.join(r['paper_selected'])}; γ={r['gamma']})")
    save_results("table7", rows)
    spark.stop()


if __name__ == "__main__":
    main()
