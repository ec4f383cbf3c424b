"""Reproduce Table III — statistics of the datasets.

Generates every dataset at its reproduction scale and prints generated vs
paper statistics (Srcs / Attrs / Entities / Tuples / Pairs).
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_results  # noqa: E402

from repro.datasets import DATASETS, generate
from repro.datasets.registry import REPRO_SCALE


def table3(spark, scale_override: float | None = None) -> list[dict]:
    """Compute the Table III rows for every dataset. Returns row dicts."""
    rows = []
    for name, cfg in DATASETS.items():
        scale = scale_override if scale_override is not None else REPRO_SCALE[name]
        data = generate(spark, cfg, scale=scale, seed=0)
        data.records = data.records.persist()
        st = data.stats()
        st["scale"] = scale
        st["paper"] = cfg.paper_stats
        rows.append(st)
        data.records.unpersist()
    return rows


def main() -> None:
    spark = get_spark("table3")
    rows = table3(spark)
    hdr = f"{'Name':<12}{'Srcs':>5}{'Attrs':>6}{'Entities':>10}{'Tuples':>9}{'Pairs':>10}   paper(E/T/P)"
    print("\nTABLE III — dataset statistics (generated at repro scale)")
    print(hdr)
    for r in rows:
        p = r["paper"]
        print(
            f"{r['name']:<12}{r['srcs']:>5}{r['attrs']:>6}{r['entities']:>10}"
            f"{r['tuples']:>9}{r['pairs']:>10}   "
            f"{p['entities']}/{p['tuples']}/{p['pairs']} @ scale={r['scale']}"
        )
    save_results("table3", rows)
    spark.stop()


if __name__ == "__main__":
    main()
