"""Reproduce Table V — running time comparison.

Projects the shared sweep results (jobs/table4_effectiveness.py) to wall
times; if no results file exists yet it runs the sweep itself.  Also prints
the per-phase breakdown behind Figure 5 (S/R/M/P seconds).
"""
import json
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import RESULTS_DIR, get_spark, save_results  # noqa: E402

PAPER_TABLE5 = {  # seconds (paper's testbed — shape reference only)
    ("geo", "multiem"): 6.1, ("geo", "multiem_parallel"): 10.7,
    ("music20", "multiem"): 34.6, ("music20", "multiem_parallel"): 31.0,
    ("music200", "multiem"): 378, ("music200", "multiem_parallel"): 252,
    ("music2000", "multiem"): 4680, ("music2000", "multiem_parallel"): 2946,
    ("person", "multiem"): 6480, ("person", "multiem_parallel"): 3174,
    ("shopee", "multiem"): 42.9, ("shopee", "multiem_parallel"): 31.8,
}


def _human(s: float) -> str:
    if s < 60:
        return f"{s:.1f}s"
    if s < 3600:
        return f"{s / 60:.1f}m"
    return f"{s / 3600:.1f}h"


def load_or_run(spark=None):
    paths = sorted(RESULTS_DIR.glob("table4_5_6*.json"))
    if paths:
        rows = []
        for p in paths:
            rows += json.loads(p.read_text())
        # de-dupe (dataset, method), last write wins
        seen = {}
        for r in rows:
            seen[(r["dataset"], r["method"])] = r
        order = ["geo", "music20", "music200", "music2000", "person", "shopee"]
        return sorted(
            seen.values(),
            key=lambda r: (order.index(r["dataset"])
                           if r["dataset"] in order else 99),
        )
    from table4_effectiveness import table4

    spark = spark or get_spark("table5")
    rows = table4(spark)
    save_results("table4_5_6", rows)
    return rows


def print_table(rows) -> None:
    print("\nTABLE V — running time")
    datasets = list(dict.fromkeys(r["dataset"] for r in rows))
    methods = list(dict.fromkeys(r["method"] for r in rows))
    for m in methods:
        if m == "multiem_phases":
            continue
        cells = []
        for d in datasets:
            rec = next(
                (r for r in rows if r["dataset"] == d and r["method"] == m), None
            )
            backslash = "\\"
            if rec is None:
                cells.append(f"{'.':>9}")
            elif rec["status"] != "ok":
                cells.append(f"{backslash:>9}")
            else:
                cells.append(f"{_human(rec['seconds']):>9}")
        print(f"  {m:<16}" + "".join(cells))
    print("  " + " " * 16 + "".join(f"{d:>9}" for d in datasets))
    print("\n  Figure 5 phase breakdown (S/R/M/P seconds):")
    for r in rows:
        if r["method"] == "multiem_phases":
            print(f"    {r['dataset']:<12}{r['phase_seconds']}")


def main() -> None:
    rows = load_or_run()
    print_table(rows)


if __name__ == "__main__":
    main()
