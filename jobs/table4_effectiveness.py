"""Reproduce Table IV — matching effectiveness (P / R / F1 / pair-F1).

Runs MultiEM, its ablations (w/o EER, w/o DP) and every baseline stand-in on
each dataset, at the reproduction scales of DESIGN.md §7.  Baselines are run
on the datasets where the paper's baselines produced results (small/medium);
on the two largest only the MultiEM variants run (the paper's baselines all
time/memory out there — symbols "-" and "\\" in Table IV).

Also the entry point for the m/γ sensitivity sweeps behind Figure 6
(``--grid`` flag).
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_results  # noqa: E402
from experiments import run_dataset  # noqa: E402

# Paper Table IV reference values (F1 / pair-F1) for EXPERIMENTS.md diffing.
PAPER_TABLE4 = {
    ("geo", "multiem"): (64.7, 89.5),
    ("music20", "multiem"): (86.8, 94.2),
    ("music200", "multiem"): (78.0, 89.9),
    ("music2000", "multiem"): (62.8, 81.3),
    ("person", "multiem"): (36.5, 73.6),
    ("shopee", "multiem"): (26.2, 43.5),
}

SMALL = ["geo", "music20", "shopee"]
MEDIUM = ["music200"]
LARGE = ["music2000", "person"]


def table4(spark, *, datasets=None, scales=None, baselines=True) -> list[dict]:
    from repro.datasets.registry import REPRO_SCALE

    rows = []
    for name in datasets or (SMALL + MEDIUM + LARGE):
        scale = (scales or {}).get(name, REPRO_SCALE[name])
        include_baselines = baselines and name in SMALL + MEDIUM
        ds_rows = run_dataset(
            spark, name, scale, include_baselines=include_baselines
        )
        # Save per-dataset partials so a crash mid-sweep loses one dataset.
        save_results(f"table4_5_6_{name}", ds_rows)
        rows += ds_rows
    return rows


def print_table(rows) -> None:
    print("\nTABLE IV — effectiveness (P / R / F1 / pair-F1)")
    cur = None
    for r in rows:
        if r["dataset"] != cur:
            cur = r["dataset"]
            print(f"\n  == {cur} (n={r['entities']}, scale={r['scale']})")
        if r["status"] != "ok":
            print(f"    {r['method']:<16} {r['status']}")
        elif "F1" in r:
            print(
                f"    {r['method']:<16} P={r['P']:5.1f} R={r['R']:5.1f} "
                f"F1={r['F1']:5.1f} pair-F1={r['pair_F1']:5.1f}"
            )


def main() -> None:
    import argparse

    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", nargs="*", default=None)
    ap.add_argument("--scale", type=float, default=None,
                    help="override scale for all selected datasets")
    ap.add_argument("--no-baselines", action="store_true",
                    help="run only the MultiEM variants")
    args = ap.parse_args()

    spark = get_spark("table4")
    scales = {d: args.scale for d in args.datasets} if (
        args.datasets and args.scale
    ) else None
    rows = table4(spark, datasets=args.datasets, scales=scales,
                  baselines=not args.no_baselines)
    print_table(rows)
    suffix = "_" + "_".join(args.datasets) if args.datasets else ""
    save_results(f"table4_5_6{suffix}", rows)
    spark.stop()


if __name__ == "__main__":
    main()
