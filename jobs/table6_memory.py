"""Reproduce Table VI — memory usage comparison.

Projects the shared sweep results to the memory column (driver max-RSS +
JVM used-heap after each method run; see repro.eval.harness for the caveats
of measuring inside one local-mode JVM).
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from table5_runtime import load_or_run  # noqa: E402


def print_table(rows) -> None:
    print("\nTABLE VI — approximate memory usage (MB)")
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
                cells.append(f"{rec['mem_mb']:>8}M")
        print(f"  {m:<16}" + "".join(cells))
    print("  " + " " * 16 + "".join(f"{d:>9}" for d in datasets))


def main() -> None:
    print_table(load_or_run())


if __name__ == "__main__":
    main()
