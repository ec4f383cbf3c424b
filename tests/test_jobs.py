"""Tests for the table-reproduction jobs (run at tiny scale)."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "jobs"))

from experiments import run_dataset  # noqa: E402
from table3_stats import table3  # noqa: E402
from table7_attributes import table7  # noqa: E402

from repro.tuned import TUNED  # noqa: E402


def test_tuned_covers_all_datasets():
    from repro.datasets import DATASETS

    assert set(TUNED) == set(DATASETS)


def test_tuned_values_in_paper_grids():
    for t in TUNED.values():
        assert t["m"] in {0.05, 0.2, 0.35, 0.5}
        assert t["gamma"] in {0.8, 0.9}
        assert t["eps"] in {0.8, 1.0}
        assert t["r"] in {0.05, 0.2}


def test_table3_job_rows(spark):
    rows = table3(spark, scale_override=0.02)
    assert len(rows) == 6
    for r in rows:
        assert r["entities"] > 0
        assert set(r["paper"]) >= {"entities", "tuples", "pairs"}


def test_table7_job_geo(spark):
    rows = table7(spark, datasets=["geo"], scale_override=0.3)
    assert rows[0]["selected"] == ["name"]
    assert rows[0]["paper_selected"] == ["name"]


@pytest.mark.parametrize("include_baselines", [False, True])
def test_run_dataset_engine(spark, include_baselines):
    rows = run_dataset(
        spark, "geo", 0.1, include_baselines=include_baselines, hac_cap=2000
    )
    methods = {r["method"] for r in rows}
    assert {"multiem", "multiem_serial", "multiem_wo_eer",
            "multiem_wo_dp", "multiem_phases"} <= methods
    if include_baselines:
        assert {"unsup_pw", "unsup_c", "sup_pw", "sup_c",
                "graph_sup", "hac"} <= methods
    ok = [r for r in rows if r["status"] == "ok" and "F1" in r]
    assert all(0 <= r["F1"] <= 100 for r in ok)
    multiem = next(r for r in rows if r["method"] == "multiem")
    assert multiem["status"] == "ok"
    assert multiem["seconds"] > 0
    assert multiem["mem_mb"] > 0


def test_run_dataset_phase_timings(spark):
    rows = run_dataset(spark, "geo", 0.1, include_baselines=False)
    phases = next(r for r in rows if r["method"] == "multiem_phases")
    assert set(phases["phase_seconds"]) == {"S", "R", "M", "P"}
