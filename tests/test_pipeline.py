"""End-to-end tests of the MultiEM pipeline and its ablations."""
import pytest
import pyspark.sql.functions as F

from repro.core import MultiEMParams, run_multiem
from repro.eval import evaluate

SMALL = dict(bands=16, bits=8)


@pytest.fixture(scope="module")
def geo_result(spark, geo_data):
    return run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.5, **SMALL),
    )


def test_geo_effectiveness_band(spark, geo_result, geo_truth):
    """Calibrated to the paper's Geo row (F1 64.7 / pair-F1 89.5)."""
    ev = evaluate(geo_result.tuples, geo_truth)
    assert ev["F1"] > 50.0
    assert ev["pair_F1"] > 75.0


def test_geo_selects_name_only(geo_result):
    assert geo_result.selection.selected == ["name"]


def test_timings_phases_present(geo_result):
    assert set(geo_result.timings) == {"S", "R", "M", "P"}
    assert all(v >= 0 for v in geo_result.timings.values())


def test_levels_log2_sources(geo_result):
    assert geo_result.n_levels == 2  # 4 sources -> 2 levels


def test_tuples_well_formed(geo_result, geo_data):
    rows = geo_result.tuples.collect()
    uids = {r["uid"] for r in geo_data.records.select("uid").collect()}
    for r in rows:
        assert len(r["members"]) >= 2
        assert r["members"] == sorted(r["members"])
        assert set(r["members"]) <= uids


def test_without_eer_uses_all_attrs(spark, geo_data, geo_truth, geo_result):
    res = run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.5, use_eer=False, **SMALL),
    )
    assert res.selection.selected == geo_data.config.attr_names()
    # noisy coordinate attributes hurt: w/o EER must not beat full MultiEM much
    full = evaluate(geo_result.tuples, geo_truth)["F1"]
    ablat = evaluate(res.tuples, geo_truth)["F1"]
    assert ablat <= full + 5.0


def test_without_dp_skips_pruning(spark, geo_data):
    res = run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.5, use_dp=False, **SMALL),
    )
    assert res.tuples.count() > 0


def test_parallel_equals_serial_results(spark, geo_data, geo_truth):
    par = run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.5, parallel=True, **SMALL),
    )
    ser = run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.5, parallel=False, **SMALL),
    )
    pa = sorted(tuple(r["members"]) for r in par.tuples.collect())
    se = sorted(tuple(r["members"]) for r in ser.tuples.collect())
    assert pa == se


def test_order_seed_stability(spark, geo_data, geo_truth):
    """Fig. 6(b): results are not sensitive to the table merging order."""
    f1s = []
    for seed in (None, 1, 2):
        res = run_multiem(
            spark, geo_data.records, geo_data.config.attr_names(),
            MultiEMParams(m=0.5, order_seed=seed, **SMALL),
        )
        f1s.append(evaluate(res.tuples, geo_truth)["F1"])
    assert max(f1s) - min(f1s) < 12.0


def test_strict_m_yields_high_precision(spark, geo_data, geo_truth):
    res = run_multiem(
        spark, geo_data.records, geo_data.config.attr_names(),
        MultiEMParams(m=0.05, **SMALL),
    )
    ev = evaluate(res.tuples, geo_truth)
    assert ev["detail"]["pair_precision"] >= 0.95 or ev["detail"]["n_pred"] == 0


def test_music_end_to_end(spark, music_data, music_truth):
    res = run_multiem(
        spark, music_data.records, music_data.config.attr_names(),
        MultiEMParams(m=0.35, gamma=0.8, r=0.8, **SMALL),
    )
    ev = evaluate(res.tuples, music_truth)
    assert sorted(res.selection.selected) == ["album", "artist", "title"]
    assert ev["F1"] > 65.0
    assert ev["pair_F1"] > 80.0
