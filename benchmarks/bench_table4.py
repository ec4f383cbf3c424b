"""Benchmark behind Table IV: MultiEM end-to-end effectiveness per dataset.

Records F1/pair-F1 in extra_info so the bench output doubles as a reduced
Table IV; asserts the calibrated effectiveness bands hold.
"""
from repro.tuned import TUNED

from repro.core import MultiEMParams, run_multiem
from repro.eval import evaluate

F1_FLOOR = {"geo": 45.0, "music20": 65.0, "shopee": 15.0}


def test_bench_table4_multiem(benchmark, spark, bench_dataset):
    name, data, truth = bench_dataset
    t = TUNED[name]
    params = MultiEMParams(
        m=t["m"], gamma=t["gamma"], eps=t["eps"], r=0.3,
        bands=t["bands"], bits=t["bits"],
    )

    def run():
        res = run_multiem(spark, data.records, data.config.attr_names(), params)
        return evaluate(res.tuples, truth)

    ev = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"dataset": name, "F1": round(ev["F1"], 1),
         "pair_F1": round(ev["pair_F1"], 1)}
    )
    assert ev["F1"] > F1_FLOOR[name]
