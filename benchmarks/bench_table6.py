"""Benchmark behind Table VI: memory usage of MultiEM vs the HAC baseline.

pytest-benchmark measures time; the memory reading (driver RSS + JVM heap)
is attached as extra_info, mirroring how Table VI pairs with Table V.
"""
from repro.baselines import InfeasibleError, hac_matching
from repro.core import MultiEMParams, run_multiem
from repro.embedding import with_embeddings, with_text
from repro.eval import measure
from repro.tuned import TUNED


def test_bench_table6_multiem_memory(benchmark, spark, bench_dataset):
    name, data, _ = bench_dataset
    t = TUNED[name]
    params = MultiEMParams(m=t["m"], gamma=t["gamma"], eps=t["eps"], r=0.3,
                           bands=t["bands"], bits=t["bits"])

    def run():
        return measure(
            spark,
            lambda: run_multiem(
                spark, data.records, data.config.attr_names(), params
            ).tuples.count(),
        )

    meas = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update({"dataset": name, "mem_mb": round(meas.mem_mb)})
    assert meas.mem_mb > 0


def test_bench_table6_hac_memory(benchmark, spark, bench_dataset):
    name, data, _ = bench_dataset
    emb = (
        with_embeddings(with_text(data.records, data.config.attr_names()))
        .select("uid", "emb")
    )

    def run():
        try:
            return measure(spark, lambda: hac_matching(spark, emb, cut=0.35).count())
        except InfeasibleError:
            return None

    meas = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"dataset": name,
         "mem_mb": round(meas.mem_mb) if meas else "infeasible"}
    )
