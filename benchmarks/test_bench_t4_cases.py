"""Benchmark T4 — best vs worst case ranking functions."""
from repro.experiments import t4_cases
from repro.experiments.common import save_table


def test_bench_t4(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t4_cases.run(spark, n=bench_n, k=bench_k, h=5), rounds=1, iterations=1
    )
    t4_cases.check_shape(df)
    print("\n" + save_table(df, "t4", "T4 - best vs worst case functions"))
