"""Benchmark T6 — the end-to-end Zillow service statistic."""
from repro.experiments import t6_zillow
from repro.experiments.common import save_table


def test_bench_t6(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t6_zillow.run(spark, n=bench_n, k=bench_k), rounds=1, iterations=1
    )
    t6_zillow.check_shape(df)
    print("\n" + save_table(df, "t6", "T6 - Zillow price - 0.3*sqft service statistics"))
