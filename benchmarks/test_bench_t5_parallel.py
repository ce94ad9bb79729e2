"""Benchmark T5 — parallel queries per iteration (Fig. 2)."""
from repro.experiments import t5_parallel
from repro.experiments.common import save_table


def test_bench_t5(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t5_parallel.run(spark, n=bench_n, k=bench_k, h=10), rounds=1, iterations=1
    )
    t5_parallel.check_shape(df)
    print("\n" + save_table(df, "t5", "T5 - parallel query fraction (Fig. 2)"))
