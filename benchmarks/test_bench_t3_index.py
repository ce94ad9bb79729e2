"""Benchmark T3 — on-the-fly indexing amortisation across sessions."""
from repro.experiments import t3_index
from repro.experiments.common import save_table


def test_bench_t3(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t3_index.run(spark, n=bench_n, k=bench_k, h=10, n_sessions=5),
        rounds=1,
        iterations=1,
    )
    t3_index.check_shape(df)
    print("\n" + save_table(df, "t3", "T3 - dense-region index amortisation (lwr asc)"))
