"""Benchmark T2 — MD reranking cost by algorithm/dimensionality/signs."""
from repro.experiments import t2_md
from repro.experiments.common import save_table


def test_bench_t2(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t2_md.run(spark, n=bench_n, k=bench_k, h=5, max_queries=300),
        rounds=1,
        iterations=1
    )
    t2_md.check_shape(df)
    print("\n" + save_table(df, "t2", "T2 - MD reranking cost on Blue Nile"))
