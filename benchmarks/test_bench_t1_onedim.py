"""Benchmark T1 — 1-D reranking cost by algorithm and correlation.

Regenerates DESIGN.md table T1 against the Spark-backed databases and
prints the rows recorded in EXPERIMENTS.md.
"""
from repro.experiments import t1_onedim
from repro.experiments.common import save_table


def test_bench_t1(benchmark, spark, bench_n, bench_k):
    df = benchmark.pedantic(
        lambda: t1_onedim.run(spark, n=bench_n, k=bench_k, h=10), rounds=1, iterations=1
    )
    t1_onedim.check_shape(df)
    print("\n" + save_table(df, "t1", "T1 - 1D reranking cost (queries to the web DB)"))
