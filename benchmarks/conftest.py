"""Benchmark-scope fixtures: Spark-backed sources at benchmark scale.

Benchmarks exercise the SparkWebDB path (every web-database query is a
Catalyst plan over the cached hidden table). ``QR2_BENCH_N`` tuples stands
in for scale factor; ``QR2_BENCH_K`` is the site's page size (real ranked
retrieval sites return 20-60 tuples per page).
"""
import os

import pytest

N_BENCH = int(os.environ.get("QR2_BENCH_N", "3000"))
K_BENCH = int(os.environ.get("QR2_BENCH_K", "25"))


@pytest.fixture(scope="session")
def bench_n():
    """Tuple count for benchmark databases."""
    return N_BENCH


@pytest.fixture(scope="session")
def bench_k():
    """System page size (top-k) for benchmark databases."""
    return K_BENCH
