"""T5 — parallel query processing per iteration (Fig. 2 of the paper).

QR2 batches the independent queries of each search iteration and issues
them in parallel. The paper reports, on Blue Nile: 2-D search — 45 total
queries, 44 issued in parallel (> 97%); 3-D search — > 90% of queries in
parallel. We run MD-RERANK (the deployed algorithm) for a 2-D and the
paper's 3-D ranking function and report total queries, parallel queries,
the parallel fraction, and the per-iteration batch sizes.
"""
from __future__ import annotations

import pandas as pd

from ..core.multidim import MDRerank
from ..core.rerank_op import ground_truth_topk
from ..core.session import Session
from ..webdb.predicates import QuerySpec
from ..webdb.ranking import LinearRanking
from .common import Timer, make_db, true_bounds

PAPER_CLAIMS = [
    "2D: 44 of 45 queries issued in parallel (> 97%)",
    "3D: > 90% of queries issued in parallel",
]

FUNCS = [
    ("2D", {"price": 1.0, "carat": -0.3}),
    ("3D (paper fn)", {"price": 1.0, "carat": -0.1, "depth": -0.5}),
]


def run(spark=None, *, n: int = 2000, h: int = 10, k: int = 10, quick: bool = False) -> pd.DataFrame:
    """Fig. 2 as a table: parallelism statistics for 2-D and 3-D searches."""
    db = make_db("bluenile", spark, n=n, k=k)
    bounds = true_bounds(db)
    rows = []
    for label, weights in FUNCS:
        rk = LinearRanking(weights, {a: bounds[a] for a in weights})
        algo = MDRerank(db, bounds, max_queries=10000)
        before = db.stats.snapshot()
        with Timer() as t:
            got = algo.get_top_h(Session(), rk, h if not quick else 3)
        truth = ground_truth_topk(db, QuerySpec(), rk, h if not quick else 3)
        assert [r["tid"] for r in got] == [r["tid"] for r in truth], label
        delta = db.stats.since(before)
        sizes = delta.batch_sizes
        rows.append(
            {
                "search": label,
                "dims": len(weights),
                "total_queries": delta.n_queries,
                "parallel_queries": delta.n_parallel_queries,
                "parallel_frac": round(delta.parallel_fraction(), 3),
                "iterations": len(sizes),
                "max_batch": max(sizes) if sizes else 0,
                "seconds": round(t.seconds, 2),
            }
        )
    return pd.DataFrame(rows)


def check_shape(df: pd.DataFrame) -> None:
    """Most queries must issue in parallel batches, as in Fig. 2."""
    for _, r in df.iterrows():
        assert r.parallel_frac > 0.75, (r.search, r.parallel_frac)
