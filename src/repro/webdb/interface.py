"""The hidden web database substrate: a top-k search interface.

A ``WebDB`` answers one search-form submission (``QuerySpec``) with at most
``k`` tuples ordered by its hidden :class:`~repro.webdb.ranking.SystemRanking`
plus an ``overflow`` flag (true when more than ``k`` tuples matched — the
"showing k of many" banner every real site displays). This is the *only*
access path the reranking service has to the data, exactly as in the paper.

Two implementations share the contract:

* :class:`SparkWebDB` — the database engine is Spark: each query is one
  Catalyst plan ``df.where(pred).orderBy(score, tid).limit(k+1)`` over a
  cached DataFrame. Used by integration tests, benchmarks and jobs.
* :class:`LocalWebDB` — a pandas mirror with identical semantics, used to
  keep the hundreds of pure-algorithm unit tests fast. A contract test
  asserts the two (and a DuckDB oracle) agree on random queries.

``query_batch`` executes several queries as one *iteration*, recording the
batch size — QR2's parallel-processing statistic (Fig. 2). For Spark the
batch genuinely runs concurrently (thread pool over Spark actions).
"""
from __future__ import annotations

import heapq
from abc import ABC, abstractmethod
from concurrent.futures import ThreadPoolExecutor
from dataclasses import dataclass, field
from typing import Optional, Sequence

import pandas as pd

from .predicates import QuerySpec
from .ranking import SystemRanking

Row = dict
QueryResult = tuple[list[Row], bool]  # (top-k rows, overflow flag)


@dataclass
class QueryStats:
    """Counters the service's statistics panel reports (section II-C)."""

    n_queries: int = 0
    batch_sizes: list = field(default_factory=list)

    @property
    def n_batches(self) -> int:
        """Number of iterations (a sequential query counts as a batch of 1)."""
        return len(self.batch_sizes)

    @property
    def n_parallel_queries(self) -> int:
        """Queries that were issued alongside at least one other query."""
        return sum(b for b in self.batch_sizes if b > 1)

    def parallel_fraction(self) -> float:
        """Fraction of all queries issued in parallel batches (Fig. 2 metric)."""
        return self.n_parallel_queries / self.n_queries if self.n_queries else 0.0

    def snapshot(self) -> "QueryStats":
        """Copy for before/after cost accounting."""
        return QueryStats(self.n_queries, list(self.batch_sizes))

    def since(self, before: "QueryStats") -> "QueryStats":
        """Delta between this snapshot and an earlier one."""
        return QueryStats(
            self.n_queries - before.n_queries,
            self.batch_sizes[len(before.batch_sizes):],
        )


class WebDB(ABC):
    """Abstract hidden database with a top-k public search interface."""

    #: unique-tuple-id column name (visible on result rows, not filterable)
    id_col = "tid"

    def __init__(
        self,
        name: str,
        k: int,
        system_ranking: SystemRanking,
        numeric_attrs: Sequence[str],
        cat_attrs: Sequence[str] = (),
    ):
        self.name = name
        self.k = k
        self.system_ranking = system_ranking
        self.numeric_attrs = list(numeric_attrs)
        self.cat_attrs = list(cat_attrs)
        self.stats = QueryStats()

    # ----- the public interface -----------------------------------------
    def query(self, spec: QuerySpec, order: Optional[tuple[str, str]] = None) -> QueryResult:
        """One search-form submission.

        ``order`` optionally overrides the sort with one of the site's
        secondary sort options ``(attr, 'asc'|'desc')`` — real sites expose a
        few of these, and the crawler's last resort uses them.
        Returns (rows, overflow); ``overflow`` is True when strictly more
        than ``k`` tuples match.
        """
        self.stats.n_queries += 1
        self.stats.batch_sizes.append(1)
        return self._execute(spec, order)

    def query_batch(
        self, specs: Sequence[QuerySpec], order: Optional[tuple[str, str]] = None
    ) -> list[QueryResult]:
        """Issue several queries as one parallel iteration (QR2 section II-B)."""
        if not specs:
            return []
        self.stats.n_queries += len(specs)
        self.stats.batch_sizes.append(len(specs))
        return self._execute_batch(list(specs), order)

    # ----- implementation hooks -----------------------------------------
    @abstractmethod
    def _execute(self, spec: QuerySpec, order: Optional[tuple[str, str]]) -> QueryResult:
        ...

    def _execute_batch(
        self, specs: list[QuerySpec], order: Optional[tuple[str, str]]
    ) -> list[QueryResult]:
        return [self._execute(s, order) for s in specs]

    # ----- database-side metadata (NOT visible to the service) ----------
    @abstractmethod
    def true_domain(self, attr: str) -> tuple[float, float]:
        """Ground-truth min/max of a numeric attribute (tests/oracle only)."""

    @abstractmethod
    def true_size(self) -> int:
        """Ground-truth row count (tests/oracle only)."""

    def _order_clause(self, order: Optional[tuple[str, str]]) -> tuple[str, bool]:
        """(sort expression, ascending) for a query; default = system ranking."""
        if order is None:
            return self.system_ranking.expr, True
        attr, direction = order
        if attr not in self.numeric_attrs:
            raise ValueError(f"cannot sort by {attr}")
        if direction not in ("asc", "desc"):
            raise ValueError(f"bad direction {direction}")
        return attr, direction == "asc"


class LocalWebDB(WebDB):
    """Pandas-backed implementation; semantics identical to SparkWebDB."""

    def __init__(
        self,
        pdf: pd.DataFrame,
        *,
        name: str,
        k: int,
        system_ranking: SystemRanking,
        numeric_attrs: Sequence[str],
        cat_attrs: Sequence[str] = (),
    ):
        super().__init__(name, k, system_ranking, numeric_attrs, cat_attrs)
        if self.id_col not in pdf.columns:
            raise ValueError(f"data must carry an {self.id_col!r} column")
        self.pdf = pdf.reset_index(drop=True)
        self._sys_scores = system_ranking.pandas_scores(self.pdf)

    def _execute(self, spec: QuerySpec, order) -> QueryResult:
        m = spec.mask(self.pdf)
        sub = self.pdf[m]
        expr, asc = self._order_clause(order)
        scores = self._sys_scores[m] if order is None else sub[expr]
        key = pd.DataFrame({"s": scores, "t": sub[self.id_col]})
        # the tid tie-break follows the sort direction: a reversed sort is
        # the exact reversal of the forward one (matters for the crawler's
        # dual-order peel over duplicate values)
        idx = key.sort_values(["s", "t"], ascending=[asc, asc]).index
        top = self.pdf.loc[idx[: self.k + 1]]
        rows = top.to_dict("records")
        overflow = len(rows) > self.k
        return rows[: self.k], overflow

    def true_domain(self, attr: str) -> tuple[float, float]:
        col = self.pdf[attr]
        return float(col.min()), float(col.max())

    def true_size(self) -> int:
        return len(self.pdf)


class SparkWebDB(WebDB):
    """Spark-backed implementation: each query is one Catalyst plan.

    The hidden table is a cached DataFrame; a query compiles to
    ``WHERE <spec> ORDER BY <system score>, tid LIMIT k+1`` — Catalyst turns
    this into a TakeOrderedAndProject, the same shape a ranked-retrieval
    endpoint executes server-side. The extra row detects overflow.
    """

    def __init__(
        self,
        df,
        *,
        name: str,
        k: int,
        system_ranking: SystemRanking,
        numeric_attrs: Sequence[str],
        cat_attrs: Sequence[str] = (),
        n_threads: int = 8,
    ):
        super().__init__(name, k, system_ranking, numeric_attrs, cat_attrs)
        if self.id_col not in df.columns:
            raise ValueError(f"data must carry an {self.id_col!r} column")
        # a web database's inventory is small by Spark standards; a handful
        # of partitions keeps per-query scheduling overhead low while still
        # exercising the parallel TakeOrderedAndProject path
        self.df = df.coalesce(4).cache()
        self._n = self.df.count()  # materialises the cache
        self._pool = ThreadPoolExecutor(max_workers=n_threads)

    def _execute(self, spec: QuerySpec, order) -> QueryResult:
        from pyspark.sql import functions as F

        expr, asc = self._order_clause(order)
        score = F.expr(expr)
        tid = F.col(self.id_col)
        # tid tie-break follows the sort direction (see LocalWebDB._execute)
        sub = self.df.where(F.expr(spec.to_sql())).orderBy(
            score.asc() if asc else score.desc(), tid.asc() if asc else tid.desc()
        )
        rows = [r.asDict() for r in sub.limit(self.k + 1).collect()]
        overflow = len(rows) > self.k
        return rows[: self.k], overflow

    def _execute_batch(self, specs, order):
        # Spark supports concurrent actions from multiple threads; this is
        # QR2's parallel processing of one iteration's queries.
        futs = [self._pool.submit(self._execute, s, order) for s in specs]
        return [f.result() for f in futs]

    def true_domain(self, attr: str) -> tuple[float, float]:
        from pyspark.sql import functions as F

        row = self.df.agg(F.min(attr).alias("lo"), F.max(attr).alias("hi")).first()
        return float(row["lo"]), float(row["hi"])

    def true_size(self) -> int:
        return self._n


def merge_rows_by_id(*row_lists: Sequence[Row], id_col: str = "tid") -> dict:
    """Union row lists into an id-keyed dict (later lists win on conflict)."""
    out: dict = {}
    for rows in row_lists:
        for r in rows:
            out[r[id_col]] = r
    return out


def top_h_rows(rows, ranking, h: int, *, id_col: str = "tid") -> list[Row]:
    """Smallest-h rows by the user ranking's (score, tid) key — pure helper."""
    return heapq.nsmallest(h, rows, key=lambda r: ranking.key(r, id_col))
