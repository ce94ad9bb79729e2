"""Hidden-database crawler (Sheng et al., VLDB 2012 — reference [8] of QR2).

Enumerates *every* tuple matching a predicate despite the top-k result
limit, by recursively bisecting the predicate region until every leaf query
underflows. QR2 invokes this when more than system-k tuples share one
attribute value (the "general positioning" violation, section II-B) and when
(1D/MD)-RERANK decides to index a dense region.

Splitting strategy: bisect the numeric attribute with the widest remaining
relative range (domain-normalised); when every numeric range is degenerate,
split categorical IN-lists; as a last resort use the site's secondary sort
orders (attr asc + attr desc) to peel 2k tuples off a point region.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Mapping

from .interface import Row, WebDB
from .predicates import QuerySpec, Range


class CrawlError(RuntimeError):
    """Raised when a region cannot be fully enumerated through the interface."""


@dataclass
class CrawlResult:
    """All tuples in the crawled region, keyed by tuple id."""

    rows: dict = field(default_factory=dict)
    n_queries: int = 0


def _split_candidates(db: WebDB, spec: QuerySpec, bounds: Mapping[str, tuple[float, float]]):
    """Numeric attrs still splittable in ``spec``, widest relative range first."""
    out = []
    for a in db.numeric_attrs:
        dom = bounds.get(a) or (0.0, 1.0)
        width = dom[1] - dom[0]
        if width <= 0:
            continue
        r = spec.ranges.get(a, Range())
        lo = dom[0] if r.lo is None else max(r.lo, dom[0])
        hi = dom[1] if r.hi is None else min(r.hi, dom[1])
        rel = (hi - lo) / width
        # stop bisecting below float-resolution slivers
        if hi - lo > 1e-9 * max(1.0, abs(width)):
            out.append((rel, a, lo, hi, r))
    out.sort(reverse=True, key=lambda t: t[0])
    return out


def crawl(
    db: WebDB,
    spec: QuerySpec,
    bounds: Mapping[str, tuple[float, float]],
    *,
    max_queries: int = 100_000,
) -> CrawlResult:
    """Fully enumerate the tuples matching ``spec``.

    ``bounds`` supplies attribute domains for unbounded range sides (the
    service learns them via ``discovery``). Query cost is charged to
    ``db.stats`` as usual and also reported in the result.
    """
    res = CrawlResult()
    before = db.stats.n_queries
    # level-synchronous BFS: sibling sub-regions are independent, so each
    # level is one parallel batch (QR2's parallel processing, section II-B)
    level = [spec]
    while level:
        if db.stats.n_queries - before > max_queries:
            raise CrawlError(f"crawl exceeded {max_queries} queries")
        level = [s for s in level if not s.is_empty()]
        if not level:
            break
        results = db.query_batch(level)
        nxt: list[QuerySpec] = []
        for cur, (rows, overflow) in zip(level, results):
            for r in rows:
                res.rows[r[db.id_col]] = r
            if not overflow:
                continue
            numeric = _split_candidates(db, cur, bounds)
            if numeric:
                _, a, lo, hi, r = numeric[0]
                mid = (lo + hi) / 2.0
                nxt.append(cur.with_range(a, Range(None, mid, hi_incl=True)))
                nxt.append(cur.with_range(a, Range(mid, None, lo_incl=False)))
                continue
            cat = next(
                (a for a in db.cat_attrs if len(cur.cats.get(a, ())) > 1), None
            )
            if cat is not None:
                vals = sorted(cur.cats[cat])
                half = len(vals) // 2
                nxt.append(QuerySpec(cur.ranges, {**cur.cats, cat: frozenset(vals[:half])}))
                nxt.append(QuerySpec(cur.ranges, {**cur.cats, cat: frozenset(vals[half:])}))
                continue
            unused_cat = next((a for a in db.cat_attrs if a not in cur.cats), None)
            if unused_cat is not None:
                # constrain an untouched categorical facet so it becomes splittable
                domain = _cat_domain(db, unused_cat)
                nxt.append(QuerySpec(cur.ranges, {**cur.cats, unused_cat: frozenset(domain)}))
                continue
            got = _peel_with_orders(db, cur, res)
            if not got:
                raise CrawlError(
                    f"region {cur.to_sql()} has more than 2k indistinguishable tuples"
                )
        level = nxt
    res.n_queries = db.stats.n_queries - before
    return res


def _cat_domain(db: WebDB, attr: str) -> list:
    """The site's visible option list for a categorical facet."""
    from .. import synth_data as sd

    domains = {
        "cut": sd.DIAMOND_CUTS,
        "color": sd.DIAMOND_COLORS,
        "clarity": sd.DIAMOND_CLARITIES,
        "shape": sd.DIAMOND_SHAPES,
        "zipcode": sd.HOUSE_ZIPS,
    }
    if attr not in domains:
        raise CrawlError(f"no known facet domain for {attr}")
    return domains[attr]


def _peel_with_orders(db: WebDB, spec: QuerySpec, res: CrawlResult) -> bool:
    """Last resort for a point region: grab top-k under asc and desc sorts.

    Returns True when the two sorted views provably cover the region
    (combined distinct count <= 2k and one side underflowed, or the asc and
    desc windows overlap).
    """
    attr = db.numeric_attrs[0]
    rows_a, ovf_a = db.query(spec, order=(attr, "asc"))
    rows_d, ovf_d = db.query(spec, order=(attr, "desc"))
    ids = {r[db.id_col] for r in rows_a} | {r[db.id_col] for r in rows_d}
    covered = (not ovf_a) or (not ovf_d) or (
        len(ids) < len(rows_a) + len(rows_d)
    )
    if covered:
        for r in rows_a + rows_d:
            res.rows[r[db.id_col]] = r
        return True
    return False
