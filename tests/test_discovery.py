"""Tests for attribute-extent discovery through the public interface."""
import pytest

from repro.webdb import sources
from repro.webdb.discovery import discover_bounds, discover_max, discover_min
from repro.webdb.predicates import QuerySpec, Range


@pytest.fixture(scope="module")
def db():
    return sources.bluenile(n=500, k=10)


class TestDiscovery:
    @pytest.mark.parametrize("attr", ["price", "carat", "depth", "table_pct", "lwr"])
    def test_min_exact(self, db, attr):
        assert discover_min(db, attr) == db.true_domain(attr)[0]

    @pytest.mark.parametrize("attr", ["price", "carat", "lwr"])
    def test_max_exact(self, db, attr):
        assert discover_max(db, attr) == db.true_domain(attr)[1]

    def test_bounds_all_attrs(self, db):
        got = discover_bounds(db, ["price", "carat"])
        assert got == {a: db.true_domain(a) for a in ["price", "carat"]}

    def test_filtered_base(self, db):
        base = QuerySpec({"carat": Range(0.5, 1.0)})
        sub = db.pdf[db.pdf["carat"].between(0.5, 1.0)]
        assert discover_min(db, "price", base) == sub["price"].min()
        assert discover_max(db, "price", base) == sub["price"].max()

    def test_empty_base_raises(self, db):
        with pytest.raises(ValueError):
            discover_min(db, "price", QuerySpec({"price": Range(1, 2)}))

    def test_min_cheap_when_system_rank_correlated(self, db):
        """System rank is price asc: min(price) must come in O(1) queries."""
        before = db.stats.n_queries
        discover_min(db, "price")
        assert db.stats.n_queries - before <= 3

    def test_zillow_bounds(self):
        zdb = sources.zillow(n=300, k=10)
        got = discover_bounds(zdb, ["price", "sqft"])
        assert got == {a: zdb.true_domain(a) for a in ["price", "sqft"]}
