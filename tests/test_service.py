"""End-to-end tests for the QR2 service facade."""
import pytest

from repro.core.rerank_op import ground_truth_topk
from repro.core.service import QR2Service, UserQuery
from repro.webdb import sources
from repro.webdb.predicates import QuerySpec, Range


def _ids(rows):
    return [r["tid"] for r in rows]


@pytest.fixture()
def service():
    svc = QR2Service()
    bn = sources.bluenile(n=400, k=10)
    zl = sources.zillow(n=400, k=10)
    svc.register_source(bn, bounds={a: bn.true_domain(a) for a in bn.numeric_attrs})
    svc.register_source(zl, bounds={a: zl.true_domain(a) for a in zl.numeric_attrs})
    return svc


class TestRegistration:
    def test_register_with_discovery(self):
        svc = QR2Service()
        db = sources.bluenile(n=200, k=10)
        svc.register_source(db)  # bounds discovered through the interface
        assert svc.bounds["bluenile"] == {
            a: db.true_domain(a) for a in db.numeric_attrs
        }

    def test_ranking_md_validates_sliders(self, service):
        with pytest.raises(ValueError):
            service.ranking_md("bluenile", {"price": 1.5})


class TestQueryLifecycle:
    def test_1d_first_page_matches_truth(self, service):
        db = service.dbs["bluenile"]
        rk = service.ranking_1d("bluenile", "carat")
        sid, rows, stats = service.submit(
            UserQuery("bluenile", QuerySpec(), rk, page_size=8)
        )
        assert _ids(rows) == _ids(ground_truth_topk(db, QuerySpec(), rk, 8))
        assert stats.n_queries > 0
        assert stats.elapsed_s >= 0

    def test_get_next_pages_continue_ranking(self, service):
        db = service.dbs["bluenile"]
        rk = service.ranking_md("bluenile", {"price": 1.0, "carat": -0.5})
        sid, page1, _ = service.submit(
            UserQuery("bluenile", QuerySpec(), rk, page_size=5)
        )
        page2, stats2 = service.get_next_page(sid)
        truth = ground_truth_topk(db, QuerySpec(), rk, 10)
        assert _ids(page1) + _ids(page2) == _ids(truth)

    def test_filtered_query(self, service):
        db = service.dbs["zillow"]
        spec = QuerySpec({"beds": Range(3, None)}, {"zipcode": frozenset({"76010", "75001"})})
        rk = service.ranking_md("zillow", {"price": 1.0, "sqft": -0.3})
        sid, rows, _ = service.submit(UserQuery("zillow", spec, rk, page_size=6))
        assert _ids(rows) == _ids(ground_truth_topk(db, spec, rk, 6))

    def test_1d_descending(self, service):
        db = service.dbs["zillow"]
        rk = service.ranking_1d("zillow", "sqft", descending=True)
        sid, rows, _ = service.submit(UserQuery("zillow", QuerySpec(), rk, page_size=5))
        assert _ids(rows) == _ids(ground_truth_topk(db, QuerySpec(), rk, 5))

    def test_md_ta_mode(self):
        svc = QR2Service(md_algorithm="md-ta")
        db = sources.bluenile(n=300, k=10)
        svc.register_source(db, bounds={a: db.true_domain(a) for a in db.numeric_attrs})
        rk = svc.ranking_md("bluenile", {"price": 1.0, "carat": 0.3})
        sid, rows, _ = svc.submit(UserQuery("bluenile", QuerySpec(), rk, page_size=5))
        assert _ids(rows) == _ids(ground_truth_topk(db, QuerySpec(), rk, 5))

    def test_concurrent_sessions_isolated(self, service):
        db = service.dbs["bluenile"]
        rk_a = service.ranking_1d("bluenile", "price")
        rk_d = service.ranking_1d("bluenile", "price", descending=True)
        sid_a, page_a, _ = service.submit(UserQuery("bluenile", QuerySpec(), rk_a, 4))
        sid_d, page_d, _ = service.submit(UserQuery("bluenile", QuerySpec(), rk_d, 4))
        next_a, _ = service.get_next_page(sid_a)
        assert _ids(page_a) + _ids(next_a) == _ids(
            ground_truth_topk(db, QuerySpec(), rk_a, 8)
        )
        assert _ids(page_d) == _ids(ground_truth_topk(db, QuerySpec(), rk_d, 4))


class TestStatisticsPanel:
    def test_dense_region_amortised_across_users(self, service):
        """Two users, same dense 1-D query: the second is far cheaper thanks
        to the shared dense index (the paper's on-the-fly indexing demo)."""
        rk = service.ranking_1d("bluenile", "lwr")
        _, _, stats1 = service.submit(UserQuery("bluenile", QuerySpec(), rk, 10))
        _, _, stats2 = service.submit(UserQuery("bluenile", QuerySpec(), rk, 10))
        assert stats2.n_queries < stats1.n_queries / 2

    def test_md_reports_parallel_queries(self, service):
        rk = service.ranking_md("bluenile", {"price": 1.0, "depth": -0.5})
        _, _, stats = service.submit(UserQuery("bluenile", QuerySpec(), rk, 5))
        assert stats.n_parallel_queries > 0


class TestCachePersistence:
    def test_save_load_roundtrip(self, service, spark, tmp_path):
        rk = service.ranking_1d("bluenile", "lwr")
        service.submit(UserQuery("bluenile", QuerySpec(), rk, 10))  # populates index
        assert service.indexes["bluenile"].entries
        root = str(tmp_path / "caches")
        service.save_caches(spark, root)

        svc2 = QR2Service()
        for name, db in service.dbs.items():
            svc2.register_source(db, bounds=service.bounds[name])
        svc2.load_caches(spark, root)
        assert len(svc2.indexes["bluenile"].entries) == len(
            service.indexes["bluenile"].entries
        )
        # the reloaded cache serves the dense region cheaply
        _, _, stats = svc2.submit(UserQuery("bluenile", QuerySpec(), rk, 10))
        assert stats.n_queries < 15

    def test_boot_verify_clean(self, service):
        rk = service.ranking_1d("bluenile", "lwr")
        service.submit(UserQuery("bluenile", QuerySpec(), rk, 5))
        changed = service.boot_verify()
        assert changed["bluenile"] == 0 and changed["zillow"] == 0
