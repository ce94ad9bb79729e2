"""Smoke tests: every table harness runs (pandas backend, small n) and its
measured shape matches the paper's qualitative claims."""
import pytest

from repro.experiments import ALL_TABLES, t1_onedim, t2_md, t3_index, t4_cases, t5_parallel, t6_zillow


class TestHarnesses:
    def test_t1_runs_and_shape_holds(self):
        df = t1_onedim.run(None, n=600, h=8)
        assert len(df) == len(t1_onedim.CONFIGS) * 3
        t1_onedim.check_shape(df)

    def test_t2_runs_and_shape_holds(self):
        df = t2_md.run(None, n=500, h=4, quick=True)
        assert set(df.algorithm) == {"md-baseline", "md-binary", "md-rerank", "md-ta"}
        t2_md.check_shape(df)

    def test_t3_runs_and_shape_holds(self):
        df = t3_index.run(None, n=600, h=8, n_sessions=4)
        t3_index.check_shape(df)

    def test_t4_runs_and_shape_holds(self):
        df = t4_cases.run(None, n=800, h=4)
        t4_cases.check_shape(df)

    def test_t5_runs_and_shape_holds(self):
        df = t5_parallel.run(None, n=600, h=6)
        t5_parallel.check_shape(df)

    def test_t6_runs_and_shape_holds(self):
        df = t6_zillow.run(None, n=600)
        t6_zillow.check_shape(df)

    def test_registry_complete(self):
        assert set(ALL_TABLES) == {"t1", "t2", "t3", "t4", "t5", "t6"}
        for mod in ALL_TABLES.values():
            assert hasattr(mod, "run") and hasattr(mod, "PAPER_CLAIMS")

    @pytest.mark.parametrize("name", list(ALL_TABLES))
    def test_claims_documented(self, name):
        assert len(ALL_TABLES[name].PAPER_CLAIMS) >= 2
