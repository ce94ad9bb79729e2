"""Tests for the re-rank DataFrame operator (Catalyst sort + mapInPandas).

Result-set correctness goes through the DuckDB oracle
(``repro.oracle.assert_equivalent``) so a wrong expression or broken sort is
caught against an independent engine, not just against ourselves.
"""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.oracle import assert_equivalent
from repro.core.rerank_op import ground_truth_topk, rerank_df, rerank_with_udf
from repro.webdb import sources
from repro.webdb.predicates import QuerySpec, Range
from repro.webdb.ranking import LinearRanking, one_d


@pytest.fixture(scope="module")
def dia_df(spark):
    return sd.diamonds(spark, n=300).cache()


@pytest.fixture(scope="module")
def dia_pdf():
    return sd.diamonds_pdf(n=300)


def _bounds(pdf, attrs):
    return {a: (float(pdf[a].min()), float(pdf[a].max())) for a in attrs}


class TestRerankDF:
    def test_1d_ascending_vs_oracle(self, dia_df, dia_pdf):
        rk = one_d("price", _bounds(dia_pdf, ["price"])["price"])
        out = rerank_df(dia_df, rk, 15).select("tid", "price")
        assert_equivalent(
            out,
            "SELECT tid, price FROM d ORDER BY price ASC, tid ASC LIMIT 15",
            d=dia_pdf,
        )

    def test_1d_descending_vs_oracle(self, dia_df, dia_pdf):
        rk = one_d("carat", _bounds(dia_pdf, ["carat"])["carat"], descending=True)
        out = rerank_df(dia_df, rk, 10).select("tid", "carat")
        assert_equivalent(
            out,
            "SELECT tid, carat FROM d ORDER BY carat DESC, tid ASC LIMIT 10",
            d=dia_pdf,
        )

    def test_md_vs_oracle(self, dia_df, dia_pdf):
        bounds = _bounds(dia_pdf, ["price", "carat"])
        rk = LinearRanking({"price": 1.0, "carat": -0.5}, bounds)
        out = rerank_df(dia_df, rk, 20).select("tid")
        (plo, phi), (clo, chi) = bounds["price"], bounds["carat"]
        expr = f"(price - {plo}) / {phi - plo} - 0.5 * (carat - {clo}) / {chi - clo}"
        assert_equivalent(
            out,
            f"SELECT tid FROM d ORDER BY ({expr}) ASC, tid ASC LIMIT 20",
            d=dia_pdf,
        )

    def test_no_limit_returns_everything(self, dia_df, dia_pdf):
        rk = one_d("price", _bounds(dia_pdf, ["price"])["price"])
        assert rerank_df(dia_df, rk).count() == len(dia_pdf)

    def test_score_column_not_leaked(self, dia_df, dia_pdf):
        rk = one_d("price", _bounds(dia_pdf, ["price"])["price"])
        assert set(rerank_df(dia_df, rk, 5).columns) == set(dia_pdf.columns)

    def test_matches_ground_truth_helper(self, dia_df, dia_pdf):
        bounds = _bounds(dia_pdf, ["price", "depth"])
        rk = LinearRanking({"price": 1.0, "depth": 0.7}, bounds)
        got = [r["tid"] for r in rerank_df(dia_df, rk, 12).collect()]
        db = sources.bluenile(None, n=300, seed=7)
        want = [r["tid"] for r in ground_truth_topk(db, QuerySpec(), rk, 12)]
        assert got == want


class TestRerankWithUDF:
    def test_nonlinear_python_function(self, dia_df, dia_pdf):
        """Arbitrary ranking function: log-price per carat."""

        def score(pdf):
            return np.log(pdf["price"]) / pdf["carat"]

        got = [r["tid"] for r in rerank_with_udf(dia_df, score, 10).collect()]
        want = (
            dia_pdf.assign(_s=np.log(dia_pdf["price"]) / dia_pdf["carat"])
            .sort_values(["_s", "tid"])["tid"]
            .head(10)
            .tolist()
        )
        assert got == want

    def test_linear_udf_agrees_with_catalyst_path(self, dia_df, dia_pdf):
        bounds = _bounds(dia_pdf, ["price", "carat"])
        rk = LinearRanking({"price": 1.0, "carat": 0.3}, bounds)

        def score(pdf):
            return pdf.eval(rk.score_sql())

        via_udf = [r["tid"] for r in rerank_with_udf(dia_df, score, 15).collect()]
        via_catalyst = [r["tid"] for r in rerank_df(dia_df, rk, 15).collect()]
        assert via_udf == via_catalyst

    def test_schema_preserved(self, dia_df):
        got = rerank_with_udf(dia_df, lambda p: p["price"], 3)
        assert got.schema == dia_df.schema


class TestGroundTruth:
    def test_local_and_spark_backends_agree(self, spark):
        sdb = sources.bluenile(spark, n=200, k=10)
        ldb = sources.bluenile(None, n=200, k=10)
        bounds = {a: ldb.true_domain(a) for a in ["price", "carat"]}
        rk = LinearRanking({"price": 1.0, "carat": -0.2}, bounds)
        spec = QuerySpec({"price": Range(1000, 50000)})
        a = [r["tid"] for r in ground_truth_topk(sdb, spec, rk, 20)]
        b = [r["tid"] for r in ground_truth_topk(ldb, spec, rk, 20)]
        assert a == b

    def test_h_none_returns_all_sorted(self):
        ldb = sources.bluenile(None, n=50, k=10)
        rk = one_d("price", ldb.true_domain("price"))
        rows = ground_truth_topk(ldb, QuerySpec(), rk, None)
        assert len(rows) == 50
        scores = [rk.score(r) for r in rows]
        assert scores == sorted(scores)
