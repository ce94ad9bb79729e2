"""Unit tests for ranking functions and the unit-axis attribute maps."""
import math

import pytest

from repro.synth_data import diamonds_pdf
from repro.webdb.predicates import Range
from repro.webdb.ranking import AttrMap, LinearRanking, SystemRanking, one_d


class TestAttrMap:
    def test_to_unit_endpoints(self):
        m = AttrMap("x", 10, 20)
        assert m.to_unit(10) == 0.0
        assert m.to_unit(20) == 1.0
        assert m.to_unit(15) == 0.5

    def test_flip_reverses(self):
        m = AttrMap("x", 10, 20, flip=True)
        assert m.to_unit(10) == 1.0
        assert m.to_unit(20) == 0.0

    @pytest.mark.parametrize("flip", [False, True])
    @pytest.mark.parametrize("x", [10.0, 12.5, 17.3, 20.0])
    def test_roundtrip(self, flip, x):
        m = AttrMap("x", 10, 20, flip=flip)
        assert math.isclose(m.to_raw(m.to_unit(x)), x, rel_tol=1e-12)

    def test_degenerate_domain_no_zero_division(self):
        m = AttrMap("x", 5, 5)
        assert m.to_unit(5) == 0.0

    def test_unit_range_to_raw_no_flip(self):
        m = AttrMap("x", 0, 100)
        r = m.unit_range_to_raw(Range(0.25, 0.5, False, True))
        assert (r.lo, r.hi, r.lo_incl, r.hi_incl) == (25, 50, False, True)

    def test_unit_range_to_raw_flip_swaps_endpoints_and_flags(self):
        m = AttrMap("x", 0, 100, flip=True)
        r = m.unit_range_to_raw(Range(0.25, 0.5, False, True))
        # u in (0.25, 0.5]  <=>  x in [50, 75)
        assert (r.lo, r.hi, r.lo_incl, r.hi_incl) == (50, 75, True, False)

    def test_unit_range_membership_consistency(self):
        """A raw value is in the mapped range iff its unit value is in the
        unit range — for both orientations."""
        for flip in (False, True):
            m = AttrMap("x", -3, 7, flip=flip)
            ur = Range(0.2, 0.6, False, True)
            rr = m.unit_range_to_raw(ur)
            for x in [-3, -1, 0.99, 1.0, 3.0, 5.0, 7]:
                assert ur.contains(m.to_unit(x)) == rr.contains(x), (flip, x)


class TestLinearRanking:
    BOUNDS = {"a": (0.0, 10.0), "b": (100.0, 200.0)}

    def test_score_is_normalised(self):
        rk = LinearRanking({"a": 1.0, "b": -0.5}, self.BOUNDS)
        assert rk.score({"a": 0, "b": 100}) == 0.0
        assert rk.score({"a": 10, "b": 200}) == pytest.approx(0.5)

    def test_internal_score_order_equivalent(self):
        rk = LinearRanking({"a": 1.0, "b": -0.5}, self.BOUNDS)
        rows = [
            {"a": x, "b": y, "tid": i}
            for i, (x, y) in enumerate([(0, 100), (5, 150), (10, 200), (2, 190), (9, 110)])
        ]
        by_user = sorted(rows, key=rk.score)
        by_internal = sorted(rows, key=rk.internal_score)
        assert [r["tid"] for r in by_user] == [r["tid"] for r in by_internal]

    def test_internal_weight_nonnegative(self):
        rk = LinearRanking({"a": -0.7}, {"a": (0, 1)})
        assert rk.internal_weight("a") == 0.7

    def test_negative_weight_flips_axis(self):
        rk = LinearRanking({"a": -1.0}, {"a": (0, 10)})
        assert rk.attr_map("a").flip is True
        assert rk.attr_map("a").to_unit(10) == 0.0  # best raw value maps to 0

    def test_key_breaks_ties_by_tid(self):
        rk = one_d("a", (0, 10))
        r1, r2 = {"a": 5, "tid": 2}, {"a": 5, "tid": 1}
        assert rk.key(r2) < rk.key(r1)

    def test_score_sql_matches_python(self):
        pdf = diamonds_pdf(n=50)
        bounds = {
            "price": (pdf["price"].min(), pdf["price"].max()),
            "carat": (pdf["carat"].min(), pdf["carat"].max()),
        }
        rk = LinearRanking({"price": 1.0, "carat": -0.3}, bounds)
        via_sql = pdf.eval(rk.score_sql())
        via_py = pdf.apply(lambda r: rk.score(r), axis=1)
        assert (via_sql - via_py).abs().max() < 1e-9

    def test_signature_stable_and_distinct(self):
        rk1 = LinearRanking({"a": 1.0, "b": 2.0}, self.BOUNDS)
        rk2 = LinearRanking({"b": 2.0, "a": 1.0}, self.BOUNDS)
        rk3 = LinearRanking({"a": 1.0, "b": 2.5}, self.BOUNDS)
        assert rk1.signature() == rk2.signature()
        assert rk1.signature() != rk3.signature()

    def test_rejects_zero_weight(self):
        with pytest.raises(ValueError):
            LinearRanking({"a": 0.0}, {"a": (0, 1)})

    def test_rejects_missing_bounds(self):
        with pytest.raises(ValueError):
            LinearRanking({"a": 1.0}, {})

    def test_rejects_empty(self):
        with pytest.raises(ValueError):
            LinearRanking({}, {})

    def test_one_d_directions(self):
        asc = one_d("a", (0, 10))
        desc = one_d("a", (0, 10), descending=True)
        assert asc.score({"a": 1}) < asc.score({"a": 9})
        assert desc.score({"a": 9}) < desc.score({"a": 1})


class TestSystemRanking:
    def test_pandas_eval(self):
        pdf = diamonds_pdf(n=20)
        s = SystemRanking("price + 2 * carat")
        assert (s.pandas_scores(pdf) - (pdf["price"] + 2 * pdf["carat"])).abs().max() == 0
