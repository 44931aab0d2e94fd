"""Unit tests for the COMPARE data model and succinct-syntax parser (§2.2, §3.1)."""
import pytest

from repro.core.spec import (
    CompareSpec,
    ConstraintTerm,
    Measure,
    Scorer,
    TrendsetSpec,
    output_cols,
    output_constraint_cols,
    parse_compare,
)


def ts(*terms):
    return TrendsetSpec(tuple(ConstraintTerm(*t) for t in terms))


GM_WEEK_REV = ("week", Measure("AVG", "revenue"))
GM_CTRY_PROFIT = ("country", Measure("AVG", "profit"))


class TestMeasure:
    def test_name(self):
        assert Measure("AVG", "revenue").name == "AVG(revenue)"

    def test_agg_upcased(self):
        assert Measure("avg", "x").agg == "AVG"

    @pytest.mark.parametrize("agg", ["MEDIAN", "STDDEV", ""])
    def test_invalid_agg_rejected(self, agg):
        with pytest.raises(ValueError):
            Measure(agg, "x")

    @pytest.mark.parametrize("agg", ["AVG", "SUM", "MIN", "MAX", "COUNT"])
    def test_valid_aggs(self, agg):
        assert Measure(agg, "x").agg == agg


class TestScorer:
    def test_default_is_euclidean(self):
        s = Scorer()
        assert (s.agg, s.p) == ("SUM", 2)
        assert s.name == "SUM OVER DIFF(2)"

    @pytest.mark.parametrize("agg", ["SUM", "AVG", "MIN", "MAX"])
    def test_valid_aggs(self, agg):
        assert Scorer(agg, 1).agg == agg

    @pytest.mark.parametrize("p", [0, -1, 1.5, "2"])
    def test_invalid_p(self, p):
        with pytest.raises(ValueError):
            Scorer("SUM", p)

    def test_invalid_agg(self):
        with pytest.raises(ValueError):
            Scorer("COUNT", 2)


class TestTrendset:
    def test_vary_and_fixed_split(self):
        t = ts(("region", "Asia"), ("product", None))
        assert t.vary_cols == ("product",)
        assert t.fixed[0].col == "region" and t.fixed[0].value == "Asia"

    def test_cols_order_preserved(self):
        assert ts(("b",), ("a",)).cols == ("b", "a")

    def test_duplicate_column_rejected(self):
        with pytest.raises(ValueError):
            ts(("city",), ("city", "Paris"))

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            TrendsetSpec(())


class TestCompareSpec:
    def test_example_1a_shape(self):
        # [region='Asia'] <-> [region='Asia', product] over (week, AVG(revenue))
        spec = CompareSpec(
            ts(("region", "Asia")),
            ts(("region", "Asia"), ("product",)),
            (GM_WEEK_REV,),
        )
        assert not spec.same_trendsets
        assert not spec.exclude_equal  # different constraint column sets
        assert not spec.dedup_symmetric

    def test_q1_shape_excludes_self(self):
        spec = CompareSpec(ts(("airport", "SFO")), ts(("airport",)), (GM_WEEK_REV,))
        assert spec.exclude_equal  # SFO must not be compared with itself
        assert not spec.dedup_symmetric

    def test_q2_shape_dedups_symmetric(self):
        spec = CompareSpec(ts(("city",)), ts(("city",)), (GM_WEEK_REV,))
        assert spec.same_trendsets and spec.dedup_symmetric and spec.exclude_equal

    def test_q3_fully_fixed_keeps_self_pair(self):
        spec = CompareSpec(ts(("wp", 1)), ts(("wp", 1)), (GM_WEEK_REV,))
        assert not spec.exclude_equal  # explicit self-comparison workload

    def test_dedup_none_override(self):
        spec = CompareSpec(ts(("city",)), ts(("city",)), (GM_WEEK_REV,), dedup="none")
        assert not spec.dedup_symmetric and spec.exclude_equal

    def test_dedup_lt_forced(self):
        spec = CompareSpec(ts(("a",)), ts(("b",)), (GM_WEEK_REV,), dedup="lt")
        assert spec.dedup_symmetric

    def test_invalid_dedup(self):
        with pytest.raises(ValueError):
            CompareSpec(ts(("a",)), ts(("a",)), (GM_WEEK_REV,), dedup="yes")

    def test_duplicate_gm_rejected(self):
        with pytest.raises(ValueError):
            CompareSpec(ts(("a",)), ts(("a",)), (GM_WEEK_REV, GM_WEEK_REV))

    def test_empty_gms_rejected(self):
        with pytest.raises(ValueError):
            CompareSpec(ts(("a",)), ts(("a",)), ())

    def test_input_cols_deduped_in_order(self):
        spec = CompareSpec(
            ts(("region", "Asia")),
            ts(("region", "Asia"), ("product",)),
            (GM_WEEK_REV, GM_CTRY_PROFIT),
        )
        assert spec.input_cols == ("region", "product", "week", "country", "revenue", "profit")

    def test_output_cols(self):
        spec = CompareSpec(
            ts(("region", "Asia")), ts(("region", "Asia"), ("product",)), (GM_WEEK_REV,)
        )
        assert output_constraint_cols(spec) == ["l_region", "r_region", "r_product"]
        assert output_cols(spec)[-3:] == ["grouping", "measure", "score"]

    def test_n_pairs_one_to_many(self):
        spec = CompareSpec(ts(("airport", "SFO")), ts(("airport",)), (GM_WEEK_REV,))
        assert spec.n_pairs({"airport": 384}) == 383

    def test_n_pairs_many_to_many_dedup(self):
        spec = CompareSpec(ts(("airport",)), ts(("airport",)), (GM_WEEK_REV,))
        assert spec.n_pairs({"airport": 384}) == 384 * 383 // 2

    def test_n_pairs_scales_with_gms(self):
        spec = CompareSpec(
            ts(("airport",)), ts(("airport",)), (GM_WEEK_REV, GM_CTRY_PROFIT)
        )
        assert spec.n_pairs({"airport": 10}) == 2 * 45


class TestParser:
    def test_example_1a(self):
        spec = parse_compare(
            "[(region='Asia') <-> (region='Asia', product)]"
            "[(week, AVG(revenue))] USING SUM OVER DIFF(2)"
        )
        assert spec.t1.fixed[0].value == "Asia"
        assert spec.t2.vary_cols == ("product",)
        assert spec.gms == (GM_WEEK_REV,)
        assert spec.scorer == Scorer("SUM", 2)

    def test_multiple_gms(self):
        spec = parse_compare(
            "[(city) <-> (city)][(week, AVG(revenue)), (country, AVG(profit))] "
            "USING AVG OVER DIFF(1)"
        )
        assert spec.gms == (GM_WEEK_REV, GM_CTRY_PROFIT)
        assert spec.scorer == Scorer("AVG", 1)
        assert spec.dedup_symmetric

    def test_numeric_constraint_value(self):
        spec = parse_compare(
            "[(wp=1) <-> (wp)][(day, AVG(profit))] USING SUM OVER DIFF(2)"
        )
        assert spec.t1.fixed[0].value == 1

    def test_qualified_names_stripped(self):
        spec = parse_compare(
            "[(R.city) <-> (R.city)][(R.week, AVG(R.revenue))] USING SUM OVER DIFF(2)"
        )
        assert spec.t1.vary_cols == ("city",)
        assert spec.gms[0][0] == "week"

    @pytest.mark.parametrize(
        "bad",
        [
            "[(city)][(week, AVG(revenue))] USING SUM OVER DIFF(2)",  # no <->
            "[(city) <-> (city)][] USING SUM OVER DIFF(2)",  # no gms
            "[(city) <-> (city)][(week, AVG(revenue))]",  # no USING
        ],
    )
    def test_malformed_rejected(self, bad):
        with pytest.raises(ValueError):
            parse_compare(bad)

    def test_roundtrip_semantics_match_manual(self):
        parsed = parse_compare(
            "[(airport='SFO') <-> (airport)][(day, AVG(arr_delay))] USING SUM OVER DIFF(2)"
        )
        manual = CompareSpec(
            ts(("airport", "SFO")), ts(("airport",)), (("day", Measure("AVG", "arr_delay")),)
        )
        assert parsed == manual
