"""Tests for the provided repro.synth_data generators (used by the oracle
integration tests and available for extension)."""
import pytest

from repro import synth_data


class TestRowCounts:
    @pytest.mark.parametrize(
        "fn,per_sf",
        [
            (synth_data.lineitem, 6_000_000),
            (synth_data.orders, 1_500_000),
            (synth_data.customer, 150_000),
            (synth_data.part, 200_000),
        ],
    )
    def test_scale_factor(self, spark, fn, per_sf):
        assert fn(spark, sf=0.001).count() == int(per_sf * 0.001)


class TestDeterminism:
    def test_lineitem_same_seed(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_keys_generators(self, spark):
        zdf = synth_data.zipf_keys(spark, n=1000, n_keys=50, seed=1)
        udf = synth_data.uniform_keys(spark, n=1000, n_keys=50, seed=1)
        assert zdf.count() == udf.count() == 1000

    def test_zipf_is_skewed(self, spark):
        zdf = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=2)
        counts = (
            zdf.groupBy("k").count().orderBy("count", ascending=False)
            .toPandas()
        )
        # top key should dominate the median key under alpha=1.1
        assert counts["count"].iloc[0] > 5 * counts["count"].median()


class TestSchemas:
    def test_lineitem_columns(self, spark):
        cols = synth_data.lineitem(spark, sf=0.0005).columns
        assert {"l_orderkey", "l_quantity", "l_shipdate"} <= set(cols)

    def test_orders_key_unique(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        assert o.select("o_orderkey").distinct().count() == o.count()
