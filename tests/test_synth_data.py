"""Tests for the extended synthetic data generators."""
import pytest

from repro import synth_data


class TestProvidedTables:
    def test_lineitem_schema(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert "l_orderkey" in df.columns
        assert df.count() == 6000

    def test_orders_keys_sequential(self, spark):
        pdf = synth_data.orders(spark, sf=0.001).toPandas()
        assert pdf["o_orderkey"].min() == 1
        assert pdf["o_orderkey"].is_unique

    def test_scale_factor_scales_rows(self, spark):
        small = synth_data.customer(spark, sf=0.001).count()
        large = synth_data.customer(spark, sf=0.002).count()
        assert large == 2 * small


class TestExtensions:
    def test_supplier_schema(self, spark):
        df = synth_data.supplier(spark, sf=0.01)
        assert set(df.columns) == {"s_suppkey", "s_nationkey", "s_acctbal"}
        assert df.count() == 100

    def test_supplier_nationkeys_valid(self, spark):
        pdf = synth_data.supplier(spark, sf=0.01).toPandas()
        assert pdf["s_nationkey"].between(0, 24).all()

    def test_nation_fixed_size(self, spark):
        df = synth_data.nation(spark)
        assert df.count() == 25
        pdf = df.toPandas()
        assert sorted(pdf["n_nationkey"]) == list(range(25))

    def test_supplier_deterministic(self, spark):
        a = synth_data.supplier(spark, sf=0.01, seed=3).toPandas()
        b = synth_data.supplier(spark, sf=0.01, seed=3).toPandas()
        assert a.equals(b)
