"""Extended TPC-H-lite generators (supplier, partsupp, nation, region)."""
import pytest

from repro import synth_data as sd


class TestSupplier:
    def test_row_count_scales(self, spark):
        assert sd.supplier(spark, sf=0.01).count() == 100

    def test_schema(self, spark):
        assert sd.supplier(spark, sf=0.001).columns == [
            "s_suppkey", "s_name", "s_nationkey", "s_acctbal",
        ]

    def test_keys_unique(self, spark):
        df = sd.supplier(spark, sf=0.01)
        assert df.select("s_suppkey").distinct().count() == df.count()

    def test_nationkey_fk_range(self, spark):
        rows = sd.supplier(spark, sf=0.005).select("s_nationkey").collect()
        assert all(0 <= r[0] < 25 for r in rows)

    def test_deterministic(self, spark):
        a = sd.supplier(spark, sf=0.005, seed=6).toPandas()
        b = sd.supplier(spark, sf=0.005, seed=6).toPandas()
        assert a.equals(b)


class TestPartsupp:
    def test_composite_key_unique(self, spark):
        df = sd.partsupp(spark, sf=0.005)
        assert df.select("ps_partkey", "ps_suppkey").distinct().count() == df.count()

    def test_fk_to_part(self, spark):
        ps = sd.partsupp(spark, sf=0.005)
        parts = {r[0] for r in sd.part(spark, sf=0.005).select("p_partkey").collect()}
        assert {r[0] for r in ps.select("ps_partkey").collect()} <= parts

    def test_fk_to_supplier(self, spark):
        ps = sd.partsupp(spark, sf=0.005)
        supps = {r[0] for r in sd.supplier(spark, sf=0.005).select("s_suppkey").collect()}
        assert {r[0] for r in ps.select("ps_suppkey").collect()} <= supps


class TestNationRegion:
    def test_nation_fixed_25(self, spark):
        assert sd.nation(spark).count() == 25

    def test_region_fixed_5(self, spark):
        assert sd.region(spark).count() == 5

    def test_nation_region_fk(self, spark):
        n = sd.nation(spark).toPandas()
        r = sd.region(spark).toPandas()
        assert set(n["n_regionkey"]) <= set(r["r_regionkey"])

    def test_nation_names_unique(self, spark):
        n = sd.nation(spark).toPandas()
        assert n["n_name"].is_unique
