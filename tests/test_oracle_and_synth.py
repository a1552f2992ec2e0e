"""Oracle sanity checks plus tests of the extended synth_data entry points.

Demonstrates the DuckDB oracle on the provided TPC-H-lite generators and
validates the GraLMatch-schema wrappers added to ``repro.synth_data``.
"""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracleOnTpchLite:
    def test_lineitem_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        from pyspark.sql import functions as F
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
        assert_equivalent(
            got,
            """SELECT l_returnflag, SUM(l_quantity) AS sum_qty,
                      COUNT(*) AS cnt
               FROM li GROUP BY l_returnflag""",
            li=li,
        )

    def test_orders_join(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        from pyspark.sql import functions as F
        got = (li.join(o, li.l_orderkey == o.o_orderkey)
               .groupBy("o_orderpriority")
               .agg(F.count("*").alias("cnt")))
        assert_equivalent(
            got,
            """SELECT o_orderpriority, COUNT(*) AS cnt
               FROM li JOIN o ON l_orderkey = o_orderkey
               GROUP BY o_orderpriority""",
            li=li, o=o,
        )


class TestSynthDataWrappers:
    def test_company_records(self, spark):
        df = synth_data.company_records(spark, n_groups=50)
        assert df.count() > 50
        assert "gt_group" in df.columns

    def test_security_records(self, spark):
        df = synth_data.security_records(spark, n_groups=50)
        assert {"isin", "cusip", "valor", "sedol"} <= set(df.columns)

    def test_real_preset(self, spark):
        df = synth_data.company_records(spark, n_groups=50, preset="real")
        assert df.select("source_id").distinct().count() == 8

    def test_product_records(self, spark):
        df = synth_data.product_records(spark, n_records=100)
        assert df.count() == 100

    def test_company_security_consistency(self, spark):
        c = synth_data.company_records(spark, n_groups=40, seed=9)
        s = synth_data.security_records(spark, n_groups=40, seed=9)
        c_ids = {r["record_id"] for r in c.select("record_id").collect()}
        s_refs = {r["company_record_id"]
                  for r in s.select("company_record_id").collect()}
        assert s_refs <= c_ids
