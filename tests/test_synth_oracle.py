"""Provided substrate: TPC-H-lite generators + the DuckDB oracle itself."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_scale(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    assert li.count() == 6000


def test_orders_keys_dense(spark):
    o = synth_data.orders(spark, sf=0.001)
    pdf = o.toPandas()
    assert pdf["o_orderkey"].is_unique
    assert pdf["o_orderkey"].min() == 1


def test_oracle_join_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    sql = """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
    """
    assert_equivalent(got, sql, li=li, o=o)


def test_oracle_catches_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
    sql = "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag"
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, sql, li=li)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] == 1  # rank-1 key dominates under zipf


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50)
    mm = df.agg(F.min("k").alias("lo"), F.max("k").alias("hi")).first()
    assert mm["lo"] >= 1 and mm["hi"] <= 50
