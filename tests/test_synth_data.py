"""Sanity tests for the provided TPC-H-lite generators (kept exercised
even though the MIPS reproduction's primary data is MF models)."""
import pytest

from repro import synth_data


def test_lineitem_columns(spark):
    df = synth_data.lineitem(spark, sf=0.001)
    cols = set(df.columns)
    assert {"l_orderkey", "l_partkey", "l_quantity", "l_shipdate"} <= cols
    assert df.count() == 6000


def test_orders_keys_unique(spark):
    df = synth_data.orders(spark, sf=0.001)
    assert df.count() == df.select("o_orderkey").distinct().count()


def test_customer_count(spark):
    df = synth_data.customer(spark, sf=0.01)
    assert df.count() == 1500


def test_part_count(spark):
    df = synth_data.part(spark, sf=0.001)
    assert df.count() == 200


def test_zipf_keys_skew(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5)
    top = df.groupBy("k").count().orderBy("count", ascending=False).first()
    # Zipf: the hottest key should dominate a uniform share.
    assert top["count"] > 5000 / 100 * 3


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50)
    row = df.selectExpr("min(k) as lo", "max(k) as hi").first()
    assert row["lo"] >= 1 and row["hi"] <= 50


def test_deterministic_in_seed(spark):
    a = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
    assert a.equals(b)
