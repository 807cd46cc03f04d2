"""Tests for the provided TPC-H-lite generators (kept functional even
though this paper's workloads are graphs — see repro.datasets)."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_shape(li):
    assert li.count() == 6000
    assert "l_orderkey" in li.columns and "l_shipdate" in li.columns


def test_lineitem_deterministic(spark, li):
    again = synth_data.lineitem(spark, sf=0.001, seed=0)
    assert li.exceptAll(again).count() == 0


def test_orders_keys_dense(spark):
    o = synth_data.orders(spark, sf=0.001)
    pdf = o.toPandas()
    assert list(pdf.o_orderkey) == list(range(1, len(pdf) + 1))


def test_zipf_keys_skewed(spark):
    z = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=1).toPandas()
    counts = z.k.value_counts()
    assert counts.iloc[0] > 3 * counts.mean()


def test_uniform_keys_range(spark):
    u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert u.k.between(1, 50).all()


def test_oracle_roundtrip_aggregation(spark, li):
    """Exercise the provided DuckDB oracle on a TPC-H-style aggregation."""
    from pyspark.sql import functions as F

    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("n"),
        F.round(F.sum("l_quantity"), 4).alias("sum_qty"),
    )
    sql = """
        SELECT l_returnflag, COUNT(*) AS n,
               ROUND(SUM(l_quantity), 4) AS sum_qty
        FROM li GROUP BY l_returnflag
    """
    assert_equivalent(got, sql, li=li)
