"""Tests for the provided synth_data module and its IM extension."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_im_graph_canonical(spark):
    df = synth_data.im_graph(spark, "ROAD-A")
    assert df.columns == ["u", "v"]
    bad = df.where(F.col("u") >= F.col("v")).count()
    assert bad == 0
    assert df.count() == 23980


def test_im_graph_deterministic(spark):
    a = synth_data.im_graph(spark, "KNN-A").toPandas()
    b = synth_data.im_graph(spark, "KNN-A").toPandas()
    assert a.equals(b)


def test_tpch_lite_oracle_smoke(spark):
    """The provided TPC-H-lite generator + oracle wiring stays healthy."""
    li = synth_data.lineitem(spark, sf=0.001)
    agg = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count("*").alias("cnt"),
    )
    assert_equivalent(
        agg,
        """
        SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )
