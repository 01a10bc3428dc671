"""Sanity tests of the provided DuckDB oracle (it must actually catch
wrong results, not just run)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


def test_passes_on_correct_aggregation(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "x": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("x").alias("s"))
    assert_equivalent(df, "SELECT k, SUM(x) AS s FROM t GROUP BY k", t=pdf)


def test_fails_on_wrong_values(spark):
    pdf = pd.DataFrame({"k": [1, 2], "x": [1.0, 2.0]})
    df = spark.createDataFrame(pdf).select("k", (F.col("x") + 1).alias("x"))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, x FROM t", t=pdf)


def test_fails_on_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pdf).select(F.col("k").alias("wrong"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_accepts_spark_table_inputs(spark):
    pdf = pd.DataFrame({"k": [3, 3, 4]})
    sdf = spark.createDataFrame(pdf)
    out = sdf.groupBy("k").agg(F.count("*").cast("long").alias("c"))
    assert_equivalent(
        out, "SELECT k, CAST(COUNT(*) AS BIGINT) AS c FROM t GROUP BY k", t=sdf
    )


def test_row_order_irrelevant(spark):
    pdf = pd.DataFrame({"k": [5, 1, 3]})
    df = spark.createDataFrame(pdf).orderBy(F.desc("k"))
    assert_equivalent(df, "SELECT k FROM t ORDER BY k", t=pdf)
