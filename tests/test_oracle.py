"""The DuckDB oracle itself: it must catch wrong results, not just run."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture()
def pdf():
    rng = np.random.default_rng(3)
    return pd.DataFrame({"k": rng.integers(0, 5, 100), "v": rng.random(100)})


def test_accepts_matching_result(spark, pdf):
    df = spark.createDataFrame(pdf)
    from pyspark.sql import functions as F

    res = df.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_rejects_wrong_values(spark, pdf):
    from pyspark.sql import functions as F

    df = spark.createDataFrame(pdf)
    res = df.groupBy("k").agg((F.sum("v") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_rejects_column_name_mismatch(spark, pdf):
    from pyspark.sql import functions as F

    df = spark.createDataFrame(pdf)
    res = df.groupBy("k").agg(F.sum("v").alias("total"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_accepts_spark_dataframe_inputs(spark, pdf):
    from pyspark.sql import functions as F

    df = spark.createDataFrame(pdf)
    res = df.agg(F.count(F.lit(1)).alias("n"))
    assert_equivalent(res, "SELECT COUNT(*) AS n FROM t", t=df)


def test_row_order_irrelevant(spark, pdf):
    from pyspark.sql import functions as F

    df = spark.createDataFrame(pdf)
    res = df.groupBy("k").agg(F.sum("v").alias("s")).orderBy(F.desc("k"))
    assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k ORDER BY k", t=pdf)
