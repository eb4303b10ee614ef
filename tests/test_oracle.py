"""The provided DuckDB oracle itself: it must catch wrong results."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def small(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2, 3], "v": [10.0, 20.0, 30.0, 40.0]})
    return spark.createDataFrame(pdf), pdf


def test_accepts_equivalent(spark, small):
    df, pdf = small
    from pyspark.sql import functions as F

    got = df.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_rejects_wrong_rows(spark, small):
    df, pdf = small
    from pyspark.sql import functions as F

    wrong = df.groupBy("k").agg((F.sum("v") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_rejects_column_mismatch(spark, small):
    df, pdf = small
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k AS key, v FROM t", t=pdf)


def test_order_insensitive(spark, small):
    df, pdf = small
    assert_equivalent(
        df.orderBy("v", ascending=False), "SELECT k, v FROM t", t=pdf
    )


def test_accepts_spark_frames_as_tables(spark, small):
    df, _ = small
    assert_equivalent(df, "SELECT k, v FROM t", t=df)
