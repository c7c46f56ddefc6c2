"""The oracle itself: it must FAIL on wrong results, and the rtol
extension must keep key columns exact."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    return spark.createDataFrame(pdf), pdf


def test_oracle_accepts_correct(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_value(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.groupBy("k").agg((F.sum("v") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_columns(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.groupBy("k").agg(F.sum("v").alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rtol_accepts_tiny_fp_noise(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.groupBy("k").agg((F.sum("v") * (1 + 1e-12)).alias("s"))
    assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", rtol=1e-9, t=pdf)


def test_oracle_rtol_rejects_real_error(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.groupBy("k").agg((F.sum("v") * 1.01).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", rtol=1e-9, t=pdf)


def test_oracle_rtol_rejects_wrong_keys(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.withColumn("k", F.col("k") + 10).groupBy("k").agg(F.sum("v").alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", rtol=1e-9, t=pdf)


def test_oracle_rtol_rejects_row_count(tiny):
    sdf, pdf = tiny
    from pyspark.sql import functions as F

    res = sdf.filter("k = 1").groupBy("k").agg(F.sum("v").alias("s"))
    with pytest.raises(AssertionError, match="row count"):
        assert_equivalent(res, "SELECT k, SUM(v) AS s FROM t GROUP BY k", rtol=1e-9, t=pdf)
