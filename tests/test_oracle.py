"""Self-checks of the DuckDB oracle harness."""

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def kv(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2, 3, 3, 3], "v": [1.0, 2.0, 3.0, 4.0, 5.0, 6.0]})
    return pdf, spark.createDataFrame(pdf)


def test_oracle_accepts_correct_result(kv):
    pdf, sdf = kv
    got = sdf.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_catches_wrong_result(kv):
    pdf, sdf = kv
    wrong = sdf.groupBy("k").agg((F.sum("v") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_catches_missing_rows(kv):
    pdf, sdf = kv
    truncated = sdf.where("k <> 2").groupBy("k").agg(F.sum("v").alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(truncated, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_catches_column_mismatch(kv):
    pdf, sdf = kv
    misnamed = sdf.groupBy("k").agg(F.sum("v").alias("total"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(misnamed, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_ignores_row_and_column_order(kv):
    pdf, sdf = kv
    got = sdf.groupBy("k").agg(F.sum("v").alias("s")).select("s", "k").orderBy(F.desc("k"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k ORDER BY k", t=pdf)


def test_oracle_accepts_spark_input_tables(kv):
    pdf, sdf = kv
    got = sdf.groupBy("k").agg(F.count("*").alias("c"))
    assert_equivalent(got, "SELECT k, count(*) AS c FROM t GROUP BY k", t=sdf)
