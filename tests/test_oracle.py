"""Smoke tests for the DuckDB oracle itself (provided infrastructure)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem


def test_oracle_passes_on_equal_aggregate(spark):
    li = lineitem(spark, sf=0.001)
    got = li.agg(F.count(F.lit(1)).alias("n"))
    assert_equivalent(got, "SELECT count(*) AS n FROM li", li=li)


def test_oracle_catches_wrong_result(spark):
    li = lineitem(spark, sf=0.001)
    wrong = li.limit(5).agg(F.count(F.lit(1)).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT count(*) AS n FROM li", li=li)


def test_oracle_catches_column_mismatch(spark):
    li = lineitem(spark, sf=0.001)
    got = li.agg(F.count(F.lit(1)).alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT count(*) AS n FROM li", li=li)


def test_oracle_accepts_pandas_tables(spark):
    pdf = pd.DataFrame({"x": [1, 2, 3]})
    got = spark.createDataFrame(pdf).agg(F.sum("x").alias("s"))
    assert_equivalent(got, "SELECT sum(x) AS s FROM t", t=pdf)
