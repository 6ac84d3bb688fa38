"""Oracle self-tests: it must catch wrong results, not just run them."""
from __future__ import annotations

import pandas as pd
import pytest

from repro import oracle


def test_detects_wrong_rows(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": [1, 2, 3]}))
    with pytest.raises(AssertionError):
        oracle.assert_equivalent(
            df, "SELECT a AS a FROM t WHERE a < 3", t=pd.DataFrame({"a": [1, 2, 3]})
        )


def test_detects_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        oracle.assert_equivalent(
            df, "SELECT a AS a FROM t", t=pd.DataFrame({"a": [1]})
        )


def test_accepts_row_and_column_order_differences(spark):
    df = spark.createDataFrame(pd.DataFrame({"b": [2, 1], "a": [20, 10]}))
    oracle.assert_equivalent(
        df,
        "SELECT a AS a, b AS b FROM t",
        t=pd.DataFrame({"a": [10, 20], "b": [1, 2]}),
    )


def test_date_dtype_normalisation(spark):
    pdf = pd.DataFrame({"d": pd.to_datetime(["2020-01-01", "2021-06-30"])})
    df = spark.createDataFrame(pdf)  # Spark timestamps → datetime64 back
    oracle.assert_equivalent(df, "SELECT d AS d FROM t", t=pdf)


def test_float_rounding_tolerance(spark):
    df = spark.createDataFrame(pd.DataFrame({"x": [0.1 + 0.2]}))
    oracle.assert_equivalent(
        df, "SELECT x AS x FROM t", t=pd.DataFrame({"x": [0.3000000001]})
    )


def test_accepts_spark_inputs_as_tables(spark):
    sdf = spark.createDataFrame(pd.DataFrame({"a": [1, 2]}))
    oracle.assert_equivalent(
        sdf.where("a = 1"), "SELECT a AS a FROM t WHERE a = 1", t=sdf
    )
