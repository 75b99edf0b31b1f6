"""The DuckDB oracle itself must catch wrong results — a correctness
checker that cannot fail is worthless."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.oracle import assert_equivalent


def test_oracle_accepts_correct_result(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    got = spark.createDataFrame(pdf).groupBy("k").sum("v").toDF("k", "s")
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    wrong = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [9.0, 2.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    got = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k FROM t", t=pdf)


def test_oracle_accepts_spark_inputs(spark):
    pts = sd.points_pdf(sd.uniform_fill(50, 2, seed=1))
    sdf = spark.createDataFrame(pts)
    got = sdf.selectExpr("count(*) AS n")
    assert_equivalent(got, "SELECT count(*) AS n FROM p", p=sdf)


def test_oracle_row_order_insensitive(spark):
    pdf = pd.DataFrame({"a": [3, 1, 2]})
    got = spark.createDataFrame(pd.DataFrame({"a": [2, 3, 1]}))
    assert_equivalent(got, "SELECT a FROM t", t=pdf)
