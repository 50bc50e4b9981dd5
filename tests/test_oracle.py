"""Tests for the DuckDB oracle itself (repro.oracle) — the checker must
actually catch wrong results, or every oracle test in this suite is vacuous."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from tests.helpers import linear_pdf


def test_oracle_accepts_matching_aggregate(spark):
    pdf = linear_pdf(n=200, seed=0)
    got = spark.createDataFrame(pdf).groupBy().avg("a").withColumnRenamed("avg(a)", "m")
    assert_equivalent(got, "SELECT avg(a) AS m FROM d", d=pdf)


def test_oracle_rejects_wrong_values(spark):
    pdf = linear_pdf(n=50, seed=1)
    wrong = spark.createDataFrame(pd.DataFrame({"m": [999.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT avg(a) AS m FROM d", d=pdf)


def test_oracle_rejects_column_mismatch(spark):
    pdf = linear_pdf(n=50, seed=2)
    got = spark.createDataFrame(pd.DataFrame({"wrong_name": [1.0]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT avg(a) AS m FROM d", d=pdf)


def test_oracle_order_insensitive(spark):
    pdf = pd.DataFrame({"k": [3, 1, 2], "v": [30.0, 10.0, 20.0]})
    got = spark.createDataFrame(pdf.sort_values("v", ascending=False))
    assert_equivalent(got, "SELECT k, v FROM d", d=pdf)


def test_oracle_accepts_spark_frames_as_inputs(spark):
    pdf = linear_pdf(n=100, seed=3)
    sdf = spark.createDataFrame(pdf)
    got = sdf.groupBy().count().withColumnRenamed("count", "n")
    assert_equivalent(got, "SELECT count(*) AS n FROM d", d=sdf)


def test_oracle_rounds_float_noise(spark):
    pdf = pd.DataFrame({"x": [0.1 + 0.2]})  # 0.30000000000000004
    got = spark.createDataFrame(pd.DataFrame({"x": [0.3]}))
    assert_equivalent(got, "SELECT x FROM d", d=pdf)
