"""Tests for the closed-form OLS substrate (repro.ml.linreg)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.ml.linreg import absolute_error_col, fit_ols, mae, predict_col, with_prediction
from repro.oracle import assert_equivalent
from tests.helpers import linear_pdf


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_ols_matches_numpy_lstsq(spark, seed):
    pdf = linear_pdf(n=500, noise=0.5, seed=seed)
    model = fit_ols(spark.createDataFrame(pdf), ["a", "b"], "c", ridge=0.0)
    x = np.hstack([np.ones((len(pdf), 1)), pdf[["a", "b"]].to_numpy()])
    beta, *_ = np.linalg.lstsq(x, pdf["c"].to_numpy(), rcond=None)
    assert model.intercept == pytest.approx(beta[0], abs=1e-6)
    np.testing.assert_allclose(model.coefs, beta[1:], atol=1e-8)


def test_ols_recovers_planted_coefficients(spark):
    pdf = linear_pdf(n=4000, noise=0.01, seed=3, slope=(2.5, -0.5))
    model = fit_ols(spark.createDataFrame(pdf), ["a", "b"], "c")
    np.testing.assert_allclose(model.coefs, [2.5, -0.5], atol=0.01)
    assert model.intercept == pytest.approx(0.0, abs=0.05)


def test_prediction_expression_matches_numpy(spark):
    pdf = linear_pdf(n=200, seed=4)
    df = spark.createDataFrame(pdf)
    model = fit_ols(df, ["a", "b"], "c")
    got = with_prediction(df, model).toPandas()
    ref = model.predict_numpy(got[["a", "b"]].to_numpy())
    np.testing.assert_allclose(got["prediction"], ref, rtol=1e-9)


def test_mae_against_duckdb_oracle(spark):
    pdf = linear_pdf(n=300, noise=1.0, seed=5)
    df = spark.createDataFrame(pdf)
    model = fit_ols(df, ["a", "b"], "c")
    got_mae = mae(df, model, "c")
    got = spark.createDataFrame(pd.DataFrame({"mae": [got_mae]}))
    coef_sql = " + ".join(
        [repr(model.intercept)]
        + [f"({c} * {w!r})" for c, w in zip(model.feature_cols, model.coefs)]
    )
    assert_equivalent(
        got,
        f"SELECT avg(abs(c - ({coef_sql}))) AS mae FROM d",
        d=pdf,
    )


def test_ridge_handles_collinear_features(spark):
    pdf = linear_pdf(n=300, seed=6)
    pdf["a2"] = pdf["a"]  # exact duplicate column
    model = fit_ols(spark.createDataFrame(pdf), ["a", "a2", "b"], "c")
    assert np.isfinite(model.coefs).all()
    # predictions still accurate despite collinearity
    x = pdf[["a", "a2", "b"]].to_numpy()
    err = np.abs(model.predict_numpy(x) - pdf["c"].to_numpy())
    assert err.mean() < 0.2


def test_absolute_error_col(spark):
    pdf = linear_pdf(n=100, seed=7)
    df = spark.createDataFrame(pdf)
    model = fit_ols(df, ["a", "b"], "c")
    got = df.select(absolute_error_col(model, "c").alias("e")).toPandas()["e"]
    assert (got >= 0).all()
    assert got.mean() == pytest.approx(mae(df, model, "c"), rel=1e-9)
