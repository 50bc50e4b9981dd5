"""Tests for the distributed Gram substrate (repro.core.gram)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.gram import (
    augmented_gram,
    grouped_augmented_gram,
    numeric_columns,
)
from repro.oracle import assert_equivalent
from tests.helpers import linear_pdf, numpy_aug_gram, piecewise_pdf


@pytest.mark.parametrize("n,seed", [(1, 0), (7, 1), (200, 2), (1000, 3)])
def test_gram_matches_numpy(spark, n, seed):
    pdf = linear_pdf(n=n, seed=seed)
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df, ["a", "b", "c"])
    n_ref, g_ref = numpy_aug_gram(pdf, ["a", "b", "c"])
    assert res.n == n_ref
    np.testing.assert_allclose(res.g, g_ref, rtol=1e-9, atol=1e-6)


@pytest.mark.parametrize("parts", [1, 3, 16])
def test_gram_partition_invariant(spark, parts):
    pdf = linear_pdf(n=400, seed=4)
    df = spark.createDataFrame(pdf).repartition(parts)
    res = augmented_gram(df, ["a", "b", "c"])
    _, g_ref = numpy_aug_gram(pdf, ["a", "b", "c"])
    np.testing.assert_allclose(res.g, g_ref, rtol=1e-9, atol=1e-6)


def test_gram_default_columns(spark):
    pdf = linear_pdf(n=50)
    pdf["label"] = "x"
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df)
    assert res.cols == ("a", "b", "c")


def test_gram_is_symmetric_psd(spark):
    df = spark.createDataFrame(linear_pdf(n=300, seed=5))
    res = augmented_gram(df, ["a", "b", "c"])
    np.testing.assert_allclose(res.g, res.g.T)
    eigvals = np.linalg.eigvalsh(res.g)
    assert eigvals.min() >= -1e-6


def test_gram_drops_nan_rows(spark):
    pdf = linear_pdf(n=100, seed=6)
    pdf.loc[::10, "b"] = np.nan
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df, ["a", "b", "c"])
    clean = pdf.dropna()
    n_ref, g_ref = numpy_aug_gram(clean, ["a", "b", "c"])
    assert res.n == n_ref
    np.testing.assert_allclose(res.g, g_ref, rtol=1e-9, atol=1e-6)


def test_gram_requires_columns(spark):
    df = spark.createDataFrame(pd.DataFrame({"s": ["a", "b"]}))
    with pytest.raises(ValueError):
        augmented_gram(df)


def test_gram_entries_against_duckdb_oracle(spark):
    """The Gram entries are plain SQL aggregates — check them with DuckDB."""
    pdf = linear_pdf(n=250, seed=8)
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df, ["a", "b"])
    got = spark.createDataFrame(
        pd.DataFrame(
            {
                "n": [float(res.n)],
                "sum_a": [res.g[0, 1]],
                "sum_b": [res.g[0, 2]],
                "sum_aa": [res.g[1, 1]],
                "sum_ab": [res.g[1, 2]],
                "sum_bb": [res.g[2, 2]],
            }
        )
    )
    assert_equivalent(
        got,
        """
        SELECT CAST(count(*) AS DOUBLE) AS n,
               sum(a) AS sum_a, sum(b) AS sum_b,
               sum(a*a) AS sum_aa, sum(a*b) AS sum_ab, sum(b*b) AS sum_bb
        FROM d
        """,
        d=pdf,
    )


def test_projection_moments_match_direct(spark):
    pdf = linear_pdf(n=500, seed=9)
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df, ["a", "b", "c"])
    g = np.random.default_rng(10)
    for _ in range(10):
        w = g.normal(size=3)
        mean, std = res.projection_moments(w)
        f = pdf[["a", "b", "c"]].to_numpy() @ w
        assert mean == pytest.approx(f.mean(), rel=1e-9)
        assert std == pytest.approx(f.std(), rel=1e-6, abs=1e-9)


def test_column_means(spark):
    pdf = linear_pdf(n=123, seed=11)
    df = spark.createDataFrame(pdf)
    res = augmented_gram(df, ["a", "b", "c"])
    np.testing.assert_allclose(
        res.column_means(), pdf[["a", "b", "c"]].mean().to_numpy(), rtol=1e-9
    )


def test_grouped_gram_matches_per_group_numpy(spark):
    pdf = piecewise_pdf(n_per=120, seed=12)
    df = spark.createDataFrame(pdf).repartition(8)
    grouped = grouped_augmented_gram(df, "grp", ["x", "y"])
    assert set(grouped) == {"g0", "g1", "g2"}
    for v, res in grouped.items():
        sub = pdf[pdf.grp == v]
        n_ref, g_ref = numpy_aug_gram(sub, ["x", "y"])
        assert res.n == n_ref
        np.testing.assert_allclose(res.g, g_ref, rtol=1e-9, atol=1e-6)


def test_grouped_gram_sums_to_global(spark):
    pdf = piecewise_pdf(n_per=80, seed=13)
    df = spark.createDataFrame(pdf)
    grouped = grouped_augmented_gram(df, "grp", ["x", "y"])
    total = sum(r.g for r in grouped.values())
    res = augmented_gram(df, ["x", "y"])
    np.testing.assert_allclose(total, res.g, rtol=1e-9, atol=1e-6)
    assert sum(r.n for r in grouped.values()) == res.n


def test_grouped_gram_counts_against_duckdb_oracle(spark):
    pdf = piecewise_pdf(n_per=60, seed=14)
    df = spark.createDataFrame(pdf)
    grouped = grouped_augmented_gram(df, "grp", ["x", "y"])
    got = spark.createDataFrame(
        pd.DataFrame(
            {"grp": sorted(grouped), "cnt": [grouped[v].n for v in sorted(grouped)]}
        )
    )
    assert_equivalent(
        got,
        "SELECT grp, CAST(count(*) AS BIGINT) AS cnt FROM d GROUP BY grp",
        d=pdf,
    )


def test_grouped_gram_integer_attr_keys(spark):
    pdf = linear_pdf(n=90, seed=15)
    pdf["k"] = (np.arange(len(pdf)) % 3).astype("int64")
    df = spark.createDataFrame(pdf)
    grouped = grouped_augmented_gram(df, "k", ["a", "b"])
    assert set(grouped) == {"0", "1", "2"}
    assert sum(r.n for r in grouped.values()) == len(pdf)


def test_numeric_columns_type_filter(spark):
    pdf = pd.DataFrame(
        {
            "i": np.array([1, 2], dtype="int32"),
            "l": np.array([1, 2], dtype="int64"),
            "f": np.array([1.0, 2.0], dtype="float32"),
            "d": np.array([1.0, 2.0], dtype="float64"),
            "s": ["a", "b"],
            "t": pd.to_datetime(["2020-01-01", "2020-01-02"]),
        }
    )
    df = spark.createDataFrame(pdf)
    assert numeric_columns(df) == ["i", "l", "f", "d"]
