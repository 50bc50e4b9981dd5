"""Tests for ExTuNe responsibility attribution (repro.explain.extune)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.discovery import discover, discover_simple
from repro.datasets.led import LED_COLS, led_window_pdf
from repro.explain.extune import responsibilities
from tests.helpers import linear_pdf, piecewise_pdf


def test_conforming_tuples_get_zero_responsibility(spark):
    pdf = linear_pdf(n=600, seed=0)
    df = spark.createDataFrame(pdf)
    c = discover_simple(df)
    r = responsibilities(df.limit(100), c, ["a", "b", "c"])
    assert list(r.index) == ["a", "b", "c"]
    assert (r < 0.05).all()  # training data conforms -> ~no responsibility


def test_single_corrupted_attribute_blamed(spark):
    """Tuples at typical a, b but corrupted c: fixing c alone restores
    conformance (K=0, responsibility 1), while fixing a or b first still
    needs c fixed afterwards (K>=1) — so c gets the highest responsibility."""
    train = linear_pdf(n=800, noise=0.05, seed=1)
    c = discover_simple(spark.createDataFrame(train))
    mu = train.mean()
    test = pd.DataFrame(
        {"a": [mu["a"]] * 50, "b": [mu["b"]] * 50, "c": [mu["c"] + 30.0] * 50}
    )
    r = responsibilities(spark.createDataFrame(test), c, ["a", "b", "c"])
    assert r.idxmax() == "c"
    assert r["c"] == pytest.approx(1.0, abs=1e-6)
    assert r["a"] <= 0.5 + 1e-6 and r["b"] <= 0.5 + 1e-6


def test_coupled_relation_spreads_responsibility(spark):
    """When a, b, c all sit away from their means inside the tight relation
    c = a + b, no single fix suffices: the method necessarily spreads the
    blame (~1/3 each) — the 'holistic' Figure 10(c) behavior."""
    train = linear_pdf(n=800, noise=0.05, seed=1)
    c = discover_simple(spark.createDataFrame(train))
    test = linear_pdf(n=50, noise=0.05, seed=2)
    test["c"] = test["c"] + 30.0
    r = responsibilities(spark.createDataFrame(test), c, ["a", "b", "c"])
    assert (r > 0.2).all()
    assert r.max() - r.min() < 0.25


def test_responsibility_range(spark):
    train = linear_pdf(n=500, seed=3)
    c = discover_simple(spark.createDataFrame(train))
    test = linear_pdf(n=50, seed=4) * 3.0
    r = responsibilities(spark.createDataFrame(test), c, ["a", "b", "c"])
    assert ((r >= 0) & (r <= 1)).all()


def test_fixing_one_attr_suffices_gives_full_responsibility(spark):
    """If the violation is caused by one attribute alone, K=0 after fixing it
    and its per-tuple responsibility is 1."""
    train = linear_pdf(n=800, noise=0.05, seed=5)
    c = discover_simple(spark.createDataFrame(train))
    mu = train.mean()
    one = pd.DataFrame({"a": [mu["a"]], "b": [mu["b"]], "c": [mu["c"] + 50.0]})
    r = responsibilities(spark.createDataFrame(one), c, ["a", "b", "c"])
    assert r["c"] == pytest.approx(1.0)


def test_compound_constraint_uses_branch_means(spark):
    """Piecewise data: an off-trend tuple in partition g0 is fixed by moving
    y to g0's conditional trend; responsibilities must be computed against
    the branch (not global) means and blame y."""
    pdf = piecewise_pdf(n_per=300, noise=0.05, seed=7)
    df = spark.createDataFrame(pdf)
    c = discover(df)
    bad = pd.DataFrame({"grp": ["g0"] * 20, "x": [5.0] * 20, "y": [2.0] * 20})
    r = responsibilities(spark.createDataFrame(bad), c, ["x", "y"])
    assert r.sum() > 0.2
    assert set(r.index) == {"x", "y"}


def test_unseen_branch_value_capped_not_crashing(spark):
    pdf = piecewise_pdf(n_per=200, seed=8)
    df = spark.createDataFrame(pdf)
    c = discover(df, include_global=False)
    alien = pd.DataFrame({"grp": ["never-seen"] * 5, "x": [1.0] * 5, "y": [1.0] * 5})
    r = responsibilities(spark.createDataFrame(alien), c, ["x", "y"], max_steps=4)
    # no numerical intervention can fix an unseen switch value: capped resp
    assert np.allclose(r.to_numpy(), 1.0 / 5.0)


def test_led_malfunction_blamed(spark):
    """Figure 10(d) mechanics: constraints from window 0 (partitioned on
    digit); in a window where LEDs 4 and 5 malfunction, those two attributes
    take the highest responsibility."""
    train = led_window_pdf(0, n=3000, seed=0)
    c = discover(
        spark.createDataFrame(train),
        cols=LED_COLS,
        partition_attrs=["digit"],
        include_global=False,
    )
    broken = led_window_pdf(5, n=300, seed=0)  # phase {4, 5}
    r = responsibilities(spark.createDataFrame(broken), c, LED_COLS)
    top2 = set(r.sort_values(ascending=False).index[:2])
    assert top2 == {"led_4", "led_5"}


def test_led_clean_window_low_responsibility(spark):
    train = led_window_pdf(0, n=3000, seed=0)
    c = discover(
        spark.createDataFrame(train),
        cols=LED_COLS,
        partition_attrs=["digit"],
        include_global=False,
    )
    clean = led_window_pdf(1, n=300, seed=0)  # same phase as training
    r = responsibilities(spark.createDataFrame(clean), c, LED_COLS)
    assert r.max() < 0.35


def test_distributed_matches_single_partition(spark):
    train = linear_pdf(n=500, noise=0.05, seed=9)
    c = discover_simple(spark.createDataFrame(train))
    test = linear_pdf(n=80, noise=0.05, seed=10)
    test["c"] = test["c"] + 25.0
    sdf = spark.createDataFrame(test)
    r1 = responsibilities(sdf.repartition(8), c, ["a", "b", "c"])
    r2 = responsibilities(sdf.coalesce(1), c, ["a", "b", "c"])
    pd.testing.assert_series_equal(r1, r2)
