"""Tests for constraint synthesis (repro.core.discovery)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import CompoundConstraint, DisjunctiveConstraint, SimpleConstraint
from repro.core.discovery import (
    DEFAULT_C,
    discover,
    discover_disjunctive,
    discover_simple,
    eligible_partition_attrs,
    equality_projection_weights,
)
from repro.core.scoring import average_violation, violation_numpy
from tests.helpers import linear_pdf, piecewise_pdf


def test_simple_constraint_shape(spark):
    df = spark.createDataFrame(linear_pdf(n=400, seed=0))
    c = discover_simple(df)
    assert isinstance(c, SimpleConstraint)
    assert c.n == 400
    assert c.cols == ("a", "b", "c")
    assert sum(b.gamma for b in c.conjuncts) == pytest.approx(1.0)
    for b in c.conjuncts:
        assert b.lb == pytest.approx(b.mean - DEFAULT_C * b.std)
        assert b.ub == pytest.approx(b.mean + DEFAULT_C * b.std)


def test_training_data_mostly_conforms(spark):
    """Relaxed-invariant property |D - Inv| << |D|: with C=4, almost every
    training tuple scores 0."""
    pdf = linear_pdf(n=2000, seed=1)
    c = discover_simple(spark.createDataFrame(pdf))
    v = violation_numpy(c, pdf)
    assert (v == 0).mean() > 0.98
    assert v.mean() < 0.01


def test_planted_invariant_detects_violations(spark):
    """Example 1 analogue: c = a + b + eps on train; a corrupted tuple that
    breaks the arithmetic relationship scores high, a conforming one ~0."""
    pdf = linear_pdf(n=1000, noise=0.05, seed=2)
    c = discover_simple(spark.createDataFrame(pdf))
    conforming = pd.DataFrame({"a": [11.0], "b": [1.0], "c": [12.0]})
    broken = pd.DataFrame({"a": [11.0], "b": [1.0], "c": [25.0]})  # c != a+b
    assert violation_numpy(c, conforming)[0] < 0.05
    assert violation_numpy(c, broken)[0] > 0.3


def test_gamma_weights_low_variance_higher(spark):
    c = discover_simple(spark.createDataFrame(linear_pdf(n=500, noise=0.01, seed=3)))
    stds = [b.std for b in c.conjuncts]
    gammas = [b.gamma for b in c.conjuncts]
    assert gammas[int(np.argmin(stds))] == max(gammas)


def test_disjunctive_branches_per_value(spark):
    pdf = piecewise_pdf(n_per=150, seed=4)
    df = spark.createDataFrame(pdf)
    c = discover_disjunctive(df, "grp", ["x", "y"])
    assert isinstance(c, DisjunctiveConstraint)
    assert set(c.branches) == {"g0", "g1", "g2"}
    for branch in c.branches.values():
        assert branch.n == 150


def test_figure2_global_underfits_partitioned_fits(spark):
    """The Figure 2 scenario: piecewise trends make the global simple
    constraint weak (high min sigma), while per-partition constraints are
    tight and catch a within-range but off-trend tuple."""
    pdf = piecewise_pdf(n_per=200, noise=0.05, seed=5)
    df = spark.createDataFrame(pdf)
    simple = discover_simple(df, ["x", "y"])
    disj = discover_disjunctive(df, "grp", ["x", "y"])
    min_global = min(b.std for b in simple.conjuncts)
    min_local = max(min(b.std for b in br.conjuncts) for br in disj.branches.values())
    assert min_local < min_global / 10
    # x=5 with g0's trend y should be 10; plant y=2 (plausible globally).
    off_trend = pd.DataFrame({"grp": ["g0"], "x": [5.0], "y": [2.0]})
    assert violation_numpy(simple, off_trend)[0] < 0.1
    assert violation_numpy(disj, off_trend)[0] > 0.5


def test_eligible_partition_attrs(spark):
    pdf = linear_pdf(n=200, seed=6)
    pdf["cat"] = [f"v{i % 5}" for i in range(len(pdf))]
    pdf["id"] = [f"row{i}" for i in range(len(pdf))]  # high cardinality
    pdf["const"] = "only"  # single value
    df = spark.createDataFrame(pdf)
    assert eligible_partition_attrs(df, ["a", "b", "c"]) == ["cat"]


def test_discover_compound_structure(spark):
    pdf = piecewise_pdf(n_per=100, seed=7)
    c = discover(spark.createDataFrame(pdf))
    assert isinstance(c, CompoundConstraint)
    kinds = [type(p) for p in c.parts]
    assert kinds == [SimpleConstraint, DisjunctiveConstraint]
    assert c.parts[1].attr == "grp"


def test_discover_without_global(spark):
    pdf = piecewise_pdf(n_per=100, seed=8)
    c = discover(spark.createDataFrame(pdf), include_global=False)
    assert [type(p) for p in c.parts] == [DisjunctiveConstraint]


def test_discover_no_categorical_falls_back_to_simple(spark):
    df = spark.createDataFrame(linear_pdf(n=150, seed=9))
    c = discover(df, include_global=False)
    assert [type(p) for p in c.parts] == [SimpleConstraint]


def test_discover_explicit_numeric_partition_attr(spark):
    pdf = linear_pdf(n=300, seed=10)
    pdf["digit"] = (np.arange(len(pdf)) % 4).astype("int64")
    df = spark.createDataFrame(pdf)
    c = discover(df, cols=["a", "b", "c"], partition_attrs=["digit"], include_global=False)
    (disj,) = c.parts
    assert set(disj.branches) == {"0", "1", "2", "3"}


def test_min_partition_rows_gives_trivial_branch(spark):
    pdf = piecewise_pdf(n_per=100, seed=11)
    tiny = pd.DataFrame({"grp": ["rare"], "x": [1.0], "y": [1.0]})
    df = spark.createDataFrame(pd.concat([pdf, tiny], ignore_index=True))
    c = discover_disjunctive(df, "grp", ["x", "y"], min_partition_rows=5)
    assert c.branches["rare"].conjuncts == ()
    assert violation_numpy(c.branches["rare"], tiny)[0] == 0.0


def test_average_violation_train_near_zero(spark):
    pdf = piecewise_pdf(n_per=200, seed=12)
    df = spark.createDataFrame(pdf)
    c = discover(df)
    assert average_violation(df, c) < 0.02


def test_equality_projection_weights(spark):
    pdf = pd.DataFrame(
        {"a": [0.0] * 50, "b": np.random.default_rng(13).normal(0, 1, 50)}
    )
    c = discover_simple(spark.createDataFrame(pdf))
    eq = equality_projection_weights(c, tol=1e-9)
    assert len(eq) == 1
    np.testing.assert_allclose(np.abs(eq[0]), [1.0, 0.0], atol=1e-9)


def test_col_means_recorded(spark):
    pdf = linear_pdf(n=200, seed=14)
    c = discover_simple(spark.createDataFrame(pdf))
    np.testing.assert_allclose(
        c.col_means, pdf[["a", "b", "c"]].mean().to_numpy(), rtol=1e-9
    )
