"""Tests for the quantitative semantics (repro.core.scoring).

Three evaluators (Catalyst, SQL mirror, numpy reference) must agree, and the
semantics must satisfy the properties of Section 3.2 and Lemma 1.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import (
    BoundedProjection,
    CompoundConstraint,
    DisjunctiveConstraint,
    SimpleConstraint,
)
from repro.core.scoring import (
    average_violation,
    score,
    violation_numpy,
    violation_sql,
)
from repro.oracle import assert_equivalent
from tests.helpers import linear_pdf


def _atom(mean=0.0, std=1.0, gamma=1.0, weights=(1.0, 0.0), C=4.0):
    return BoundedProjection(
        cols=("a", "b"),
        weights=weights,
        mean=mean,
        std=std,
        lb=mean - C * std,
        ub=mean + C * std,
        gamma=gamma,
    )


def _random_simple(seed: int) -> SimpleConstraint:
    g = np.random.default_rng(seed)
    atoms = []
    raw = g.random(3) + 0.1
    raw = raw / raw.sum()
    for k in range(3):
        w = g.normal(size=2)
        w = w / np.linalg.norm(w)
        atoms.append(
            _atom(
                mean=float(g.normal()),
                std=float(abs(g.normal()) + 0.05),
                gamma=float(raw[k]),
                weights=tuple(w),
            )
        )
    return SimpleConstraint(conjuncts=tuple(atoms))


def _pdf(seed: int, n: int = 200) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    return pd.DataFrame({"a": g.normal(0, 5, n), "b": g.normal(0, 5, n)})


# ---------------------------------------------------------------------------
# evaluator agreement
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_catalyst_matches_numpy(spark, seed):
    c = _random_simple(seed)
    pdf = _pdf(seed + 50)
    got = score(spark.createDataFrame(pdf), c).toPandas()
    ref = violation_numpy(c, pdf)
    np.testing.assert_allclose(np.sort(got["violation"]), np.sort(ref), rtol=1e-9, atol=1e-12)


@pytest.mark.parametrize("seed", [0, 1])
def test_catalyst_matches_duckdb_oracle_simple(spark, seed):
    """The SQL mirror of the violation expression, evaluated by DuckDB, must
    equal the Catalyst evaluation — catches any drift between the two."""
    c = _random_simple(seed)
    pdf = _pdf(seed + 80, n=150)
    got = score(spark.createDataFrame(pdf), c).select("a", "b", "violation")
    assert_equivalent(
        got,
        f"SELECT a, b, {violation_sql(c)} AS violation FROM d",
        d=pdf,
    )


def test_catalyst_matches_duckdb_oracle_compound(spark):
    branches = {"u": _random_simple(10), "v": _random_simple(11)}
    c = CompoundConstraint(
        parts=(
            _random_simple(12),
            DisjunctiveConstraint(attr="g", branches=branches),
        )
    )
    pdf = _pdf(90, n=120)
    pdf["g"] = np.where(np.arange(len(pdf)) % 3 == 0, "u", np.where(np.arange(len(pdf)) % 3 == 1, "v", "w"))
    got = score(spark.createDataFrame(pdf), c).select("a", "b", "g", "violation")
    assert_equivalent(
        got,
        f"SELECT a, b, g, {violation_sql(c)} AS violation FROM d",
        d=pdf,
    )


def test_numpy_matches_catalyst_disjunctive_with_int_keys(spark):
    c = DisjunctiveConstraint(attr="k", branches={"0": _random_simple(20), "1": _random_simple(21)})
    pdf = _pdf(91, n=100)
    pdf["k"] = (np.arange(len(pdf)) % 3).astype("int64")  # value 2 unseen
    got = score(spark.createDataFrame(pdf), c).toPandas()
    ref = violation_numpy(c, pdf)
    np.testing.assert_allclose(np.sort(got["violation"]), np.sort(ref), rtol=1e-9)


@pytest.mark.parametrize("seed", [0, 1])
def test_pandas_and_catalyst_engines_agree(spark, seed):
    """The Arrow-vectorized default engine and the pure Catalyst expression
    must produce identical scores (they are independent implementations)."""
    branches = {"u": _random_simple(60 + seed), "v": _random_simple(61 + seed)}
    c = CompoundConstraint(
        parts=(_random_simple(62 + seed), DisjunctiveConstraint(attr="g", branches=branches))
    )
    pdf = _pdf(63 + seed, n=150)
    pdf["g"] = np.where(np.arange(len(pdf)) % 2 == 0, "u", "v")
    df = spark.createDataFrame(pdf)
    a = score(df, c, engine="pandas").toPandas().sort_values(["a", "b"])
    b = score(df, c, engine="catalyst").toPandas().sort_values(["a", "b"])
    np.testing.assert_allclose(a["violation"].to_numpy(), b["violation"].to_numpy(), rtol=1e-9)
    assert average_violation(df, c, engine="pandas") == pytest.approx(
        average_violation(df, c, engine="catalyst"), rel=1e-9
    )


def test_catalyst_engine_against_duckdb_oracle(spark):
    """Catalyst expression evaluation (not the pandas kernel) vs DuckDB."""
    c = _random_simple(70)
    pdf = _pdf(71, n=120)
    got = score(spark.createDataFrame(pdf), c, engine="catalyst").select("a", "b", "violation")
    assert_equivalent(got, f"SELECT a, b, {violation_sql(c)} AS violation FROM d", d=pdf)


def test_score_rejects_unknown_engine(spark):
    c = _random_simple(72)
    df = spark.createDataFrame(_pdf(73, n=5))
    with pytest.raises(ValueError):
        score(df, c, engine="wat")
    with pytest.raises(ValueError):
        average_violation(df, c, engine="wat")


def test_constraint_columns():
    from repro.core.scoring import constraint_columns

    s = _random_simple(80)
    assert constraint_columns(s) == ["a", "b"]
    d = DisjunctiveConstraint(attr="g", branches={"x": s})
    assert constraint_columns(d) == ["g", "a", "b"]
    cc = CompoundConstraint(parts=(s, d))
    assert constraint_columns(cc) == ["a", "b", "g"]


# ---------------------------------------------------------------------------
# semantics properties
# ---------------------------------------------------------------------------


def test_zero_violation_within_bounds():
    c = SimpleConstraint(conjuncts=(_atom(mean=0, std=1),))
    pdf = pd.DataFrame({"a": [0.0, 3.9, -3.9], "b": [0.0, 0.0, 0.0]})
    np.testing.assert_array_equal(violation_numpy(c, pdf), [0.0, 0.0, 0.0])


def test_positive_violation_outside_bounds():
    c = SimpleConstraint(conjuncts=(_atom(mean=0, std=1),))
    pdf = pd.DataFrame({"a": [4.1, -10.0], "b": [0.0, 0.0]})
    v = violation_numpy(c, pdf)
    assert (v > 0).all()
    assert v[1] > v[0]


def test_violation_bounded_in_unit_interval():
    c = _random_simple(30)
    pdf = _pdf(31, n=500) * 100  # extreme tuples
    v = violation_numpy(c, pdf)
    assert (v >= 0).all() and (v <= 1).all()  # float64 saturates eta at 1.0


def test_eta_form():
    """One atom, deviation d beyond ub: score = 1 - exp(-d/sigma)."""
    c = SimpleConstraint(conjuncts=(_atom(mean=0, std=2.0),))
    pdf = pd.DataFrame({"a": [8.0 + 3.0], "b": [0.0]})  # ub = 8, deviation 3
    assert violation_numpy(c, pdf)[0] == pytest.approx(1 - np.exp(-3.0 / 2.0))


def test_lemma1_monotone_in_normalized_deviation():
    """Lemma 1: larger |F - mu|/sigma  ==>  >= violation score."""
    g = np.random.default_rng(40)
    for _ in range(50):
        std1, std2 = abs(g.normal()) + 0.1, abs(g.normal()) + 0.1
        c1 = SimpleConstraint(conjuncts=(_atom(mean=0, std=std1),))
        c2 = SimpleConstraint(conjuncts=(_atom(mean=0, std=std2),))
        z1, z2 = abs(g.normal()) * 8, abs(g.normal()) * 8
        v1 = violation_numpy(c1, pd.DataFrame({"a": [z1 * std1], "b": [0.0]}))[0]
        v2 = violation_numpy(c2, pd.DataFrame({"a": [z2 * std2], "b": [0.0]}))[0]
        if z1 >= z2:
            assert v1 >= v2 - 1e-12
        else:
            assert v2 >= v1 - 1e-12


def test_gamma_weighting():
    a1 = _atom(mean=0, std=1, gamma=0.9)
    a2 = _atom(mean=0, std=1, gamma=0.1, weights=(0.0, 1.0))
    c = SimpleConstraint(conjuncts=(a1, a2))
    pdf = pd.DataFrame({"a": [10.0], "b": [0.0]})  # violates only a1
    v = violation_numpy(c, pdf)[0]
    assert v == pytest.approx(0.9 * (1 - np.exp(-6.0)))


def test_disjunctive_unseen_value_scores_one():
    c = DisjunctiveConstraint(attr="g", branches={"x": SimpleConstraint(conjuncts=())})
    pdf = pd.DataFrame({"a": [0.0, 0.0], "b": [0.0, 0.0], "g": ["x", "zzz"]})
    np.testing.assert_array_equal(violation_numpy(c, pdf), [0.0, 1.0])


def test_empty_branches_disjunctive_scores_one(spark):
    c = DisjunctiveConstraint(attr="g", branches={})
    pdf = pd.DataFrame({"g": ["x"], "a": [0.0], "b": [0.0]})
    assert violation_numpy(c, pdf)[0] == 1.0
    assert score(spark.createDataFrame(pdf), c).first()["violation"] == 1.0


def test_compound_is_mean_of_parts():
    s_ok = SimpleConstraint(conjuncts=(_atom(mean=0, std=1),))
    d_bad = DisjunctiveConstraint(attr="g", branches={})  # always 1
    c = CompoundConstraint(parts=(s_ok, d_bad))
    pdf = pd.DataFrame({"a": [0.0], "b": [0.0], "g": ["x"]})
    assert violation_numpy(c, pdf)[0] == pytest.approx(0.5)


def test_empty_constraints_score_zero():
    pdf = pd.DataFrame({"a": [1.0], "b": [1.0]})
    assert violation_numpy(SimpleConstraint(conjuncts=()), pdf)[0] == 0.0
    assert violation_numpy(CompoundConstraint(parts=()), pdf)[0] == 0.0


def test_average_violation(spark):
    c = SimpleConstraint(conjuncts=(_atom(mean=0, std=1),))
    pdf = pd.DataFrame({"a": [0.0, 0.0, 100.0], "b": [0.0] * 3})
    got = average_violation(spark.createDataFrame(pdf), c)
    ref = violation_numpy(c, pdf).mean()
    assert got == pytest.approx(ref, rel=1e-9)


def test_strict_equality_atom_fires_on_any_deviation():
    eq = BoundedProjection(
        cols=("a", "b"), weights=(1.0, -1.0), mean=0.0, std=0.0, lb=0.0, ub=0.0, gamma=1.0
    )
    c = SimpleConstraint(conjuncts=(eq,))
    pdf = pd.DataFrame({"a": [1.0, 1.0], "b": [1.0, 1.0001]})
    v = violation_numpy(c, pdf)
    assert v[0] == 0.0
    assert v[1] > 0.99  # alpha = 1e9 makes even 1e-4 a near-total violation
