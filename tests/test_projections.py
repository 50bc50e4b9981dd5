"""Tests for Algorithm 1 (repro.core.projections)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.gram import GramResult, augmented_gram
from repro.core.projections import derive_projections, importance_raw
from tests.helpers import linear_pdf, numpy_aug_gram, random_unit_vectors


def _gram_from_pdf(pdf, cols):
    n, g = numpy_aug_gram(pdf, cols)
    return GramResult(cols=tuple(cols), n=n, g=g)


def test_example3_zero_variance_projection():
    """Paper Example 3: D={(1,1),(2,2),(3,3)} admits F=(A1-A2)/sqrt(2), sigma=0."""
    import pandas as pd

    pdf = pd.DataFrame({"A1": [1.0, 2.0, 3.0], "A2": [1.0, 2.0, 3.0]})
    projections = derive_projections(_gram_from_pdf(pdf, ["A1", "A2"]))
    best = min(projections, key=lambda p: p.std)
    assert best.std == pytest.approx(0.0, abs=1e-9)
    w = np.abs(np.asarray(best.weights))
    np.testing.assert_allclose(w, [1 / np.sqrt(2)] * 2, atol=1e-9)
    assert best.mean == pytest.approx(0.0, abs=1e-9)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_unit_norm_weights(seed):
    pdf = linear_pdf(n=300, seed=seed)
    for p in derive_projections(_gram_from_pdf(pdf, ["a", "b", "c"])):
        assert np.linalg.norm(p.weights) == pytest.approx(1.0, rel=1e-9)


def test_sorted_by_eigenvalue():
    pdf = linear_pdf(n=300, seed=3)
    projections = derive_projections(_gram_from_pdf(pdf, ["a", "b", "c"]))
    eigs = [p.eigenvalue for p in projections]
    assert eigs == sorted(eigs)


def test_planted_invariant_recovered():
    """c = a + b + noise -> lowest-std projection is ±(1,1,-1)/sqrt(3)."""
    pdf = linear_pdf(n=2000, noise=0.01, seed=4)
    projections = derive_projections(_gram_from_pdf(pdf, ["a", "b", "c"]))
    best = min(projections, key=lambda p: p.std)
    assert best.std < 0.05
    w = np.asarray(best.weights)
    w = w / np.sign(w[0])
    np.testing.assert_allclose(w, np.array([1, 1, -1]) / np.sqrt(3), atol=0.01)


@pytest.mark.parametrize("seed", [5, 6, 7, 8])
def test_theorem4_min_std_beats_random_projections(seed):
    """Theorem 4(1): Algorithm 1's min sigma <= sigma of any linear projection."""
    pdf = linear_pdf(n=500, noise=0.2, seed=seed)
    cols = ["a", "b", "c"]
    projections = derive_projections(_gram_from_pdf(pdf, cols))
    sigma_star = min(p.std for p in projections)
    x = pdf[cols].to_numpy()
    for w in random_unit_vectors(3, 200, seed=seed + 100):
        assert sigma_star <= (x @ w).std() + 1e-9


def test_theorem4_projections_nearly_uncorrelated():
    """Theorem 4(2) is asymptotic: max |rho| between distinct projections
    must be small at large n and no larger than at small n.

    The proof's c_j -> -mu_j step needs lambda_j/n -> 0, which holds for the
    low-variance components the method actually uses; the top (mean-dominated)
    eigenvector is excluded here."""

    def max_abs_rho(n: int) -> float:
        pdf = linear_pdf(n=n, noise=0.5, seed=9)
        cols = ["a", "b", "c"]
        projections = derive_projections(_gram_from_pdf(pdf, cols))[:-1]
        x = pdf[cols].to_numpy()
        fs = [x @ np.asarray(p.weights) for p in projections]
        return max(
            abs(np.corrcoef(fs[i], fs[j])[0, 1])
            for i in range(len(fs))
            for j in range(i + 1, len(fs))
        )

    big = max_abs_rho(20000)
    assert big < 0.15
    assert big <= max_abs_rho(50) + 1e-9


def test_centered_data_skips_intercept_eigenvector():
    """Centered X makes [1|X]'s Gram block-diagonal: the pure-intercept
    eigenvector defines no projection and must be skipped (m, not m+1)."""
    pdf = linear_pdf(n=400, seed=10)
    pdf = pdf - pdf.mean()
    projections = derive_projections(_gram_from_pdf(pdf, ["a", "b", "c"]))
    assert len(projections) == 3


def test_importance_prefers_low_variance():
    assert importance_raw(0.0) > importance_raw(1.0) > importance_raw(100.0)
    assert importance_raw(0.0) == pytest.approx(1 / np.log(2))


def test_spark_and_numpy_grams_give_same_projections(spark):
    pdf = linear_pdf(n=600, seed=11)
    spark_gram = augmented_gram(spark.createDataFrame(pdf), ["a", "b", "c"])
    ref_gram = _gram_from_pdf(pdf, ["a", "b", "c"])
    p1 = derive_projections(spark_gram)
    p2 = derive_projections(ref_gram)
    assert len(p1) == len(p2)
    for a, b in zip(p1, p2):
        np.testing.assert_allclose(a.weights, b.weights, atol=1e-6)
        assert a.std == pytest.approx(b.std, rel=1e-6, abs=1e-9)
