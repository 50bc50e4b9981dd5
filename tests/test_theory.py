"""Property tests for the paper's theory (Lemmas 1-2, Theorem 3).

These run on the numpy reference implementation: they validate the *math* the
Spark pipeline rests on, independent of the execution engine.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import BoundedProjection, SimpleConstraint
from repro.core.scoring import violation_numpy


def _phi(f: np.ndarray, C: float = 4.0) -> SimpleConstraint:
    """Constraint 'mu - C sigma <= F <= mu + C sigma' for projection values f."""
    mu, sigma = f.mean(), f.std()
    return SimpleConstraint(
        conjuncts=(
            BoundedProjection(
                cols=("f",),
                weights=(1.0,),
                mean=float(mu),
                std=float(sigma),
                lb=float(mu - C * sigma),
                ub=float(mu + C * sigma),
                gamma=1.0,
            ),
        )
    )


def _score(phi: SimpleConstraint, value: float) -> float:
    return float(violation_numpy(phi, pd.DataFrame({"f": [value]}))[0])


def _combine_beta(rho: float, s1: float, s2: float) -> tuple[float, float]:
    """The beta_1, beta_2 of Lemma 2's proof: sign(rho) b1 s1 + b2 s2 = 0,
    b1^2 + b2^2 = 1."""
    b1 = s2 / np.hypot(s1, s2)
    b2 = -np.sign(rho) * s1 / np.hypot(s1, s2)
    return float(b1), float(b2)


def _correlated_pair(seed: int, n: int = 4000) -> tuple[np.ndarray, np.ndarray]:
    g = np.random.default_rng(seed)
    z = g.normal(size=n)
    f1 = 2.0 * z + g.normal(scale=0.8, size=n) + 5.0
    f2 = -1.5 * z + g.normal(scale=0.6, size=n) - 2.0
    return f1, f2


@pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
def test_lemma2_combined_projection_has_lower_std(seed):
    f1, f2 = _correlated_pair(seed)
    rho = np.corrcoef(f1, f2)[0, 1]
    assert abs(rho) >= 0.5  # precondition of the lemma
    b1, b2 = _combine_beta(rho, f1.std(), f2.std())
    f = b1 * f1 + b2 * f2
    assert b1**2 + b2**2 == pytest.approx(1.0)
    assert f.std() < f1.std()
    assert f.std() < f2.std()


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_lemma2_stronger_on_incongruous_tuples(seed):
    f1, f2 = _correlated_pair(seed)
    rho = np.corrcoef(f1, f2)[0, 1]
    b1, b2 = _combine_beta(rho, f1.std(), f2.std())
    f = b1 * f1 + b2 * f2
    phi1, phi2, phi = _phi(f1), _phi(f2), _phi(f)
    # Build incongruous test tuples: deviate against the correlation trend.
    g = np.random.default_rng(seed + 10)
    checked = 0
    for _ in range(200):
        d1 = g.normal(scale=3 * f1.std())
        d2 = g.normal(scale=3 * f2.std())
        if rho * d1 * d2 >= 0:
            continue  # not incongruous
        t1, t2 = f1.mean() + d1, f2.mean() + d2
        tf = b1 * t1 + b2 * t2
        v = _score(phi, tf)
        assert v >= _score(phi1, t1) - 1e-9
        assert v >= _score(phi2, t2) - 1e-9
        checked += 1
    assert checked > 50


def test_lemma2_closed_form_std():
    """sigma(F) = sqrt(2(1-|rho|)) |beta_1| sigma(F_1) (appendix derivation),
    exact when sigma_1 = sigma_2."""
    g = np.random.default_rng(42)
    z = g.normal(size=20000)
    e1, e2 = g.normal(scale=0.5, size=20000), g.normal(scale=0.5, size=20000)
    f1, f2 = z + e1, z + e2  # equal stds by construction
    rho = np.corrcoef(f1, f2)[0, 1]
    b1, b2 = _combine_beta(rho, f1.std(), f2.std())
    f = b1 * f1 + b2 * f2
    predicted = np.sqrt(2 * (1 - abs(rho))) * abs(b1) * f1.std()
    assert f.std() == pytest.approx(predicted, rel=1e-2)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_theorem3_iterative_combination(seed):
    """Theorem 3's constructive proof: repeatedly combine while some
    |rho(F, F_k)| >= 1/2; the result has lower std than every combined input
    and |rho| < 1/2 against every projection left out."""
    g = np.random.default_rng(seed)
    n = 5000
    z = g.normal(size=n)
    fs = [
        z + g.normal(scale=0.7, size=n),
        -2 * z + g.normal(scale=1.0, size=n),
        z + g.normal(scale=0.9, size=n),
        g.normal(scale=1.0, size=n),  # independent: should stay out
    ]
    # start from the first correlated pair
    rho01 = np.corrcoef(fs[0], fs[1])[0, 1]
    assert abs(rho01) >= 0.5
    b1, b2 = _combine_beta(rho01, fs[0].std(), fs[1].std())
    f = b1 * fs[0] + b2 * fs[1]
    included = {0, 1}
    changed = True
    while changed:
        changed = False
        for k in range(len(fs)):
            if k in included:
                continue
            rho = np.corrcoef(f, fs[k])[0, 1]
            if abs(rho) >= 0.5:
                b1, b2 = _combine_beta(rho, f.std(), fs[k].std())
                f = b1 * f + b2 * fs[k]
                included.add(k)
                changed = True
    for k in included:
        assert f.std() < fs[k].std()
    for k in set(range(len(fs))) - included:
        assert abs(np.corrcoef(f, fs[k])[0, 1]) < 0.5


def test_incongruous_definition_example2():
    """Paper Example 2: D={(1,1),(2,2),(3,3)}, F1=A1, F2=A2: (1,3),(3,1) are
    incongruous; (3,4),(1,0) are not."""
    d = np.array([[1, 1], [2, 2], [3, 3]], dtype=float)
    f1, f2 = d[:, 0], d[:, 1]
    rho = np.corrcoef(f1, f2)[0, 1]

    def incongruous(t):
        return rho * (t[0] - f1.mean()) * (t[1] - f2.mean()) < 0

    assert incongruous((1, 3))
    assert incongruous((3, 1))
    assert not incongruous((3, 4))
    assert not incongruous((1, 0))
