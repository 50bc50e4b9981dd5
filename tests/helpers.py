"""Shared helpers for the test suite: small deterministic datasets."""
from __future__ import annotations

import numpy as np
import pandas as pd


def linear_pdf(
    n: int = 500,
    noise: float = 0.05,
    seed: int = 0,
    slope: tuple[float, float] = (1.0, 1.0),
) -> pd.DataFrame:
    """Columns a, b independent; c = slope_a*a + slope_b*b + N(0, noise).

    Plants the paper's Example-1-style arithmetic invariant
    ``c - slope_a*a - slope_b*b ~ 0`` with standard deviation ``noise``.
    """
    g = np.random.default_rng(seed)
    a = g.normal(10.0, 3.0, n)
    b = g.normal(-2.0, 5.0, n)
    c = slope[0] * a + slope[1] * b + g.normal(0.0, noise, n)
    return pd.DataFrame({"a": a, "b": b, "c": c})


def piecewise_pdf(n_per: int = 300, noise: float = 0.05, seed: int = 1) -> pd.DataFrame:
    """The Figure-2 scenario: three categories, each its own linear trend.

    Globally there is no low-variance linear projection; per-category there
    is (y = slope_k * x + intercept_k + small noise).
    """
    g = np.random.default_rng(seed)
    frames = []
    for k, (slope, intercept) in enumerate([(2.0, 0.0), (-1.0, 10.0), (0.2, -5.0)]):
        x = g.uniform(0, 10, n_per)
        y = slope * x + intercept + g.normal(0, noise, n_per)
        frames.append(pd.DataFrame({"grp": f"g{k}", "x": x, "y": y}))
    return pd.concat(frames, ignore_index=True)


def random_unit_vectors(m: int, count: int, seed: int = 7) -> np.ndarray:
    g = np.random.default_rng(seed)
    v = g.normal(size=(count, m))
    return v / np.linalg.norm(v, axis=1, keepdims=True)


def numpy_aug_gram(pdf: pd.DataFrame, cols: list[str]) -> tuple[int, np.ndarray]:
    """Reference augmented Gram matrix computed directly with numpy."""
    x = pdf[cols].to_numpy(dtype=np.float64)
    xa = np.hstack([np.ones((len(x), 1)), x])
    return len(x), xa.T @ xa
