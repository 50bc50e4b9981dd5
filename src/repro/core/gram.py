"""One-pass distributed second-moment (Gram) computation.

Algorithm 1 of the paper needs the (m+1)x(m+1) matrix ``G = [1|X]^T [1|X]``
where ``X`` is the n x m matrix of numerical attribute values and ``[1|X]``
prepends a constant-1 intercept column.  Section 4.3 observes that ``G`` is a
sum of per-tuple outer products, so it can be computed "in an embarrassingly
parallel way where we partition the data (row-wise) and each partition is
computed in parallel" — that is exactly what this module does: every Spark
partition emits its partial (m+1)^2 sum through ``mapInPandas`` and the driver
adds the small partials.  O(n m^2) work, O(m^2) driver memory, one data scan.

``G`` is also sufficient for every statistic the method needs downstream:
for a linear projection F(t) = w . t,

    mu(F(D))   = w . colsum / n            (colsum = G[0, 1:])
    E[F^2]     = w^T M w / n               (M = G[1:, 1:])
    var(F(D))  = E[F^2] - mu^2

so discovery makes a *single* pass over the data regardless of how many
projections Algorithm 1 returns.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

#: Spark simple-type names treated as numerical attributes (the paper's
#: Algorithm 1 line 1 drops everything else). Dates, strings, booleans and
#: complex types are excluded.
NUMERIC_TYPE_NAMES = frozenset(
    {"tinyint", "smallint", "int", "bigint", "float", "double"}
)


def numeric_columns(df: DataFrame) -> list[str]:
    """Names of the numerical attributes of ``df``, in schema order."""
    return [f.name for f in df.schema.fields if f.dataType.simpleString() in NUMERIC_TYPE_NAMES]


@dataclass(frozen=True)
class GramResult:
    """Row count and augmented Gram matrix ``[1|X]^T [1|X]`` for one dataset.

    ``cols`` records the attribute order of the m non-intercept columns; the
    matrix ``g`` is (m+1)x(m+1) with index 0 = the intercept column, so
    ``g[0, 0] == n``, ``g[0, 1:]`` holds column sums and ``g[1:, 1:]`` the raw
    second moments ``X^T X``.
    """

    cols: tuple[str, ...]
    n: int
    g: np.ndarray

    def projection_moments(self, weights: np.ndarray) -> tuple[float, float]:
        """Mean and standard deviation of the projection ``t -> weights . t``.

        Derived purely from the Gram matrix (no extra data pass). Variance is
        clamped at 0 against floating-point cancellation.
        """
        w = np.asarray(weights, dtype=np.float64)
        if self.n == 0:
            return 0.0, 0.0
        mean = float(w @ self.g[0, 1:]) / self.n
        second = float(w @ self.g[1:, 1:] @ w) / self.n
        var = max(second - mean * mean, 0.0)
        return mean, float(np.sqrt(var))

    def column_means(self) -> np.ndarray:
        """Per-attribute means (used as ExTuNe intervention targets)."""
        if self.n == 0:
            return np.zeros(len(self.cols))
        return self.g[0, 1:] / self.n


def _partial_gram_fn(
    cols: Sequence[str],
) -> Callable[[Iterator[pd.DataFrame]], Iterator[pd.DataFrame]]:
    cols = list(cols)
    m1 = len(cols) + 1

    def fn(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        g = np.zeros((m1, m1), dtype=np.float64)
        n = 0
        for pdf in batches:
            x = pdf[cols].to_numpy(dtype=np.float64, copy=False)
            if x.size:
                x = x[~np.isnan(x).any(axis=1)]
            if not len(x):
                continue
            xa = np.hstack([np.ones((len(x), 1)), x])
            g += xa.T @ xa
            n += len(x)
        yield pd.DataFrame({"n": [n], "g": [g.ravel().tolist()]})

    return fn


def augmented_gram(df: DataFrame, cols: Sequence[str] | None = None) -> GramResult:
    """Compute ``GramResult`` for ``df`` over ``cols`` in one distributed pass.

    Rows with a NaN/null in any of ``cols`` are dropped (the generators in
    this repo produce none; documented for completeness). ``cols`` defaults to
    all numerical attributes.
    """
    cols = list(cols) if cols is not None else numeric_columns(df)
    if not cols:
        raise ValueError("augmented_gram needs at least one numerical column")
    m1 = len(cols) + 1
    partials = df.select(*cols).mapInPandas(
        _partial_gram_fn(cols), schema="n long, g array<double>"
    ).collect()
    g = np.zeros((m1, m1), dtype=np.float64)
    n = 0
    for row in partials:
        g += np.asarray(row["g"], dtype=np.float64).reshape(m1, m1)
        n += row["n"]
    return GramResult(cols=tuple(cols), n=n, g=g)


def _grouped_partial_gram_fn(
    attr: str, cols: Sequence[str]
) -> Callable[[Iterator[pd.DataFrame]], Iterator[pd.DataFrame]]:
    cols = list(cols)
    m1 = len(cols) + 1

    def fn(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        acc: dict[str, tuple[int, np.ndarray]] = {}
        for pdf in batches:
            for v, sub in pdf.groupby(attr, dropna=False, observed=True):
                x = sub[cols].to_numpy(dtype=np.float64, copy=False)
                if x.size:
                    x = x[~np.isnan(x).any(axis=1)]
                if not len(x):
                    continue
                xa = np.hstack([np.ones((len(x), 1)), x])
                key = str(v)
                n0, g0 = acc.get(key, (0, np.zeros((m1, m1), dtype=np.float64)))
                acc[key] = (n0 + len(x), g0 + xa.T @ xa)
        yield pd.DataFrame(
            {
                "v": list(acc.keys()),
                "n": [n for n, _ in acc.values()],
                "g": [g.ravel().tolist() for _, g in acc.values()],
            }
        )

    return fn


def grouped_augmented_gram(
    df: DataFrame, attr: str, cols: Sequence[str]
) -> dict[str, GramResult]:
    """Per-partition Gram matrices for the disjunctive constraints of §4.2.

    Partitions ``df`` logically by the value of ``attr`` (the paper's switch
    attribute) and returns ``{str(value): GramResult}``.  Implemented without
    a shuffle: each Spark partition groups locally and emits one partial per
    value it saw; the driver merges the (<= values x partitions) small rows.
    Keys are stringified for Arrow transport; callers map them back to typed
    values via a ``distinct()`` on the attribute (see ``discovery``).
    """
    cols = list(cols)
    m1 = len(cols) + 1
    partials = df.select(attr, *cols).mapInPandas(
        _grouped_partial_gram_fn(attr, cols), schema="v string, n long, g array<double>"
    ).collect()
    out: dict[str, tuple[int, np.ndarray]] = {}
    for row in partials:
        n0, g0 = out.get(row["v"], (0, np.zeros((m1, m1), dtype=np.float64)))
        out[row["v"]] = (
            n0 + row["n"],
            g0 + np.asarray(row["g"], dtype=np.float64).reshape(m1, m1),
        )
    return {
        v: GramResult(cols=tuple(cols), n=n, g=g) for v, (n, g) in out.items()
    }
