"""Constraint synthesis (paper Section 4).

``discover_simple``      — Algorithm 1 + the bound synthesis of §4.1.1:
                           one distributed Gram pass, driver-side (m+1)x(m+1)
                           eigendecomposition, bounds mu -/+ C*sigma (C=4).
``discover_disjunctive`` — §4.2: partition on one low-cardinality attribute
                           (<= 50 distinct values), learn one simple
                           constraint per partition from a single grouped
                           Gram pass.
``discover``             — the final compound constraint: conjunction of one
                           disjunctive constraint per eligible attribute
                           (plus, by default, the global simple constraint so
                           datasets without categorical attributes are
                           handled uniformly).
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as Fn

from repro.core.constraints import (
    BoundedProjection,
    CompoundConstraint,
    DisjunctiveConstraint,
    SimpleConstraint,
    normalize_gammas,
)
from repro.core.gram import GramResult, augmented_gram, grouped_augmented_gram, numeric_columns
from repro.core.projections import derive_projections, importance_raw

#: Paper's default deviation multiplier: lb, ub = mu -/+ C * sigma.
DEFAULT_C = 4.0
#: Paper's partitioning threshold: attributes with <= 50 distinct values.
DEFAULT_MAX_BRANCHES = 50
#: Partitions with fewer rows get a trivial (always satisfied) constraint —
#: "no evidence" rather than a degenerate sigma=0 overfit (see DESIGN.md §3).
DEFAULT_MIN_PARTITION_ROWS = 2


def simple_from_gram(gram: GramResult, C: float = DEFAULT_C) -> SimpleConstraint:
    """Build a simple constraint from a precomputed augmented Gram matrix."""
    projections = derive_projections(gram)
    gammas = normalize_gammas([importance_raw(p.std) for p in projections])
    conjuncts = tuple(
        BoundedProjection(
            cols=p.cols,
            weights=p.weights,
            mean=p.mean,
            std=p.std,
            lb=p.mean - C * p.std,
            ub=p.mean + C * p.std,
            gamma=g,
        )
        for p, g in zip(projections, gammas)
    )
    return SimpleConstraint(
        conjuncts=conjuncts,
        col_means=tuple(float(x) for x in gram.column_means()),
        n=gram.n,
    )


def discover_simple(
    df: DataFrame, cols: Sequence[str] | None = None, C: float = DEFAULT_C
) -> SimpleConstraint:
    """Learn the paper's simple (conjunctive) constraint for ``df``."""
    cols = list(cols) if cols is not None else numeric_columns(df)
    return simple_from_gram(augmented_gram(df, cols), C=C)


def discover_disjunctive(
    df: DataFrame,
    attr: str,
    cols: Sequence[str] | None = None,
    C: float = DEFAULT_C,
    min_partition_rows: int = DEFAULT_MIN_PARTITION_ROWS,
) -> DisjunctiveConstraint:
    """Learn ``OR((attr = v) ▷ phi_v)`` with one grouped Gram pass over ``df``."""
    cols = list(cols) if cols is not None else [c for c in numeric_columns(df) if c != attr]
    grouped = grouped_augmented_gram(df, attr, cols)
    branches = {
        v: (
            simple_from_gram(g, C=C)
            if g.n >= min_partition_rows
            else SimpleConstraint(
                conjuncts=(),
                col_means=tuple(float(x) for x in g.column_means()),
                n=g.n,
            )
        )
        for v, g in grouped.items()
    }
    return DisjunctiveConstraint(attr=attr, branches=branches)


def eligible_partition_attrs(
    df: DataFrame,
    numeric_cols: Sequence[str],
    max_branches: int = DEFAULT_MAX_BRANCHES,
) -> list[str]:
    """Auto-select switch attributes: non-numeric columns with 2..max distinct.

    Mirrors the paper's "attributes A_j for which |{t.A_j : t in D}| <= 50".
    Numeric columns are never auto-selected (they feed the projections);
    numeric categorical attributes (e.g. LED's ``digit``) can be passed to
    ``discover`` explicitly.
    """
    numeric = set(numeric_cols)
    candidates = [f.name for f in df.schema.fields if f.name not in numeric]
    if not candidates:
        return []
    counts = df.agg(
        *[Fn.countDistinct(Fn.col(c)).alias(c) for c in candidates]
    ).first()
    return [c for c in candidates if 2 <= counts[c] <= max_branches]


def discover(
    df: DataFrame,
    cols: Sequence[str] | None = None,
    partition_attrs: Sequence[str] | None = None,
    C: float = DEFAULT_C,
    max_branches: int = DEFAULT_MAX_BRANCHES,
    include_global: bool = True,
    min_partition_rows: int = DEFAULT_MIN_PARTITION_ROWS,
) -> CompoundConstraint:
    """Learn the final compound constraint for ``df`` (DISYNTH's output).

    ``cols`` — numerical attributes to build projections over (default: all);
    ``partition_attrs`` — switch attributes (default: auto-selected
    non-numeric columns with <= ``max_branches`` distinct values);
    ``include_global`` — also conjoin the global simple constraint (the W-PCA
    baseline equals ``include_global=True`` with no partition attrs).
    """
    cols = list(cols) if cols is not None else numeric_columns(df)
    if partition_attrs is None:
        partition_attrs = eligible_partition_attrs(df, cols, max_branches)
    parts: list = []
    if include_global or not partition_attrs:
        parts.append(discover_simple(df, cols, C=C))
    for attr in partition_attrs:
        parts.append(
            discover_disjunctive(
                df,
                attr,
                [c for c in cols if c != attr],
                C=C,
                min_partition_rows=min_partition_rows,
            )
        )
    return CompoundConstraint(parts=tuple(parts))


def equality_projection_weights(
    constraint: SimpleConstraint, tol: float = 1e-9
) -> list[np.ndarray]:
    """Weights of equality invariants F(A⃗)=mean with sigma <= tol (§5.4)."""
    return [
        np.asarray(b.weights, dtype=np.float64)
        for b in constraint.equality_conjuncts(tol)
    ]
