"""The W-PCA baseline of Figure 5(b): global weighted-PCA constraints.

This is exactly DISYNTH's *simple* constraint — importance-weighted PCA
projections learned globally, with no disjunctive partitioning.  The paper
uses it to show that global constraints underfit datasets with strong local
structure ("W-PCA fails to detect drift in absence of any strong global
drift"); keeping it as a named baseline makes the Figure 5(b) and Figure 8
harnesses read like the paper.
"""
from __future__ import annotations

from typing import Sequence

from pyspark.sql import DataFrame

from repro.core.constraints import SimpleConstraint
from repro.core.discovery import discover_simple
from repro.core.scoring import average_violation


def fit_wpca(df: DataFrame, cols: Sequence[str] | None = None) -> SimpleConstraint:
    return discover_simple(df, cols)


def wpca_drift(df: DataFrame, model: SimpleConstraint) -> float:
    return average_violation(df, model)
