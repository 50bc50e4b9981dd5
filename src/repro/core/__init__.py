"""Core of the paper's contribution: conformance-constraint discovery.

Pipeline: ``gram`` (one-pass distributed second moments) -> ``projections``
(Algorithm 1: eigenvectors of the augmented Gram matrix) -> ``constraints``
(the language of Section 3.1) -> ``discovery`` (simple / disjunctive /
compound synthesis, Section 4) -> ``scoring`` (quantitative semantics of
Section 3.2 as Catalyst expressions).
"""
from repro.core.constraints import (
    BoundedProjection,
    CompoundConstraint,
    DisjunctiveConstraint,
    SimpleConstraint,
    constraint_from_dict,
    constraint_to_dict,
)
from repro.core.discovery import (
    discover,
    discover_disjunctive,
    discover_simple,
    eligible_partition_attrs,
)
from repro.core.gram import augmented_gram, grouped_augmented_gram, numeric_columns
from repro.core.projections import derive_projections
from repro.core.scoring import (
    average_violation,
    score,
    violation_col,
    violation_numpy,
    violation_sql,
)

__all__ = [
    "BoundedProjection",
    "SimpleConstraint",
    "DisjunctiveConstraint",
    "CompoundConstraint",
    "constraint_to_dict",
    "constraint_from_dict",
    "augmented_gram",
    "grouped_augmented_gram",
    "numeric_columns",
    "derive_projections",
    "discover",
    "discover_simple",
    "discover_disjunctive",
    "eligible_partition_attrs",
    "score",
    "violation_col",
    "violation_sql",
    "violation_numpy",
    "average_violation",
]
