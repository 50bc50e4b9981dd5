"""The conformance-constraint language of Section 3.1, as Python values.

Grammar (paper §3.1):

    phi   := lb <= F(A⃗) <= ub | AND(phi, ..., phi)        -- simple
    psi_A := OR((A=c1) ▷ phi, (A=c2) ▷ phi, ...)           -- disjunctive
    Psi   := psi_A | AND(psi_{A1}, psi_{A2}, ...)          -- compound
    Phi   := phi | Psi

Mapping here: ``BoundedProjection`` is one ``lb <= F <= ub`` atom;
``SimpleConstraint`` is the conjunction of atoms with normalized importance
factors gamma; ``DisjunctiveConstraint`` is one psi_A (switch attribute +
per-value branch); ``CompoundConstraint`` is the outer conjunction.  All are
frozen, and serialize to plain dicts so jobs can persist discovered
constraints as JSON.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Union

import numpy as np

#: Floor applied to sigma when used as the scaling factor alpha = 1/sigma.
#: The paper sets alpha to "a large positive number" when sigma = 0; the floor
#: realizes that (alpha <= 1e9) while keeping equality constraints strict.
EPS_STD = 1e-9


@dataclass(frozen=True)
class BoundedProjection:
    """One atom ``lb <= F(A⃗) <= ub`` with its quantitative-semantics data.

    ``F(t) = sum_i weights[i] * t[cols[i]]``; ``mean``/``std`` are the moments
    of F on the training data (std also defines alpha = 1/max(std, EPS_STD));
    ``lb, ub = mean -/+ C*std``; ``gamma`` is the normalized importance factor
    of this conjunct inside its ``SimpleConstraint``.
    """

    cols: tuple[str, ...]
    weights: tuple[float, ...]
    mean: float
    std: float
    lb: float
    ub: float
    gamma: float

    @property
    def alpha(self) -> float:
        return 1.0 / max(self.std, EPS_STD)

    def is_equality(self, tol: float = 1e-9) -> bool:
        """True when this atom is (numerically) an equality invariant F = mean.

        Equality invariants (sigma ~ 0) are the ones Theorem 7 uses for the
        sufficient non-conformance check of Section 5.4.
        """
        return self.std <= tol


@dataclass(frozen=True)
class SimpleConstraint:
    """Conjunction of bounded-projection atoms (a phi in the grammar).

    ``col_means`` are the training-partition means of the numerical attributes
    (same order as each atom's ``cols``); they are the "more typical value"
    ExTuNe substitutes during interventions. ``n`` is the number of training
    tuples the constraint was learned from.
    """

    conjuncts: tuple[BoundedProjection, ...]
    col_means: tuple[float, ...] = ()
    n: int = 0

    @property
    def cols(self) -> tuple[str, ...]:
        return self.conjuncts[0].cols if self.conjuncts else ()

    def equality_conjuncts(self, tol: float = 1e-9) -> tuple[BoundedProjection, ...]:
        return tuple(c for c in self.conjuncts if c.is_equality(tol))


@dataclass(frozen=True)
class DisjunctiveConstraint:
    """One psi_A: ``OR((attr = v) ▷ branches[v], ...)``.

    Branch keys are the *stringified* attribute values (matching how the
    grouped Gram pass transports them); scoring compares
    ``CAST(attr AS STRING)`` against the keys, which is exact for the string
    and integer switch attributes used in this repo.  A tuple whose attribute
    value matches no branch gets violation 1 (paper: ``simp`` undefined).
    """

    attr: str
    branches: dict[str, SimpleConstraint] = field(default_factory=dict)


Constraint = Union[SimpleConstraint, DisjunctiveConstraint, "CompoundConstraint"]


@dataclass(frozen=True)
class CompoundConstraint:
    """Outer conjunction of disjunctive and/or simple parts (a Psi).

    The paper leaves the outer conjunction's weights unspecified; we use the
    unweighted mean of the part scores (each part already lies in [0, 1]).
    """

    parts: tuple[Constraint, ...]


def constraint_to_dict(c: Constraint) -> dict[str, Any]:
    """JSON-serializable representation (inverse of ``constraint_from_dict``)."""
    if isinstance(c, SimpleConstraint):
        return {
            "kind": "simple",
            "n": c.n,
            "col_means": list(c.col_means),
            "conjuncts": [
                {
                    "cols": list(b.cols),
                    "weights": list(b.weights),
                    "mean": b.mean,
                    "std": b.std,
                    "lb": b.lb,
                    "ub": b.ub,
                    "gamma": b.gamma,
                }
                for b in c.conjuncts
            ],
        }
    if isinstance(c, DisjunctiveConstraint):
        return {
            "kind": "disjunctive",
            "attr": c.attr,
            "branches": {v: constraint_to_dict(s) for v, s in c.branches.items()},
        }
    if isinstance(c, CompoundConstraint):
        return {"kind": "compound", "parts": [constraint_to_dict(p) for p in c.parts]}
    raise TypeError(f"not a constraint: {type(c)!r}")


def constraint_from_dict(d: dict[str, Any]) -> Constraint:
    kind = d["kind"]
    if kind == "simple":
        return SimpleConstraint(
            conjuncts=tuple(
                BoundedProjection(
                    cols=tuple(b["cols"]),
                    weights=tuple(b["weights"]),
                    mean=b["mean"],
                    std=b["std"],
                    lb=b["lb"],
                    ub=b["ub"],
                    gamma=b["gamma"],
                )
                for b in d["conjuncts"]
            ),
            col_means=tuple(d.get("col_means", ())),
            n=d.get("n", 0),
        )
    if kind == "disjunctive":
        return DisjunctiveConstraint(
            attr=d["attr"],
            branches={v: constraint_from_dict(s) for v, s in d["branches"].items()},
        )
    if kind == "compound":
        return CompoundConstraint(parts=tuple(constraint_from_dict(p) for p in d["parts"]))
    raise ValueError(f"unknown constraint kind {kind!r}")


def normalize_gammas(raw: list[float]) -> list[float]:
    """Normalize raw importance factors to sum to 1 (Algorithm 1 line 8)."""
    z = float(np.sum(raw))
    if z <= 0:
        return [1.0 / len(raw)] * len(raw) if raw else []
    return [g / z for g in raw]
