"""ExTuNe: intervention-centric explanation of tuple non-conformance (§6.3)."""
from repro.explain.extune import responsibilities

__all__ = ["responsibilities"]
