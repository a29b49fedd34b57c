"""Truss substrate: local kernel + distributed (DataFrame) truss analytics."""
from repro.truss.local import INF_T, LocalGraph, TrussState, decompose  # noqa: F401
