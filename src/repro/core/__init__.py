"""Sparcle's core engine: the paper's contribution (§3–§5).

Submodules mirror the paper's architecture (Figure 2): spatial denial
constraints, the materialised DistanceMatrix, the spatial error detector,
the spatial candidate generator, and the spatial input formulators for the
three host error-correction formats.
"""
from repro.core.constraints import (
    ExactLocationConstraint,
    SpatialKNNConstraint,
    SpatialRangeConstraint,
    WeightFunction,
)
from repro.core.pipeline import CleanResult, sparcle_clean

__all__ = [
    "CleanResult",
    "ExactLocationConstraint",
    "SpatialKNNConstraint",
    "SpatialRangeConstraint",
    "WeightFunction",
    "sparcle_clean",
]
