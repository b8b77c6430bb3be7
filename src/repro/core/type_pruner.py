"""§6.2 Object Type Pruner.

Drops detections whose predicted class is not referenced by the user's
predicates, right after the Object Detector — so the 3D estimator and
(crucially) the Hungarian-based tracker see fewer objects. It is a plain
Catalyst ``Filter``: the whole optimization is *where* the planner
places it in the operator plan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = ["prune_types"]


def prune_types(dets: DataFrame, types: frozenset[str] | set[str]) -> DataFrame:
    """Keep detections whose type is in the union of types of interest."""
    if not types:
        return dets
    return dets.filter(F.col("otype").isin(*[str(t) for t in types]))
