"""Distributed γ-core: iterative peeling as DataFrame joins.

Each superstep drops every vertex whose current degree is below γ and the
edges incident to it; iteration stops at the fixed point (the γ-core is the
unique maximal subgraph with min degree ≥ γ, so order does not matter).
Rounds are bounded by the peeling depth, typically O(log n) on power-law
graphs.
"""
from __future__ import annotations

from typing import Tuple

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .common import iterate_checkpoint
from .degrees import degrees


def gamma_core(
    vertices: DataFrame, edges: DataFrame, gamma: int
) -> Tuple[DataFrame, DataFrame]:
    """Return (vertices, edges) of the γ-core of the input graph."""
    if gamma < 1:
        raise ValueError("gamma must be >= 1")
    v = vertices
    e = edges
    n = v.count()
    while True:
        deg = degrees(e)
        keep = deg.filter(F.col("degree") >= gamma).select("id")
        n_new = keep.count()
        if n_new == n:
            return v.join(keep, "id"), e
        v = iterate_checkpoint(v.join(keep, "id"))
        e = iterate_checkpoint(
            e.join(keep.withColumnRenamed("id", "src"), "src")
            .join(keep.withColumnRenamed("id", "dst"), "dst")
        )
        n = n_new
        if n == 0:
            return v.limit(0), e.limit(0)
