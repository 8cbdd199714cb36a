"""Vertex degrees from a canonical undirected edge DataFrame."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def degrees(edges: DataFrame, vertices: DataFrame | None = None) -> DataFrame:
    """``(id, degree)``; if ``vertices`` is given, zero-degree rows included."""
    half = edges.select(F.col("src").alias("id")).unionAll(
        edges.select(F.col("dst").alias("id"))
    )
    deg = half.groupBy("id").agg(F.count("*").alias("degree"))
    if vertices is not None:
        deg = (
            vertices.select("id")
            .join(deg, "id", "left")
            .fillna(0, subset=["degree"])
        )
    return deg
