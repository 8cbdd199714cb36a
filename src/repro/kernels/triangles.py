"""Triangle enumeration and per-edge support via DataFrame self-joins.

Triangles are enumerated once in id order (a < b < c) with two joins; the
per-edge *support* (number of triangles through an edge — the k-truss
quantity) aggregates the three edge projections of each triangle. Both
queries are plain relational algebra and are oracle-checked against DuckDB
SQL in the tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _canonical(edges: DataFrame) -> DataFrame:
    return edges.select(
        F.least("src", "dst").alias("a"), F.greatest("src", "dst").alias("b")
    )


def triangles(edges: DataFrame) -> DataFrame:
    """All triangles as rows ``(a, b, c)`` with a < b < c."""
    e = _canonical(edges).cache()
    ab = e.select(F.col("a").alias("x"), F.col("b").alias("y"))
    bc = e.select(F.col("a").alias("y"), F.col("b").alias("z"))
    ac = e.select(F.col("a").alias("x"), F.col("b").alias("z"))
    return (
        ab.join(bc, "y")
        .join(ac, ["x", "z"])
        .select(F.col("x").alias("a"), F.col("y").alias("b"), F.col("z").alias("c"))
    )


def edge_support(edges: DataFrame) -> DataFrame:
    """``(a, b, support)`` for every canonical edge (0 when triangle-free)."""
    t = triangles(edges)
    sides = (
        t.select(F.col("a"), F.col("b").alias("b2")).withColumnRenamed("b2", "b")
        .unionAll(t.select(F.col("a"), F.col("c").alias("b")))
        .unionAll(t.select(F.col("b").alias("a"), F.col("c").alias("b")))
    )
    sup = sides.groupBy("a", "b").agg(F.count("*").alias("support"))
    return (
        _canonical(edges)
        .join(sup, ["a", "b"], "left")
        .fillna(0, subset=["support"])
    )


def triangle_count(edges: DataFrame) -> int:
    return triangles(edges).count()
