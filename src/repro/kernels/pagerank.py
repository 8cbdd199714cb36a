"""Distributed PageRank over the undirected graph (damping 0.85, §6).

Each undirected edge contributes in both directions; dangling (isolated)
vertices redistribute their mass uniformly. Validated against the NumPy
power iteration in ``repro.graphs.weights``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .common import iterate_checkpoint
from .degrees import degrees


def pagerank(
    vertices: DataFrame,
    edges: DataFrame,
    damping: float = 0.85,
    iters: int = 20,
) -> DataFrame:
    """``(id, score)`` after ``iters`` synchronous power iterations."""
    n = vertices.count()
    half = edges.select(
        F.col("src").alias("u"), F.col("dst").alias("v")
    ).unionAll(edges.select(F.col("dst").alias("u"), F.col("src").alias("v")))
    half = half.cache()
    deg = degrees(edges, vertices).cache()
    pr = iterate_checkpoint(
        vertices.select("id", F.lit(1.0 / n).alias("score"))
    )
    for _ in range(iters):
        contrib = (
            pr.join(deg, "id")
            .filter(F.col("degree") > 0)
            .select("id", (F.col("score") / F.col("degree")).alias("c"))
        )
        inbound = (
            half.join(contrib.withColumnRenamed("id", "v"), "v")
            .groupBy("u")
            .agg(F.sum("c").alias("mass"))
            .withColumnRenamed("u", "id")
        )
        dangling = (
            pr.join(deg, "id").filter(F.col("degree") == 0).agg(F.sum("score"))
        ).collect()[0][0] or 0.0
        pr = iterate_checkpoint(
            vertices.select("id")
            .join(inbound, "id", "left")
            .select(
                "id",
                (
                    F.lit((1 - damping) / n)
                    + F.lit(damping)
                    * (F.coalesce(F.col("mass"), F.lit(0.0)) + F.lit(dangling / n))
                ).alias("score"),
            )
        )
    half.unpersist()
    deg.unpersist()
    return pr


def pagerank_rank_weights(vertices: DataFrame, edges: DataFrame, **kw) -> DataFrame:
    """``(id, weight)`` — distinct weights by (PageRank score, id) rank."""
    from pyspark.sql import Window

    pr = pagerank(vertices, edges, **kw)
    win = Window.orderBy(F.col("score").asc(), F.col("id").asc())
    return pr.select(
        "id", F.row_number().over(win).cast("double").alias("weight")
    )
