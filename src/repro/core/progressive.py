"""Distributed LocalSearch-P (Algorithm 4): progressive streaming results.

A Python generator over the Spark substrate. Stage i computes the survival
labelling of ``G≥τ_i`` and reports the communities of the **new** keynodes —
those with weight < τ_{i-1} (the §4 suffix property guarantees keynodes and
their communities computed in ``G≥τ_i`` stay valid in every larger
subgraph, so nothing is re-reported and nothing changes later). Communities
stream out in decreasing influence order; the consumer can stop the
generator at any time (``k`` is never needed).

Unlike the sequential version, each stage recomputes the fixed point on the
doubled subgraph rather than extending ``cvs`` incrementally — supersteps
are cheap relative to per-stage scheduling in Spark, and the total work
stays O(Σ size(G≥τ_i)) = O(size(G≥τ_h)) in dataflow-row terms.
"""
from __future__ import annotations

import math
from typing import Iterator

from pyspark.sql import functions as F

from repro.graphs.storage import SparkGraph
from repro.kernels.survival import survival_threshold

from .enum_ic import Community, _components_pandas


def local_search_progressive_spark(
    sg: SparkGraph, gamma: int, delta: float = 2.0
) -> Iterator[Community]:
    """Yield (influence, community) in decreasing influence order."""
    tau_min = sg.tau_min()
    tau = sg.tau_for_rank(1 + gamma)
    tau_prev = float("inf")
    while True:
        sub = sg.subgraph_ge(tau)
        surv = survival_threshold(sub.vertices, sub.edges, gamma)
        new_keys = (
            surv.labels.filter(
                (F.col("T") == F.col("weight")) & (F.col("weight") < tau_prev)
            )
            .orderBy(F.col("weight").desc())
            .collect()
        )
        if new_keys:
            # Collect once per stage; every new community lives inside the
            # current (small) subgraph's T-labelled vertex set.
            lpdf = surv.labels.filter(
                F.col("T") > float("-inf")
            ).select("id", "T").toPandas()
            epdf = sub.edges.select("src", "dst").toPandas()
            keys = [(int(r["id"]), float(r["weight"])) for r in new_keys]
            yield from _components_pandas(lpdf, epdf, keys)
        if tau <= tau_min:
            return
        tau_prev = tau
        tau = sg.tau_for_size(math.ceil(delta * sg.size_at_tau(tau)))
