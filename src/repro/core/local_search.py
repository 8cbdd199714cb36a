"""Distributed LocalSearch (Algorithm 1) over the Spark substrate.

The driver loop follows Algorithm 1 exactly, with each piece mapped to the
distributed kernels:

* Line 1 — τ₁ = weight of the (k+γ)-th vertex, from the prefix index;
* Line 3 — CountIC(G≥τ_i) = the survival-threshold fixed point
  (``repro.kernels.survival``) on the Catalyst-filtered subgraph, counting
  vertices with ``T = ω``;
* Line 4 — τ_{i+1} from the cached prefix-size index
  (``SparkGraph.tau_for_size``), growing ``size(G≥τ)`` by the factor δ;
* Line 6 — EnumIC on the final subgraph (``repro.core.enum_ic``).

Only the weight-suffix subgraph ``G≥τ_i`` ever flows through the cluster —
the locality that makes LocalSearch instance-optimal carries over: the
DataFrames processed per stage have exactly ``size(G≥τ_i)`` rows.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import List

from repro.graphs.storage import SparkGraph
from repro.kernels.survival import count_keynodes, survival_threshold

from .enum_ic import Community, enumerate_distributed, enumerate_driver


@dataclass
class SparkStage:
    tau: float
    size: int
    count: int
    survival_iterations: int


@dataclass
class SparkLocalSearchResult:
    communities: List[Community]
    stages: List[SparkStage] = field(default_factory=list)

    @property
    def accessed_size(self) -> int:
        return self.stages[-1].size if self.stages else 0


def local_search_spark(
    sg: SparkGraph,
    k: int,
    gamma: int,
    delta: float = 2.0,
    enum_mode: str = "driver",
) -> SparkLocalSearchResult:
    """Top-k influential γ-communities, highest influence first."""
    if delta <= 1:
        raise ValueError("delta must be > 1")
    res = SparkLocalSearchResult(communities=[])
    tau_min = sg.tau_min()
    tau = sg.tau_for_rank(k + gamma)
    while True:
        sub = sg.subgraph_ge(tau)
        surv = survival_threshold(sub.vertices, sub.edges, gamma)
        cnt = count_keynodes(surv.labels)
        size = sg.size_at_tau(tau)
        res.stages.append(
            SparkStage(tau=tau, size=size, count=cnt,
                       survival_iterations=surv.iterations)
        )
        if cnt >= k or tau <= tau_min:
            break
        tau = sg.tau_for_size(math.ceil(delta * size))
    enum = enumerate_driver if enum_mode == "driver" else enumerate_distributed
    res.communities = enum(surv.labels, sub.edges, k)
    return res


def count_ic_spark(sg: SparkGraph, gamma: int, tau: float) -> int:
    """Distributed CountIC: #influential γ-communities of ``G≥τ``."""
    sub = sg.subgraph_ge(tau)
    surv = survival_threshold(sub.vertices, sub.edges, gamma)
    return count_keynodes(surv.labels)
