"""Exact sequential LocalSearch (Algorithm 1) with instrumentation.

The driver loop of the paper: start from the heuristic prefix of the
``k + γ`` highest-weight vertices (the k communities must span at least that
many distinct vertices), count influential γ-communities with CountIC, and —
while fewer than k are present and the subgraph is proper — enlarge the
subgraph so its ``size`` (vertices + edges) grows by at least the factor δ
(Line 4), using the weight-ordered prefix-size index of the graph
organization (§3.1). Finally EnumIC extracts the top-k.

``stats`` records every stage (τ, size, count) plus the total accessed size,
which the instance-optimality tests compare against ``size(G≥τ*)``
(Lemma 3.8: accessed < 2δ·size(G≥τ*)).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import List, Optional

from .count_ic import count_ic
from .enum_ic import Community, enum_ic
from .graph import RefGraph


@dataclass
class Stage:
    tau: float
    r: int  # number of vertices in the stage subgraph
    size: int  # size(G≥τ)
    count: int  # number of influential γ-communities found by CountIC


@dataclass
class LocalSearchResult:
    communities: List[Community]  # highest influence first
    stages: List[Stage] = field(default_factory=list)

    @property
    def accessed_size(self) -> int:
        """size of the largest (final) subgraph accessed — `size(G≥τ_h)`."""
        return self.stages[-1].size if self.stages else 0

    @property
    def work_size(self) -> int:
        """Σ over stages of size(G≥τ_i): the paper's total-work measure."""
        return sum(s.size for s in self.stages)


def initial_prefix(g: RefGraph, k: int, gamma: int) -> int:
    """Line 1 heuristic: τ₁ = the (k+γ)-th largest vertex weight."""
    return min(g.n, k + gamma)


def local_search(
    g: RefGraph, k: int, gamma: int, delta: float = 2.0
) -> LocalSearchResult:
    """Algorithm 1. Returns top-k communities in decreasing influence order."""
    if delta <= 1:
        raise ValueError("delta must be > 1")
    res = LocalSearchResult(communities=[])
    if g.n == 0:
        return res
    r = initial_prefix(g, k, gamma)
    while True:
        # The top-r subgraph is peeled in place via the N≥ split (§3.1 ★★) —
        # no per-stage graph reconstruction.
        peel = count_ic(g, gamma, prefix=r)
        size = g.prefix_size(r)
        res.stages.append(
            Stage(tau=g.weight[g.order[r - 1]], r=r, size=size, count=peel.count)
        )
        if peel.count >= k or r == g.n:
            break
        # Line 4: smallest prefix with size ≥ δ·size(G≥τ_i), else the whole G.
        r = max(g.r_for_size(math.ceil(delta * size)), r + 1)
    res.communities = enum_ic(g, peel, k)
    return res


def tau_star_size(g: RefGraph, k: int, gamma: int) -> int:
    """``size(G≥τ*)`` — smallest weight-suffix subgraph with ≥ k communities.

    Oracle for the instance-optimality bound (test-only; O(n) CountIC calls
    avoided by a single full peel: τ* is the k-th largest keynode weight of
    the full graph, and the optimal subgraph is the prefix down to it).
    """
    peel = count_ic(g, gamma)
    if peel.count < k:
        return g.size
    tau = g.weight[peel.keys[-k]]
    return g.prefix_size(g.r_for_tau(tau))
