"""Distributed global-search baselines: OnlineAll and Forward.

Both process the **entire** graph regardless of k — the deficiency the
paper's local search removes. Mapped to the substrate:

* the full-graph peel (OnlineAll's subroutines 1+3 / Forward's first pass)
  is the survival-threshold fixed point over *all* of G;
* OnlineAll then extracts the connected component of **every** keynode
  (its slow subroutine 2) — a fresh BFS per community over the T-filtered
  vertex set, faithful to its per-iteration component computation;
* Forward extracts components only for the top-k keynodes.

Component extraction happens driver-side on the collected labelling (the
per-keynode BFS order is inherently sequential); the distributed cost —
which scales with size(G), not size(G≥τ*) — is the full-graph fixed point
both algorithms share.
"""
from __future__ import annotations

from typing import List

from pyspark.sql import functions as F

from repro.graphs.storage import SparkGraph
from repro.kernels.survival import survival_threshold

from repro.core.enum_ic import Community, _components_pandas


def _full_labelling(sg: SparkGraph, gamma: int):
    surv = survival_threshold(sg.vertices, sg.edges, gamma)
    lpdf = surv.labels.filter(F.col("T") > float("-inf")).toPandas()
    keep = set(lpdf["id"].astype(int))
    epdf = sg.edges.select("src", "dst").toPandas()
    epdf = epdf[epdf["src"].isin(keep) & epdf["dst"].isin(keep)]
    keyed = lpdf[lpdf["T"] == lpdf["weight"]].sort_values("weight", ascending=False)
    keys = list(zip(keyed["id"].astype(int), keyed["weight"].astype(float)))
    return lpdf, epdf, keys


def online_all_spark(sg: SparkGraph, gamma: int, k: int) -> List[Community]:
    """OnlineAll: full-graph peel + a component extraction per keynode."""
    lpdf, epdf, keys = _full_labelling(sg, gamma)
    all_comms = _components_pandas(lpdf, epdf, keys)  # every community (slow)
    return all_comms[:k]


def forward_spark(sg: SparkGraph, gamma: int, k: int) -> List[Community]:
    """Forward: full-graph peel + components for the top-k keynodes only."""
    lpdf, epdf, keys = _full_labelling(sg, gamma)
    return _components_pandas(lpdf, epdf, keys[:k])


def local_search_oa_spark(
    sg: SparkGraph, k: int, gamma: int, delta: float = 2.0
) -> List[Community]:
    """LocalSearch-OA (Eval-III): Algorithm 1's loop, but counting by
    OnlineAll-style enumeration (a component extraction per keynode) instead
    of CountIC — the strawman that motivates the dedicated counting
    algorithm."""
    import math

    from repro.core.enum_ic import enumerate_driver

    tau_min = sg.tau_min()
    tau = sg.tau_for_rank(k + gamma)
    while True:
        sub = sg.subgraph_ge(tau)
        surv = survival_threshold(sub.vertices, sub.edges, gamma)
        lpdf = surv.labels.filter(F.col("T") > float("-inf")).toPandas()
        keep = set(lpdf["id"].astype(int))
        epdf = sub.edges.select("src", "dst").toPandas()
        epdf = epdf[epdf["src"].isin(keep) & epdf["dst"].isin(keep)]
        keyed = lpdf[lpdf["T"] == lpdf["weight"]].sort_values("weight", ascending=False)
        keys = list(zip(keyed["id"].astype(int), keyed["weight"].astype(float)))
        cnt = len(_components_pandas(lpdf, epdf, keys))  # enumerate to count
        if cnt >= k or tau <= tau_min:
            break
        tau = sg.tau_for_size(math.ceil(delta * sg.size_at_tau(tau)))
    return enumerate_driver(surv.labels, sub.edges, k)


def backward_spark(
    sg: SparkGraph, k: int, gamma: int
) -> List[Community]:
    """Backward stand-in: arithmetic-growth local search (quadratic shape).

    Same driver loop as LocalSearch but the subgraph grows by a constant
    ``size`` increment per round (the §3.3 Remark's schedule), re-running
    the distributed CountIC from scratch each round.
    """
    from repro.core.enum_ic import enumerate_driver
    from repro.kernels.survival import count_keynodes

    tau_min = sg.tau_min()
    tau = sg.tau_for_rank(k + gamma)
    step = max(1, sg.size_at_tau(tau))
    while True:
        sub = sg.subgraph_ge(tau)
        surv = survival_threshold(sub.vertices, sub.edges, gamma)
        if count_keynodes(surv.labels) >= k or tau <= tau_min:
            break
        tau = sg.tau_for_size(sg.size_at_tau(tau) + step)
    return enumerate_driver(surv.labels, sub.edges, k)
