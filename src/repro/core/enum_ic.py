"""Community enumeration from a survival labelling (distributed EnumIC).

Given the survival threshold ``T`` on a subgraph (the distributed CountIC
output, see ``repro.kernels.survival``), the influential γ-community of a
keynode ``u`` is the connected component of ``u`` in the subgraph induced by
``{v : T(v) ≥ ω(u)}``.

Two interchangeable implementations (equality is property-tested):

* ``enumerate_driver`` — collects the **accessed subgraph** (labels + edges)
  to the driver and extracts the top-k components there. The paper's whole
  point is that this subgraph is tiny (≤0.073 % of G at k=10, γ=10 across
  its datasets), so after the distributed counting phase the driver-side
  extraction is O(k · size(G≥τ_h)) on a few thousand rows. This mirrors the
  paper's Algorithm 3 running on the final subgraph.
* ``enumerate_distributed`` — per top-k keynode, a hash-min connected-
  components run on the T-filtered DataFrame. Fully distributed; used when
  the final subgraph is too large to collect.
"""
from __future__ import annotations

from typing import Dict, FrozenSet, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.kernels.connected_components import connected_components

Community = Tuple[float, FrozenSet[int]]


def top_keynodes(labels: DataFrame, k: int) -> List[Tuple[int, float]]:
    """The k keynodes of highest weight: ``[(id, weight)]`` descending."""
    rows = (
        labels.filter(F.col("T") == F.col("weight"))
        .orderBy(F.col("weight").desc())
        .limit(k)
        .collect()
    )
    return [(int(r["id"]), float(r["weight"])) for r in rows]


def _components_pandas(
    labels: pd.DataFrame, edges: pd.DataFrame, keys: List[Tuple[int, float]]
) -> List[Community]:
    """Suffix-BFS extraction of each keynode's component (driver side)."""
    T: Dict[int, float] = dict(zip(labels["id"].astype(int), labels["T"].astype(float)))
    adj: Dict[int, list] = {}
    for s, d in zip(edges["src"].astype(int), edges["dst"].astype(int)):
        adj.setdefault(s, []).append(d)
        adj.setdefault(d, []).append(s)
    out: List[Community] = []
    for u, w in keys:
        comp = {u}
        stack = [u]
        while stack:
            v = stack.pop()
            for x in adj.get(v, ()):
                if x not in comp and T.get(x, float("-inf")) >= w:
                    comp.add(x)
                    stack.append(x)
        out.append((w, frozenset(comp)))
    return out


def enumerate_driver(labels: DataFrame, edges: DataFrame, k: int) -> List[Community]:
    """Collect the (small) accessed subgraph, extract top-k on the driver."""
    keys = top_keynodes(labels, k)
    if not keys:
        return []
    tau_k = keys[-1][1]
    lpdf = labels.filter(F.col("T") >= tau_k).select("id", "T").toPandas()
    epdf = edges.select("src", "dst").toPandas()
    return _components_pandas(lpdf, epdf, keys)


def enumerate_distributed(
    labels: DataFrame, edges: DataFrame, k: int
) -> List[Community]:
    """Per-keynode distributed connected components on the T-filtered graph."""
    keys = top_keynodes(labels, k)
    out: List[Community] = []
    for u, w in keys:
        vs = labels.filter(F.col("T") >= w).select("id")
        es = (
            edges.join(vs.withColumnRenamed("id", "src"), "src")
            .join(vs.withColumnRenamed("id", "dst"), "dst")
            .select("src", "dst")
        )
        comp = connected_components(vs, es)
        cid = comp.filter(F.col("id") == u).collect()[0]["component"]
        members = comp.filter(F.col("component") == cid).select("id").collect()
        out.append((w, frozenset(int(r["id"]) for r in members)))
    return out
