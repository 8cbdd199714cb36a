"""Sequential core decomposition (min-degree peeling).

Used for Table 1's γmax column at benchmark scale (the distributed h-index
kernel in ``repro.kernels.coreness`` computes the same numbers and is
validated against this). Heap-based peel: O(m log n), plenty at ~1 M edges.
"""
from __future__ import annotations

import heapq
from typing import Dict

from .graph import RefGraph


def core_numbers(g: RefGraph) -> Dict[int, int]:
    """Core number of every vertex (max γ with v in the γ-core)."""
    adj = g.copy_adj()
    cur = {v: len(adj[v]) for v in g.weight}
    heap = [(d, v) for v, d in cur.items()]
    heapq.heapify(heap)
    removed = set()
    core: Dict[int, int] = {}
    k = 0
    while heap:
        d, v = heapq.heappop(heap)
        if v in removed or d != cur[v]:
            continue  # stale heap entry
        k = max(k, d)
        core[v] = k
        removed.add(v)
        for w in adj[v]:
            if w not in removed:
                adj[w].discard(v)
                cur[w] -= 1
                heapq.heappush(heap, (cur[w], w))
    return core


def gamma_max_ref(g: RefGraph) -> int:
    """Largest γ such that the γ-core is non-empty."""
    cn = core_numbers(g)
    return max(cn.values(), default=0)
