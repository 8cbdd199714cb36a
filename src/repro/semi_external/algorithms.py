"""Semi-external LocalSearch-SE and OnlineAll-SE (Eval-VI).

**LocalSearch-SE** is the §3.1 Remark's algorithm: the progressive local
search where each subgraph enlargement loads the next consecutive run of
weight-sorted edge blocks from disk. Only the prefix of the file covering
the accessed subgraph ``G≥τ_h`` is ever read, and only those edges are
resident — both the I/O and the memory footprint inherit the
instance-optimal locality.

**OnlineAll-SE** is the global semi-external baseline. [27]'s variant keeps
a memory-budget worth of edges and evicts community edges after each batch;
its eviction/contraction bookkeeping is replaced here by an equivalent
bounded-memory scheme (substitution in DESIGN.md §4):

1. the survival threshold T is computed by the *streaming* fixed point —
   each iteration is one full sequential scan of the edge file, holding only
   per-vertex state (weights, labels, a size-γ top-heap), exactly the
   "constant information regarding vertices" the semi-external model allows;
2. one final full scan in decreasing weight order feeds a union-find whose
   pending buffer holds an edge only between its file position and its
   activation level min(T(a), T(b)), emitting every community at its
   keynode boundary.

The essential cost characteristics match [27]: whole-file scans (several of
them), memory bounded by vertex state + a small transit buffer, and total
work proportional to size(G) — versus LocalSearch-SE's prefix-only reads.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass
from typing import Dict, Iterator, List, Optional, Tuple

import numpy as np
import pandas as pd

from repro.ref.count_ic import count_ic
from repro.ref.enum_ic import Community, enum_ic
from repro.ref.graph import NEG_INF, RefGraph

from .storage import EdgeBlockStore


# --------------------------------------------------------------------------
# LocalSearch-SE
# --------------------------------------------------------------------------

def local_search_se(
    store: EdgeBlockStore, k: int, gamma: int, delta: float = 2.0
) -> Tuple[List[Community], EdgeBlockStore]:
    """Top-k communities reading only the needed weight-prefix of the file."""
    vp = store.vertices()
    weights: Dict[int, float] = dict(
        zip(vp["id"].astype(int), vp["weight"].astype(float))
    )
    order = sorted(weights, key=weights.get, reverse=True)
    loaded: List[Tuple[int, int]] = []
    loaded_adj: Dict[int, List[int]] = {}
    next_block = 0
    frontier_w = float("inf")  # min w_min loaded so far

    def load_until(tau: float) -> None:
        """Sequentially read blocks until every edge with w_min ≥ τ is in."""
        nonlocal next_block, frontier_w
        while next_block < store.n_blocks and frontier_w >= tau:
            blk = store.read_block(next_block)
            next_block += 1
            for a, b in zip(blk["src"].astype(int), blk["dst"].astype(int)):
                loaded.append((a, b))
                loaded_adj.setdefault(a, []).append(b)
                loaded_adj.setdefault(b, []).append(a)
            if len(blk):
                frontier_w = float(blk["w_min"].iloc[-1])
            store.note_resident(len(loaded))
        if next_block >= store.n_blocks:
            frontier_w = NEG_INF

    # Algorithm 1's driver over prefixes of the vertex order.
    r = min(len(order), k + gamma)
    keep = set()
    edge_count = 0
    while True:
        while len(keep) < r:  # extend prefix, keeping the edge count current
            v = order[len(keep)]
            load_until(weights[v])
            edge_count += sum(1 for x in loaded_adj.get(v, ()) if x in keep)
            keep.add(v)
        sub = RefGraph(
            {v: weights[v] for v in keep},
            [(a, b) for a, b in loaded if a in keep and b in keep],
        )
        peel = count_ic(sub, gamma)
        if peel.count >= k or r == len(order):
            break
        target = int(delta * sub.size) + 1
        while r < len(order):  # grow prefix until induced size ≥ target
            r += 1
            v = order[r - 1]
            load_until(weights[v])
            edge_count += sum(1 for x in loaded_adj.get(v, ()) if x in keep)
            keep.add(v)
            if len(keep) + edge_count >= target:
                break
    return enum_ic(sub, peel, k), store


# --------------------------------------------------------------------------
# OnlineAll-SE
# --------------------------------------------------------------------------

@dataclass
class _DSU:
    parent: Dict[int, int]
    members: Dict[int, List[int]]

    def find(self, v: int) -> int:
        r = v
        while self.parent[r] != r:
            r = self.parent[r]
        while self.parent[v] != r:
            self.parent[v], v = r, self.parent[v]
        return r

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return
        if len(self.members[ra]) < len(self.members[rb]):
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.members[ra].extend(self.members.pop(rb))


def _streaming_T(
    store: EdgeBlockStore, weights: np.ndarray, gamma: int, max_iter: int = 10_000
) -> np.ndarray:
    """Survival threshold by full-file-scan fixed-point iterations."""
    n = len(weights)
    L = weights.copy()
    for _ in range(max_iter):
        heaps: List[list] = [[] for _ in range(n)]

        def push(u: int, val: float) -> None:
            h = heaps[u]
            if len(h) < gamma:
                heapq.heappush(h, val)
            elif val > h[0]:
                heapq.heapreplace(h, val)

        for blk in store.scan():
            for a, b in zip(blk["src"].to_numpy(), blk["dst"].to_numpy()):
                push(int(a), L[b])
                push(int(b), L[a])
        newL = np.array(
            [
                min(weights[u], heaps[u][0]) if len(heaps[u]) == gamma else NEG_INF
                for u in range(n)
            ]
        )
        if np.array_equal(newL, L):
            return L
        L = newL
    return L


def online_all_se(
    store: EdgeBlockStore, gamma: int, k: Optional[int] = None
) -> Tuple[List[Community], EdgeBlockStore]:
    """All communities in decreasing influence order (top-``k`` if given)."""
    vp = store.vertices().sort_values("id")
    ids = vp["id"].to_numpy()
    assert np.array_equal(ids, np.arange(len(ids))), "contiguous ids expected"
    weights = vp["weight"].to_numpy().astype(float)
    T = _streaming_T(store, weights, gamma)
    key_mask = T == weights
    key_order = np.argsort(-weights[key_mask])
    keys = np.flatnonzero(key_mask)[key_order]  # decreasing weight
    dsu = _DSU(
        parent={int(v): int(v) for v in np.flatnonzero(T > NEG_INF)},
        members={int(v): [int(v)] for v in np.flatnonzero(T > NEG_INF)},
    )
    pending: Dict[float, List[Tuple[int, int]]] = {}
    out: List[Community] = []
    ki = 0
    resident = 0

    def settle_down_to(bound: float) -> None:
        """Union every buffered edge whose activation level is ≥ bound."""
        nonlocal resident
        for lvl in sorted((l for l in pending if l >= bound), reverse=True):
            for a, b in pending.pop(lvl):
                dsu.union(a, b)
                resident -= 1

    def emit_keys_strictly_above(frontier: float) -> None:
        """A keynode u finalizes once every edge with w_min ≥ ω(u) has been
        seen — i.e. when the stream frontier drops strictly below ω(u)."""
        nonlocal ki
        while ki < len(keys) and weights[keys[ki]] > frontier:
            u = int(keys[ki])
            settle_down_to(weights[u])
            out.append((float(weights[u]), frozenset(dsu.members[dsu.find(u)])))
            ki += 1

    for blk in store.scan():
        for a, b, wm in zip(
            blk["src"].to_numpy(), blk["dst"].to_numpy(), blk["w_min"].to_numpy()
        ):
            emit_keys_strictly_above(wm)
            lvl = min(T[a], T[b])
            if lvl > NEG_INF:
                pending.setdefault(float(lvl), []).append((int(a), int(b)))
                resident += 1
                store.note_resident(resident)
    emit_keys_strictly_above(NEG_INF)
    return (out[:k] if k is not None else out), store
