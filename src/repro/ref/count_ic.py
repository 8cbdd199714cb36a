"""Exact sequential CountIC (Algorithm 2) and ConstructCVS (Algorithm 5).

``count_ic`` reduces the input graph to its γ-core, then repeatedly pops the
minimum-weight vertex ``u`` (a *keynode*, Lemma 3.5), removes it and restores
the γ-core with the queue-based ``Remove`` procedure. Each removed vertex is
appended to the community-aware vertex sequence ``cvs``; the number of
influential γ-communities equals ``len(keys)`` (Lemma 3.4).

``construct_cvs`` is the progressive variant (Algorithm 5): it stops as soon
as the next minimum-weight vertex has weight ≥ ``tau_stop``, producing only
the *prefix* of ``keys``/``cvs`` that the previous (smaller) subgraph did not
already cover.

The module also contains independent brute-force definitions
(:func:`gamma_core_set`, :func:`survival_threshold_brute`,
:func:`keynodes_brute`) used as oracles in the tests — they recompute suffix
γ-cores from scratch and never share code with the peel.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Set, Tuple

from .graph import NEG_INF, RefGraph


@dataclass
class PeelResult:
    """Output of CountIC/ConstructCVS.

    ``keys``: keynodes in increasing weight order (pop order).
    ``cvs``: community-aware vertex sequence, aligned with ``keys`` — the
    vertices removed while popping ``keys[i]`` form the i-th group.
    ``precore_removed``: vertices dropped by the initial γ-core reduction
    (not part of ``cvs``, per Algorithm 2 Lines 1–3).
    ``survivors``: vertices still alive when the peel stopped (empty unless
    ``tau_stop`` made ConstructCVS break early).
    ``nc_flags``: for each keynode, whether it is a *non-containment* keynode
    (§5.1): no vertex removed in its group has an edge to a survivor of the
    group's removal.
    """

    keys: List[int] = field(default_factory=list)
    cvs: List[int] = field(default_factory=list)
    precore_removed: List[int] = field(default_factory=list)
    survivors: Set[int] = field(default_factory=set)
    nc_flags: List[bool] = field(default_factory=list)

    @property
    def count(self) -> int:
        return len(self.keys)

    def groups(self) -> List[List[int]]:
        """Split ``cvs`` into per-keynode groups gp(u) (§3.2.2)."""
        key_set = set(self.keys)
        out: List[List[int]] = []
        for v in self.cvs:
            if v in key_set:
                out.append([v])
            else:
                out[-1].append(v)
        return out


class _Peeler:
    """Mutable peel state over a RefGraph (γ-core maintenance)."""

    def __init__(self, g: RefGraph, gamma: int, prefix: Optional[int] = None):
        """Peel the whole graph, or — via ``prefix=r`` — the subgraph induced
        by the ``r`` highest-weight vertices, materialized in O(its size)
        straight from the pre-partitioned ``N≥`` adjacency (§3.1 ★★): every
        neighbor in ``N≥(u)`` of a prefix vertex ``u`` is itself in the
        prefix, so the induced edges are exactly ∪_u {u} × N≥(u)."""
        if gamma < 1:
            raise ValueError("gamma must be >= 1")
        self.g = g
        self.gamma = gamma
        if prefix is None:
            self.adj = g.copy_adj()
            self.alive: Set[int] = set(g.weight)
        else:
            keep = g.order[: min(prefix, g.n)]
            self.adj = {v: set() for v in keep}
            for u in keep:
                for v in g.n_ge(u):
                    self.adj[u].add(v)
                    self.adj[v].add(u)
            self.alive = set(keep)
        self.deg = {u: len(nbrs) for u, nbrs in self.adj.items()}
        # Min-heap over (weight, vertex) drives the arg-min of Line 5.
        self.heap: List[Tuple[float, int]] = [(g.weight[u], u) for u in self.alive]
        heapq.heapify(self.heap)

    def reduce_core(self) -> List[int]:
        """Initial γ-core reduction (Algorithm 2, Line 1)."""
        removed: List[int] = []
        queue = [u for u in self.alive if self.deg[u] < self.gamma]
        queued = set(queue)
        while queue:
            v = queue.pop()
            for w in self.adj[v]:
                self.deg[w] -= 1
                if self.deg[w] < self.gamma and w in self.alive and w not in queued:
                    queue.append(w)
                    queued.add(w)
            self.alive.discard(v)
            self.adj_remove(v)
            removed.append(v)
        return removed

    def adj_remove(self, v: int) -> None:
        for w in self.adj[v]:
            self.adj[w].discard(v)
        self.adj[v] = set()

    def pop_min(self) -> Optional[int]:
        while self.heap:
            _, u = self.heap[0]
            if u in self.alive:
                return u
            heapq.heappop(self.heap)
        return None

    def remove_cascade(self, u: int) -> List[int]:
        """Procedure ``Remove(u, g, cvs)`` of Algorithm 2.

        Removes ``u`` and restores the γ-core; returns the removed vertices
        in removal order (the cvs group of ``u``).
        """
        removed: List[int] = []
        queue = [u]
        queued = {u}
        qi = 0
        while qi < len(queue):
            v = queue[qi]
            qi += 1
            for w in list(self.adj[v]):
                # Line 13: push w when its degree is exactly γ (about to drop
                # below γ once v goes); each vertex enters the queue once.
                if self.deg[w] == self.gamma and w not in queued:
                    queue.append(w)
                    queued.add(w)
            for w in self.adj[v]:
                self.deg[w] -= 1
            self.alive.discard(v)
            self.adj_remove(v)
            removed.append(v)
        return removed

    def has_edge_to_alive(self, vertices: List[int]) -> bool:
        """Does any of ``vertices`` touch a currently-alive vertex?

        Used for the non-containment keynode test of §5.1 (checked on the
        *original* adjacency because the peel already cleared these rows).
        """
        return any(w in self.alive for v in vertices for w in self.g.adj[v])


def count_ic(
    g: RefGraph,
    gamma: int,
    tau_stop: Optional[float] = None,
    prefix: Optional[int] = None,
) -> PeelResult:
    """Algorithm 2 (``tau_stop=None``) / Algorithm 5 (``tau_stop=τ``).

    With ``prefix=r`` the peel runs on the top-``r`` induced subgraph,
    extracted in linear time from the N≥ adjacency split — the form every
    local-search driver uses. Runs in O(size of the peeled graph): every
    vertex is popped/queued at most once, each edge touched O(1) times.
    """
    peeler = _Peeler(g, gamma, prefix=prefix)
    res = PeelResult()
    res.precore_removed = peeler.reduce_core()
    while True:
        u = peeler.pop_min()
        if u is None:
            break
        if tau_stop is not None and g.weight[u] >= tau_stop:
            break
        res.keys.append(u)
        group = peeler.remove_cascade(u)
        res.cvs.extend(group)
        res.nc_flags.append(not peeler.has_edge_to_alive(group))
    res.survivors = set(peeler.alive)
    return res


construct_cvs = count_ic  # Algorithm 5 is Algorithm 2 with a stop threshold.


# --------------------------------------------------------------------------
# Brute-force oracles (test-only; deliberately independent of the peel).
# --------------------------------------------------------------------------

def gamma_core_set(weights: Dict[int, float], edges: List[Tuple[int, int]], gamma: int) -> Set[int]:
    """Vertices of the γ-core, by naive repeated scanning (O(n·m))."""
    alive = set(weights)
    adj: Dict[int, Set[int]] = {v: set() for v in alive}
    for u, v in edges:
        adj[u].add(v)
        adj[v].add(u)
    changed = True
    while changed:
        changed = False
        for v in list(alive):
            if sum(1 for w in adj[v] if w in alive) < gamma:
                alive.discard(v)
                changed = True
    return alive


def survival_threshold_brute(g: RefGraph, gamma: int) -> Dict[int, float]:
    """``T(v) = max{τ : v ∈ γ-core(G≥τ)}`` by recomputing every suffix core.

    This is the bridge invariant between the sequential peel and the
    distributed fixed point (see DESIGN.md §2): CountIC pops keynode ``u``
    exactly when the remaining graph is γ-core(G≥ω(u)), hence
    ``keys = {u : T(u) = ω(u)}`` and cvs groups are the T-bands between
    consecutive keynode weights.
    """
    T = {v: NEG_INF for v in g.weight}
    edges = g.edge_list()
    for tau in sorted({g.weight[v] for v in g.weight}, reverse=True):
        keep = {v for v in g.weight if g.weight[v] >= tau}
        sub_edges = [(u, v) for u, v in edges if u in keep and v in keep]
        core = gamma_core_set({v: g.weight[v] for v in keep}, sub_edges, gamma)
        for v in core:
            if T[v] == NEG_INF:
                T[v] = tau  # first (largest) τ at which v appears in the core
    return T


def keynodes_brute(g: RefGraph, gamma: int) -> List[int]:
    """Keynodes = vertices surviving the γ-core of their own weight suffix."""
    T = survival_threshold_brute(g, gamma)
    ks = [v for v in g.weight if T[v] == g.weight[v]]
    return sorted(ks, key=g.weight.get)
