"""Disk layout for the semi-external algorithms (Eval-VI).

Following the §3.1 Remark / [27]: edges are sorted in **decreasing weight
order** — the weight of an edge being the minimum weight of its endpoints
(``w_min``) — and stored in fixed-size parquet blocks, so the edges of
``G≥τ_{i+1}`` that are not in ``G≥τ_i`` occupy a consecutive run of blocks
and are loaded sequentially. Vertex-level information (the weights array)
is assumed memory-resident, as in the paper's semi-external model.

``EdgeBlockStore`` accounts every read at block granularity (bytes and
block count), which Eval-VI reports alongside wall time and peak resident
edges.
"""
from __future__ import annotations

import glob
import os
from dataclasses import dataclass, field
from typing import Iterator, List, Tuple

import numpy as np
import pandas as pd

from repro.ref.graph import RefGraph


@dataclass
class IOStats:
    blocks_read: int = 0
    bytes_read: int = 0
    peak_resident_edges: int = 0
    full_scans: int = 0


@dataclass
class EdgeBlockStore:
    """Weight-sorted edge blocks on the local filesystem."""

    path: str
    block_files: List[str] = field(default_factory=list)
    stats: IOStats = field(default_factory=IOStats)

    # ------------------------------------------------------------ write side
    @staticmethod
    def write(path: str, g: RefGraph, block_edges: int = 4096) -> "EdgeBlockStore":
        """Persist ``g``: vertices.parquet + block_%05d.parquet (desc w_min)."""
        os.makedirs(path, exist_ok=True)
        vp = pd.DataFrame(
            {"id": list(g.weight), "weight": [g.weight[v] for v in g.weight]}
        )
        vp.to_parquet(os.path.join(path, "vertices.parquet"))
        el = g.edge_list()
        w_min = np.array([min(g.weight[a], g.weight[b]) for a, b in el])
        order = np.argsort(-w_min, kind="stable")
        ep = pd.DataFrame(el, columns=["src", "dst"]).iloc[order].reset_index(drop=True)
        ep["w_min"] = w_min[order]
        files = []
        for i in range(0, max(len(ep), 1), block_edges):
            f = os.path.join(path, f"block_{i // block_edges:05d}.parquet")
            ep.iloc[i : i + block_edges].to_parquet(f)
            files.append(f)
        return EdgeBlockStore(path=path, block_files=files)

    @staticmethod
    def open(path: str) -> "EdgeBlockStore":
        return EdgeBlockStore(
            path=path,
            block_files=sorted(glob.glob(os.path.join(path, "block_*.parquet"))),
        )

    # ------------------------------------------------------------- read side
    def vertices(self) -> pd.DataFrame:
        """Vertex table — memory-resident per the semi-external model
        (not counted as edge I/O)."""
        return pd.read_parquet(os.path.join(self.path, "vertices.parquet"))

    @property
    def n_blocks(self) -> int:
        return len(self.block_files)

    def read_block(self, i: int) -> pd.DataFrame:
        f = self.block_files[i]
        self.stats.blocks_read += 1
        self.stats.bytes_read += os.path.getsize(f)
        return pd.read_parquet(f)

    def scan(self) -> Iterator[pd.DataFrame]:
        """One sequential pass over all blocks in decreasing weight order."""
        self.stats.full_scans += 1
        for i in range(self.n_blocks):
            yield self.read_block(i)

    def note_resident(self, n_edges: int) -> None:
        self.stats.peak_resident_edges = max(self.stats.peak_resident_edges, n_edges)
