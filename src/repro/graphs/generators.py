"""Synthetic graph generators — scaled analogs of the paper's real graphs.

The paper evaluates on eight SNAP / LAW graphs (Table 1) plus a DBLP
co-author network (Eval-IX). The container is offline and the originals run
to 1.5 B edges, so we generate **Chung–Lu power-law graphs with planted
dense communities** instead (substitution recorded in DESIGN.md §4):

* the Chung–Lu background reproduces the heavy-tailed degree distribution
  (d_max ≫ d_avg, Table 1's signature), and
* the planted communities create the non-trivial γ-cores / γ-trusses and the
  deep keynode structure that influential-community search exercises
  (pure sparse Chung–Lu graphs have shallow cores).

Everything is deterministic in ``seed`` and pure NumPy on the driver; the
result is a canonical undirected edge list (``src < dst``) as a pandas
DataFrame, which ``repro.graphs.storage`` turns into Spark DataFrames and
``as_ref_graph`` turns into the sequential substrate.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Optional, Tuple

import numpy as np
import pandas as pd


def _dedupe(src: np.ndarray, dst: np.ndarray) -> Tuple[np.ndarray, np.ndarray]:
    """Canonicalize to src<dst, drop self-loops and duplicates."""
    lo = np.minimum(src, dst)
    hi = np.maximum(src, dst)
    keep = lo != hi
    lo, hi = lo[keep], hi[keep]
    key = lo.astype(np.int64) * np.int64(1 << 32) + hi.astype(np.int64)
    _, idx = np.unique(key, return_index=True)
    return lo[idx], hi[idx]


def chung_lu_edges(
    n: int, m: int, alpha: float = 2.5, seed: int = 0
) -> pd.DataFrame:
    """Power-law background graph: m edge samples with endpoint probability
    proportional to rank^(−1/(α−1)) (expected-degree / Chung–Lu model)."""
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks ** (-1.0 / (alpha - 1.0))
    p = w / w.sum()
    # Oversample to survive dedupe losses.
    m_try = int(m * 1.35) + 16
    src = g.choice(n, size=m_try, p=p)
    dst = g.choice(n, size=m_try, p=p)
    lo, hi = _dedupe(src, dst)
    if len(lo) > m:
        sel = g.permutation(len(lo))[:m]
        lo, hi = lo[sel], hi[sel]
    return pd.DataFrame({"src": lo.astype(np.int64), "dst": hi.astype(np.int64)})


def planted_community_edges(
    n: int,
    n_comm: int,
    size_min: int,
    size_max: int,
    p_intra: float,
    seed: int = 1,
) -> pd.DataFrame:
    """Dense vertex blocks planted over ids drawn from [0, n).

    Community sizes are log-uniform in [size_min, size_max]; members are
    random vertex ids (communities may overlap, like real social graphs);
    intra-community edges appear independently with probability ``p_intra``.
    """
    g = np.random.default_rng(seed)
    srcs, dsts = [], []
    sizes = np.exp(
        g.uniform(np.log(size_min), np.log(size_max), size=n_comm)
    ).astype(int)
    for s in sizes:
        members = g.choice(n, size=min(s, n), replace=False)
        iu, ju = np.triu_indices(len(members), k=1)
        mask = g.random(len(iu)) < p_intra
        srcs.append(members[iu[mask]])
        dsts.append(members[ju[mask]])
    if not srcs:
        return pd.DataFrame({"src": [], "dst": []}).astype(np.int64)
    lo, hi = _dedupe(np.concatenate(srcs), np.concatenate(dsts))
    return pd.DataFrame({"src": lo.astype(np.int64), "dst": hi.astype(np.int64)})


def social_graph(
    n: int,
    m: int,
    n_comm: int,
    size_min: int = 8,
    size_max: int = 40,
    p_intra: float = 0.7,
    alpha: float = 2.5,
    seed: int = 0,
    n_peripheral: int = 0,
    peri_min: int = 12,
    peri_max: int = 26,
) -> pd.DataFrame:
    """Chung–Lu background + planted communities (+ peripheral cliques).

    *Peripheral* communities are dense blocks whose members carry **no**
    background edges: they model the dense-but-weakly-attached groups that
    real social graphs have in abundance and that become the paper's
    non-containment communities (§5.1). Their member ids occupy the
    reserved top id range, which the background generator never touches.
    """
    n_peri_vertices = 0
    peri_frames = []
    if n_peripheral > 0:
        g = np.random.default_rng(seed + 2)
        sizes = g.integers(peri_min, peri_max + 1, size=n_peripheral)
        # Cap the reserved range at half the graph (tiny test scales).
        while len(sizes) > 1 and sizes.sum() > n // 2:
            sizes = sizes[:-1]
        n_peri_vertices = int(sizes.sum())
        srcs, dsts = [], []
        base = n - n_peri_vertices
        for s in sizes:
            members = np.arange(base, base + s)
            base += s
            iu, ju = np.triu_indices(s, k=1)
            mask = g.random(len(iu)) < 0.9
            srcs.append(members[iu[mask]])
            dsts.append(members[ju[mask]])
        peri_frames.append(
            pd.DataFrame(
                {"src": np.concatenate(srcs), "dst": np.concatenate(dsts)}
            )
        )
    n_main = max(32, n - n_peri_vertices)
    bg = chung_lu_edges(n_main, m, alpha=alpha, seed=seed)
    pc = planted_community_edges(
        n_main, n_comm, size_min, size_max, p_intra, seed=seed + 1
    )
    both = pd.concat([bg, pc, *peri_frames], ignore_index=True)
    lo, hi = _dedupe(both["src"].to_numpy(), both["dst"].to_numpy())
    return pd.DataFrame({"src": lo, "dst": hi})


@dataclass(frozen=True)
class PaperStats:
    """Table 1's row for the original graph (for EXPERIMENTS.md diffs)."""

    n: int
    m: int
    d_max: int
    d_avg: float
    gamma_max: int


@dataclass(frozen=True)
class DatasetSpec:
    """A scaled analog: target size plus planted-community shape."""

    name: str
    n: int
    m: int
    n_comm: int
    size_max: int
    p_intra: float
    scale_note: str
    paper: PaperStats
    alpha: float = 2.5
    seed: int = 7
    n_peripheral: int = 40  # dense weakly-attached blocks (NC supply, §5.1)
    peri_min: int = 22
    peri_max: int = 34


DATASETS: Dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("email", 3_669, 18_383, 60, 48, 0.8, "1/10 of Email",
                    PaperStats(36_692, 183_831, 1_383, 10.02, 43), n_peripheral=24),
        DatasetSpec("youtube", 11_349, 29_876, 120, 48, 0.8, "1/100 of Youtube",
                    PaperStats(1_134_890, 2_987_624, 28_754, 5.27, 51), n_peripheral=40),
        DatasetSpec("wiki", 17_915, 254_460, 220, 64, 0.8, "1/100 of Wiki",
                    PaperStats(1_791_489, 25_446_040, 238_342, 28.41, 99), n_peripheral=48),
        DatasetSpec("livejournal", 19_990, 173_406, 260, 72, 0.8, "1/200 of Livejournal",
                    PaperStats(3_997_962, 34_681_189, 14_815, 17.35, 360), n_peripheral=48),
        DatasetSpec("orkut", 15_363, 585_925, 260, 80, 0.8, "1/200 of Orkut",
                    PaperStats(3_072_627, 117_185_083, 33_313, 76.28, 253), n_peripheral=48),
        DatasetSpec("arabic", 22_744, 553_903, 320, 96, 0.85, "1/1000 of Arabic",
                    PaperStats(22_744_080, 553_903_073, 575_628, 48.71, 3_247), n_peripheral=56),
        DatasetSpec("uk", 39_460, 783_027, 300, 72, 0.8, "1/1000 of UK",
                    PaperStats(39_459_925, 783_027_125, 1_776_858, 39.69, 588), n_peripheral=56),
        DatasetSpec("twitter", 27_768, 978_910, 320, 88, 0.85, "1/1500 of Twitter",
                    PaperStats(41_652_230, 1_468_365_182, 2_997_487, 70.51, 2_488), n_peripheral=56),
    ]
}


def dataset_edges(name: str, scale: float = 1.0, seed: Optional[int] = None) -> pd.DataFrame:
    """Edge list for a named analog, optionally rescaled (scale ≤ 1 shrinks).

    ``scale`` multiplies n/m/community counts (block sizes are kept), so
    tests can run the same shapes at a fraction of the benchmark size.
    """
    spec = DATASETS[name]
    n = max(32, int(spec.n * scale))
    m = max(64, int(spec.m * scale))
    n_comm = max(4, int(spec.n_comm * scale))
    n_peri = max(2, int(spec.n_peripheral * scale)) if spec.n_peripheral else 0
    return social_graph(
        n,
        m,
        n_comm,
        size_max=spec.size_max,
        p_intra=spec.p_intra,
        alpha=spec.alpha,
        seed=spec.seed if seed is None else seed,
        n_peripheral=n_peri,
        peri_min=spec.peri_min,
        peri_max=spec.peri_max,
    )


def dblp_like(
    n: int = 1_743,
    n_groups: int = 420,
    group_min: int = 3,
    group_max: int = 14,
    p_intra: float = 0.9,
    seed: int = 11,
) -> pd.DataFrame:
    """Co-author-style graph for the Eval-IX case study.

    Collaboration groups are overlapping near-cliques (papers' author sets);
    ``n`` defaults to the 1 743 researchers of the paper's DBLP extraction.
    """
    return planted_community_edges(
        n, n_groups, group_min, group_max, p_intra=p_intra, seed=seed
    )
