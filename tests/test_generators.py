"""Generators and weight assignment: determinism, shapes, invariants."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import (
    DATASETS,
    chung_lu_edges,
    dataset_edges,
    dblp_like,
    planted_community_edges,
    social_graph,
)
from repro.graphs.weights import (
    as_ref_graph,
    build_dataset_pandas,
    distinct_weights_from_scores,
    pagerank_numpy,
    pagerank_weights,
)


def _canonical(df: pd.DataFrame) -> bool:
    return bool((df["src"] < df["dst"]).all())


class TestChungLu:
    def test_deterministic(self):
        a = chung_lu_edges(500, 2000, seed=3)
        b = chung_lu_edges(500, 2000, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_graph(self):
        a = chung_lu_edges(500, 2000, seed=3)
        b = chung_lu_edges(500, 2000, seed=4)
        assert not a.equals(b)

    def test_canonical_no_self_loops_no_dupes(self):
        df = chung_lu_edges(400, 1500, seed=0)
        assert _canonical(df)
        assert not df.duplicated().any()

    def test_edge_count_close_to_target(self):
        df = chung_lu_edges(2000, 8000, seed=1)
        assert 0.9 * 8000 <= len(df) <= 8000

    def test_heavy_tail(self):
        df = chung_lu_edges(3000, 15000, seed=2, alpha=2.2)
        deg = np.zeros(3000)
        np.add.at(deg, df["src"].to_numpy(), 1)
        np.add.at(deg, df["dst"].to_numpy(), 1)
        assert deg.max() > 8 * deg.mean()


class TestPlanted:
    def test_intra_density(self):
        df = planted_community_edges(1000, 10, 20, 20, p_intra=1.0, seed=5)
        # 10 disjoint-ish 20-cliques ≈ 10·190 edges minus overlap losses.
        assert len(df) > 1500

    def test_canonical(self):
        df = planted_community_edges(500, 8, 5, 25, 0.6, seed=6)
        assert _canonical(df) and not df.duplicated().any()


class TestSocialGraph:
    def test_union_has_both_parts(self):
        df = social_graph(1000, 3000, 12, seed=9)
        assert len(df) > 3000  # background + planted
        assert _canonical(df) and not df.duplicated().any()

    def test_deterministic(self):
        pd.testing.assert_frame_equal(
            social_graph(800, 2000, 8, seed=2), social_graph(800, 2000, 8, seed=2)
        )


class TestDatasets:
    @pytest.mark.parametrize("name", sorted(DATASETS))
    def test_scaled_down_specs(self, name):
        df = dataset_edges(name, scale=0.05)
        spec = DATASETS[name]
        assert len(df) >= 0.04 * spec.m * 0.8
        assert df[["src", "dst"]].to_numpy().max() < max(32, int(spec.n * 0.05))

    def test_all_eight_paper_graphs_present(self):
        assert sorted(DATASETS) == [
            "arabic", "email", "livejournal", "orkut",
            "twitter", "uk", "wiki", "youtube",
        ]

    def test_paper_stats_recorded(self):
        assert DATASETS["twitter"].paper.m == 1_468_365_182
        assert DATASETS["email"].paper.gamma_max == 43


class TestWeights:
    def test_pagerank_sums_to_one(self):
        df = chung_lu_edges(300, 900, seed=1)
        pr = pagerank_numpy(df, 300)
        assert pr.sum() == pytest.approx(1.0, abs=1e-6)

    def test_pagerank_favors_hubs(self):
        # star graph: center must have the top PageRank score
        df = pd.DataFrame({"src": np.zeros(50, dtype=np.int64),
                           "dst": np.arange(1, 51, dtype=np.int64)})
        pr = pagerank_numpy(df, 51)
        assert pr.argmax() == 0

    def test_distinct_weights_preserve_order(self):
        scores = np.array([0.5, 0.1, 0.5, 0.9])
        w = distinct_weights_from_scores(scores)
        assert len(set(w)) == 4
        assert w[3] == 4.0  # highest score → highest weight
        assert w[0] < w[2]  # tie broken by id

    def test_pagerank_weights_distinct(self):
        df = chung_lu_edges(500, 1200, seed=8)
        w = pagerank_weights(df, 500)
        assert len(np.unique(w)) == 500

    def test_as_ref_graph_round_trip(self):
        vertices, edges = build_dataset_pandas("email", scale=0.02)
        g = as_ref_graph(edges, vertices)
        assert g.n == len(vertices)
        assert g.n_edges == len(edges)
        # weight-sorted order invariant
        ws = [g.weight[v] for v in g.order]
        assert ws == sorted(ws, reverse=True)


class TestDblpLike:
    def test_basic(self):
        df = dblp_like(n=400, n_groups=80)
        assert _canonical(df) and len(df) > 400
