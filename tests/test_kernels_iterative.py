"""Iterative Pregel-style kernels vs the exact sequential references."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.weights import pagerank_numpy
from repro.kernels.connected_components import connected_components
from repro.kernels.coreness import coreness, gamma_max
from repro.kernels.gamma_core import gamma_core
from repro.kernels.ktruss import gamma_truss, gamma_truss_subgraph
from repro.kernels.pagerank import pagerank, pagerank_rank_weights
from repro.kernels.survival import count_keynodes, keynodes, survival_threshold
from repro.ref.count_ic import count_ic, gamma_core_set, survival_threshold_brute
from repro.ref.graph import NEG_INF
from repro.ref.truss import truss_edges_brute

from .paper_graphs import fig3_graph
from .spark_helpers import random_ref_graph, ref_to_pandas, ref_to_spark


@pytest.fixture(scope="module")
def g3(spark):
    ref = fig3_graph()
    return ref, ref_to_spark(spark, ref)


@pytest.fixture(scope="module")
def grand(spark):
    ref = random_ref_graph(80, 260, seed=11)
    return ref, ref_to_spark(spark, ref)


class TestGammaCore:
    @pytest.mark.parametrize("gamma", [1, 2, 3, 4])
    def test_matches_brute(self, grand, gamma):
        ref, sg = grand
        v, e = gamma_core(sg.vertices, sg.edges, gamma)
        got = {r["id"] for r in v.select("id").collect()}
        want = gamma_core_set(ref.weight, ref.edge_list(), gamma)
        assert got == want

    def test_fig3_core_of_g_ge_12(self, g3):
        # Example 3.2: the γ-core of G≥12 loses exactly {v9, v17, v18}.
        ref, sg = g3
        sub = sg.subgraph_ge(12.0)
        v, e = gamma_core(sub.vertices, sub.edges, 3)
        got = {r["id"] for r in v.select("id").collect()}
        assert got == {3, 20, 12, 11, 16, 1, 6, 7, 13, 5}

    def test_empty_core(self, g3):
        ref, sg = g3
        v, e = gamma_core(sg.vertices, sg.edges, 10)
        assert v.count() == 0 and e.count() == 0


class TestConnectedComponents:
    def test_matches_ref_components(self, grand):
        ref, sg = grand
        lbl = connected_components(sg.vertices, sg.edges).toPandas()
        comp = dict(zip(lbl["id"], lbl["component"]))
        # same component iff same label — check against BFS on the ref graph
        seen = {}
        for v in ref.weight:
            if v in seen:
                continue
            stack, members = [v], {v}
            while stack:
                x = stack.pop()
                for y in ref.adj[x]:
                    if y not in members:
                        members.add(y)
                        stack.append(y)
            root = min(members)
            for u in members:
                seen[u] = root
        assert comp == seen


class TestSurvivalThreshold:
    @pytest.mark.parametrize("gamma", [2, 3, 4])
    def test_T_matches_brute(self, g3, gamma):
        ref, sg = g3
        res = survival_threshold(sg.vertices, sg.edges, gamma)
        got = {r["id"]: r["T"] for r in res.labels.collect()}
        want = survival_threshold_brute(ref, gamma)
        assert got == want

    def test_random_graph_T(self, grand):
        ref, sg = grand
        res = survival_threshold(sg.vertices, sg.edges, 3)
        got = {r["id"]: r["T"] for r in res.labels.collect()}
        assert got == survival_threshold_brute(ref, 3)

    def test_keynode_count_equals_countic(self, grand):
        ref, sg = grand
        for gamma in (2, 3):
            res = survival_threshold(sg.vertices, sg.edges, gamma)
            assert count_keynodes(res.labels) == count_ic(ref, gamma).count

    def test_fig3_keynodes(self, g3):
        ref, sg = g3
        res = survival_threshold(sg.vertices, sg.edges, 3)
        ids = {r["id"] for r in keynodes(res.labels).collect()}
        assert ids == {14, 2, 4, 19, 10, 0, 5, 13, 7, 11}

    def test_neg_inf_for_coreless(self, g3):
        ref, sg = g3
        res = survival_threshold(sg.vertices, sg.edges, 4)
        got = {r["id"]: r["T"] for r in res.labels.collect()}
        want = survival_threshold_brute(ref, 4)
        assert got == want
        assert any(t == NEG_INF for t in got.values())


class TestCoreness:
    def test_matches_brute(self, grand):
        ref, sg = grand
        got = {r["id"]: r["core"] for r in coreness(sg.vertices, sg.edges).collect()}
        max_deg = max(len(ref.adj[v]) for v in ref.weight)
        want = {v: 0 for v in ref.weight}
        for gamma in range(1, max_deg + 1):
            for v in gamma_core_set(ref.weight, ref.edge_list(), gamma):
                want[v] = gamma
        assert got == want

    def test_gamma_max_fig3(self, g3):
        ref, sg = g3
        assert gamma_max(sg.vertices, sg.edges) == 3  # the 4-cliques


class TestGammaTruss:
    @pytest.mark.parametrize("gamma", [3, 4])
    def test_matches_brute(self, grand, gamma):
        ref, sg = grand
        got = {(r["a"], r["b"]) for r in gamma_truss(sg.edges, gamma).collect()}
        want = truss_edges_brute(ref.weight, ref.edge_list(), gamma)
        assert got == want

    def test_truss_subgraph_drops_isolated(self, g3):
        ref, sg = g3
        v, e = gamma_truss_subgraph(sg.vertices, sg.edges, 4)
        ids = {r["id"] for r in v.select("id").collect()}
        edges = {(r["a"], r["b"]) for r in e.collect()}
        want_edges = truss_edges_brute(ref.weight, ref.edge_list(), 4)
        assert edges == want_edges
        assert ids == {x for ab in want_edges for x in ab}


class TestPagerank:
    def test_matches_numpy(self, grand):
        ref, sg = grand
        vpdf, epdf = ref_to_pandas(ref)
        want = pagerank_numpy(epdf, len(vpdf), iters=20)
        id_to_pos = {int(v): i for i, v in enumerate(vpdf["id"])}
        got = pagerank(sg.vertices, sg.edges, iters=20).collect()
        for r in got:
            assert r["score"] == pytest.approx(want[id_to_pos[r["id"]]], rel=1e-6)

    def test_rank_weights_distinct_and_order_preserving(self, grand):
        ref, sg = grand
        w = pagerank_rank_weights(sg.vertices, sg.edges, iters=10).toPandas()
        assert w["weight"].nunique() == len(w)
        assert sorted(w["weight"]) == list(range(1, len(w) + 1))
