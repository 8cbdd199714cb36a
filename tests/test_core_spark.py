"""Distributed LocalSearch / LocalSearch-P / NC / truss vs the references.

Each heavy pipeline runs once per module (module-scoped fixtures); the
asserts fan out over the shared results to keep Spark wall-time bounded.
"""
import pytest

from repro.baselines.global_search import backward_spark, forward_spark, online_all_spark
from repro.core.enum_ic import enumerate_distributed, enumerate_driver
from repro.core.local_search import count_ic_spark, local_search_spark
from repro.core.noncontainment import top_k_noncontainment_spark
from repro.core.progressive import local_search_progressive_spark
from repro.core.truss_search import global_search_truss_spark, local_search_truss_spark
from repro.kernels.survival import survival_threshold
from repro.ref.count_ic import count_ic
from repro.ref.enum_ic import all_communities_brute
from repro.ref.local_search import local_search
from repro.ref.noncontainment import noncontainment_brute
from repro.ref.truss import global_search_truss

from .paper_graphs import fig3_graph
from .spark_helpers import random_ref_graph, ref_to_spark

TOP4 = [
    (18.0, frozenset({3, 11, 12, 20})),
    (14.0, frozenset({1, 6, 7, 16})),
    (13.0, frozenset({3, 11, 12, 13, 20})),
    (12.0, frozenset({1, 5, 6, 7, 16})),
]


@pytest.fixture(scope="module")
def g3(spark):
    ref = fig3_graph()
    return ref, ref_to_spark(spark, ref)


@pytest.fixture(scope="module")
def grand(spark):
    ref = random_ref_graph(70, 240, seed=23)
    return ref, ref_to_spark(spark, ref)


@pytest.fixture(scope="module")
def ls_fig3(g3):
    _, sg = g3
    return local_search_spark(sg, k=4, gamma=3)


@pytest.fixture(scope="module")
def ls_rand(grand):
    _, sg = grand
    return local_search_spark(sg, k=3, gamma=3)


class TestLocalSearchSpark:
    def test_fig3_top4(self, ls_fig3):
        assert ls_fig3.communities == TOP4

    def test_fig3_stage_trace_matches_example31(self, ls_fig3):
        assert [(s.tau, s.size, s.count) for s in ls_fig3.stages] == [
            (18.0, 18, 1),
            (12.0, 36, 4),
        ]

    def test_random_matches_ref(self, grand, ls_rand):
        ref, _ = grand
        assert ls_rand.communities == local_search(ref, 3, 3).communities

    def test_count_ic_spark(self, g3):
        ref, sg = g3
        assert count_ic_spark(sg, gamma=3, tau=12.0) == 4
        assert count_ic_spark(sg, gamma=3, tau=18.0) == 1

    def test_enum_modes_agree(self, g3):
        ref, sg = g3
        sub = sg.subgraph_ge(12.0)
        surv = survival_threshold(sub.vertices, sub.edges, 3)
        a = enumerate_driver(surv.labels, sub.edges, 4)
        b = enumerate_distributed(surv.labels, sub.edges, 4)
        assert a == b == TOP4


class TestProgressiveSpark:
    def test_streams_in_order_and_matches_batch(self, g3):
        ref, sg = g3
        got = []
        for w, s in local_search_progressive_spark(sg, gamma=3):
            got.append((w, s))
            if len(got) == 4:
                break
        assert got == TOP4

    def test_streams_everything(self, grand):
        ref, sg = grand
        got = list(local_search_progressive_spark(sg, gamma=3))
        assert got == all_communities_brute(ref, 3)


class TestGlobalBaselinesSpark:
    def test_online_all_and_forward(self, g3):
        ref, sg = g3
        assert online_all_spark(sg, gamma=3, k=4) == TOP4
        assert forward_spark(sg, gamma=3, k=4) == TOP4

    def test_backward(self, g3):
        _, sg = g3
        assert backward_spark(sg, k=4, gamma=3) == TOP4


class TestNonContainmentSpark:
    def test_fig3_top2(self, g3):
        _, sg = g3
        res = top_k_noncontainment_spark(sg, k=2, gamma=3)
        assert res.communities == [
            (18.0, frozenset({3, 11, 12, 20})),
            (14.0, frozenset({1, 6, 7, 16})),
        ]

    def test_random_matches_brute(self, grand):
        ref, sg = grand
        res = top_k_noncontainment_spark(sg, k=2, gamma=3)
        assert res.communities == noncontainment_brute(ref, 3)[:2]


class TestTrussSpark:
    def test_fig3_local_equals_global_and_ref(self, g3):
        ref, sg = g3
        want = global_search_truss(ref, 2, 4)
        assert local_search_truss_spark(sg, 2, 4).communities == want
        assert global_search_truss_spark(sg, 2, 4) == want
