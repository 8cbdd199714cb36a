"""Benchmark Eval-II (Figure 11): LocalSearch-P vs Backward (γ = 10, 20)."""
import pytest

from repro.evalx.datasets import ref_graph
from repro.evalx.harness import consume_topk
from repro.ref.baselines import backward_arith
from repro.ref.progressive import local_search_progressive

K = 10


@pytest.mark.parametrize("gamma", [10, 20])
def test_local_search_p(benchmark, gamma):
    g = ref_graph("email", 1.0)
    out = benchmark.pedantic(
        lambda: consume_topk(local_search_progressive(g, gamma), K),
        rounds=3, iterations=1,
    )
    assert len(out) == K


@pytest.mark.parametrize("gamma", [10, 20])
def test_backward(benchmark, gamma):
    g = ref_graph("email", 1.0)
    res = benchmark.pedantic(
        lambda: backward_arith(g, K, gamma), rounds=1, iterations=1
    )
    assert len(res.communities) == K
