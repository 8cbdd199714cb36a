"""Benchmarks Eval-III (Figure 12) and Eval-IV (Figure 13)."""
import pytest

from repro.evalx.datasets import ref_graph
from repro.ref.baselines import local_search_oa
from repro.ref.local_search import local_search

K, GAMMA = 100, 10


@pytest.mark.parametrize("algo", ["local_search", "local_search_oa"])
def test_eval3_counting_strategy(benchmark, algo):
    g = ref_graph("email", 1.0)
    fn = local_search if algo == "local_search" else local_search_oa
    res = benchmark.pedantic(lambda: fn(g, K, GAMMA), rounds=3, iterations=1)
    assert len(res.communities) == K


@pytest.mark.parametrize("delta", [1.5, 2.0, 4.0, 16.0, 64.0])
def test_eval4_delta(benchmark, delta):
    g = ref_graph("email", 1.0)
    res = benchmark.pedantic(
        lambda: local_search(g, 10, GAMMA, delta=delta), rounds=3, iterations=1
    )
    assert len(res.communities) == 10
