"""Benchmark Eval-V (Figures 14–15): progressive vs batch at k = 128."""
import pytest

from repro.evalx.datasets import ref_graph
from repro.evalx.harness import consume_topk
from repro.ref.local_search import local_search
from repro.ref.progressive import local_search_progressive

K, GAMMA = 128, 10


def test_progressive_first_community(benchmark):
    """Latency to the FIRST reported community (the paper's headline win)."""
    g = ref_graph("email", 1.0)
    out = benchmark.pedantic(
        lambda: consume_topk(local_search_progressive(g, GAMMA), 1),
        rounds=5, iterations=1,
    )
    assert len(out) == 1


@pytest.mark.parametrize("algo", ["local_search_p", "local_search"])
def test_total_time_k128(benchmark, algo):
    g = ref_graph("email", 1.0)
    if algo == "local_search_p":
        fn = lambda: consume_topk(local_search_progressive(g, GAMMA), K)  # noqa: E731
    else:
        fn = lambda: local_search(g, K, GAMMA).communities  # noqa: E731
    out = benchmark.pedantic(fn, rounds=3, iterations=1)
    assert len(out) == K
