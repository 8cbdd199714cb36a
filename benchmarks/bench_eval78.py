"""Benchmarks Eval-VII (Figure 18) and Eval-VIII (Figure 19)."""
import pytest

from repro.evalx.datasets import ref_graph
from repro.ref.noncontainment import forward_nc, top_k_noncontainment
from repro.ref.truss import global_search_truss, local_search_truss

K, GAMMA = 10, 10


@pytest.mark.parametrize("algo", ["local_search_p", "forward"])
def test_eval7_noncontainment(benchmark, algo):
    g = ref_graph("email", 1.0)
    if algo == "local_search_p":
        fn = lambda: top_k_noncontainment(g, K, GAMMA).communities  # noqa: E731
    else:
        fn = lambda: forward_nc(g, K, GAMMA)  # noqa: E731
    out = benchmark.pedantic(fn, rounds=3, iterations=1)
    assert len(out) == K


@pytest.mark.parametrize("algo", ["local", "global"])
def test_eval8_truss(benchmark, algo):
    g = ref_graph("email", 1.0)
    if algo == "local":
        fn = lambda: local_search_truss(g, K, GAMMA).communities  # noqa: E731
    else:
        fn = lambda: global_search_truss(g, K, GAMMA)  # noqa: E731
    out = benchmark.pedantic(fn, rounds=1, iterations=1)
    assert len(out) == K
