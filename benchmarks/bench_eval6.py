"""Benchmark Eval-VI (Figures 16–17): semi-external algorithms."""
import pytest

from repro.evalx.datasets import ref_graph
from repro.semi_external.algorithms import local_search_se, online_all_se
from repro.semi_external.storage import EdgeBlockStore

K, GAMMA, SCALE = 10, 10, 0.2


@pytest.mark.parametrize("algo", ["LocalSearch-SE", "OnlineAll-SE"])
def test_semi_external_arabic(benchmark, tmp_path, algo):
    g = ref_graph("arabic", SCALE)
    store = EdgeBlockStore.write(str(tmp_path / "arabic"), g, block_edges=8192)
    if algo == "LocalSearch-SE":
        fn = lambda: local_search_se(store, K, GAMMA)[0]  # noqa: E731
    else:
        fn = lambda: online_all_se(store, GAMMA, K)[0]  # noqa: E731
    out = benchmark.pedantic(fn, rounds=1, iterations=1)
    assert len(out) == K
