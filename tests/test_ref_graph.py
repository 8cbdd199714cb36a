"""RefGraph substrate: §3.1 organization invariants and edge cases."""
import pytest

from repro.ref.cores import core_numbers, gamma_max_ref
from repro.ref.count_ic import count_ic, gamma_core_set
from repro.ref.graph import RefGraph

from .paper_graphs import fig1_graph, fig3_graph
from .spark_helpers import random_ref_graph


@pytest.fixture(scope="module")
def g3():
    return fig3_graph()


class TestConstruction:
    def test_rejects_duplicate_weights(self):
        with pytest.raises(ValueError, match="distinct"):
            RefGraph({0: 1.0, 1: 1.0}, [])

    def test_rejects_self_loop(self):
        with pytest.raises(ValueError, match="self-loop"):
            RefGraph({0: 1.0, 1: 2.0}, [(0, 0)])

    def test_rejects_duplicate_edge(self):
        with pytest.raises(ValueError, match="duplicate"):
            RefGraph({0: 1.0, 1: 2.0}, [(0, 1), (1, 0)])

    def test_rejects_unknown_vertex(self):
        with pytest.raises(ValueError, match="unknown"):
            RefGraph({0: 1.0}, [(0, 7)])

    def test_empty_graph(self):
        g = RefGraph({}, [])
        assert g.n == 0 and g.size == 0 and g.order == []

    def test_size_definition(self, g3):
        assert g3.size == g3.n + g3.n_edges == 22 + 47


class TestOrganization:
    def test_order_strictly_decreasing(self, g3):
        ws = [g3.weight[v] for v in g3.order]
        assert all(a > b for a, b in zip(ws, ws[1:]))

    def test_n_ge_partition(self, g3):
        for u in g3.weight:
            up = set(g3.n_ge(u))
            down = g3.adj[u] - up
            assert all(g3.weight[v] >= g3.weight[u] for v in up)
            assert all(g3.weight[v] < g3.weight[u] for v in down)
            assert up | down == g3.adj[u]

    def test_every_edge_counted_once_in_prefix(self, g3):
        # Σ up_degrees == |E| (each edge charged to its lower endpoint).
        assert sum(e.up_degree for e in g3.prefix) == g3.n_edges

    def test_prefix_size_monotone(self, g3):
        sizes = [g3.prefix_size(r) for r in range(1, g3.n + 1)]
        assert all(a < b for a, b in zip(sizes, sizes[1:]))
        assert sizes[-1] == g3.size

    @pytest.mark.parametrize("target", [1, 5, 18, 36, 37, 69, 1000])
    def test_r_for_size(self, g3, target):
        r = g3.r_for_size(target)
        if target <= g3.size:
            assert g3.prefix_size(r) >= target
            assert r == 1 or g3.prefix_size(r - 1) < target
        else:
            assert r == g3.n

    @pytest.mark.parametrize("tau", [3, 12, 18, 24, 25])
    def test_r_for_tau(self, g3, tau):
        r = g3.r_for_tau(tau)
        assert r == sum(1 for v in g3.weight if g3.weight[v] >= tau)

    def test_subgraph_top_is_induced(self, g3):
        sub = g3.subgraph_top(7)
        assert set(sub.weight) == set(g3.order[:7])
        for u, v in sub.edge_list():
            assert v in g3.adj[u]
        assert sub.n_edges == 11  # Example 3.1

    def test_subgraph_ge_equals_subgraph_top(self, g3):
        for tau in (3, 12, 18):
            a = g3.subgraph_ge(tau)
            b = g3.subgraph_top(g3.r_for_tau(tau))
            assert set(a.weight) == set(b.weight)
            assert a.edge_list() == b.edge_list()


class TestCoreNumbers:
    def test_fig3_gamma_max(self, g3):
        assert gamma_max_ref(g3) == 3

    def test_fig1(self):
        assert gamma_max_ref(fig1_graph()) == 3

    @pytest.mark.parametrize("seed", range(6))
    def test_matches_gamma_core_membership(self, seed):
        g = random_ref_graph(40, 140, seed=seed)
        cn = core_numbers(g)
        for gamma in (1, 2, 3, 4):
            want = gamma_core_set(g.weight, g.edge_list(), gamma)
            got = {v for v, c in cn.items() if c >= gamma}
            assert got == want

    def test_isolated_vertex_core_zero(self):
        g = RefGraph({0: 1.0, 1: 2.0, 2: 3.0}, [(0, 1)])
        assert core_numbers(g)[2] == 0


class TestPeelEdgeCases:
    def test_gamma_zero_rejected(self, g3):
        with pytest.raises(ValueError):
            count_ic(g3, 0)

    def test_gamma_above_max_yields_nothing(self, g3):
        peel = count_ic(g3, 4)
        # γ=4 > γmax=3 ⇒ no communities at all
        assert peel.count == 0 and peel.cvs == []

    def test_gamma_one_keynodes_are_component_minima_plus_cascade(self):
        # γ=1: every vertex whose removal is triggered as a min is a keynode.
        g = RefGraph({0: 3.0, 1: 2.0, 2: 1.0}, [(0, 1), (1, 2)])
        peel = count_ic(g, 1)
        assert peel.keys == [2, 1]  # v0 falls in v1's cascade

    def test_prefix_zero_and_full(self, g3):
        assert count_ic(g3, 3, prefix=g3.n).keys == count_ic(g3, 3).keys
        assert count_ic(g3, 3, prefix=1).count == 0

    def test_tau_stop_prefix_property(self, g3):
        """Algorithm 5: keys/cvs of the stopped peel are a prefix of the
        full peel's sequences (the §4 suffix/prefix property)."""
        full = count_ic(g3, 3)
        part = count_ic(g3, 3, tau_stop=12.0)
        assert full.keys[: part.count] == part.keys
        assert full.cvs[: len(part.cvs)] == part.cvs
