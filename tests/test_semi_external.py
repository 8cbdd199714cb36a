"""Semi-external storage + algorithms (Eval-VI substrate)."""
import numpy as np
import pytest

from repro.graphs.weights import as_ref_graph, build_dataset_pandas
from repro.ref.enum_ic import all_communities_brute
from repro.ref.local_search import local_search
from repro.semi_external.algorithms import local_search_se, online_all_se
from repro.semi_external.storage import EdgeBlockStore

from .paper_graphs import fig3_graph
from .spark_helpers import random_ref_graph


@pytest.fixture()
def fig3_store(tmp_path):
    g = fig3_graph()
    return g, EdgeBlockStore.write(str(tmp_path / "fig3"), g, block_edges=8)


class TestStorage:
    def test_blocks_sorted_desc_by_wmin(self, fig3_store):
        g, store = fig3_store
        last = float("inf")
        total = 0
        for blk in store.scan():
            assert (blk["w_min"].diff().dropna() <= 0).all()
            assert blk["w_min"].iloc[0] <= last
            last = blk["w_min"].iloc[-1]
            total += len(blk)
        assert total == g.n_edges

    def test_io_accounting(self, fig3_store):
        _, store = fig3_store
        store.read_block(0)
        assert store.stats.blocks_read == 1 and store.stats.bytes_read > 0

    def test_reopen(self, fig3_store, tmp_path):
        _, store = fig3_store
        again = EdgeBlockStore.open(store.path)
        assert again.n_blocks == store.n_blocks
        assert len(again.vertices()) == 22


class TestLocalSearchSE:
    def test_fig3_top4(self, fig3_store):
        g, store = fig3_store
        comms, store = local_search_se(store, k=4, gamma=3)
        assert comms == local_search(g, 4, 3).communities

    def test_reads_only_prefix(self, fig3_store):
        g, store = fig3_store
        local_search_se(store, k=1, gamma=3)
        assert store.stats.blocks_read < store.n_blocks

    def test_random_graphs(self, tmp_path):
        for seed in (1, 2, 3):
            g = random_ref_graph(60, 200, seed=seed)
            store = EdgeBlockStore.write(str(tmp_path / f"r{seed}"), g, block_edges=16)
            comms, _ = local_search_se(store, k=3, gamma=3)
            assert comms == local_search(g, 3, 3).communities


class TestOnlineAllSE:
    def test_fig3_all_communities(self, fig3_store):
        g, store = fig3_store
        comms, store = online_all_se(store, gamma=3)
        assert comms == all_communities_brute(g, 3)

    def test_reads_whole_file_multiple_times(self, fig3_store):
        _, store = fig3_store
        online_all_se(store, gamma=3)
        assert store.stats.full_scans >= 2  # T iterations + final sweep

    def test_random_graphs(self, tmp_path):
        for seed in (4, 5):
            # contiguous 0..n-1 ids required by the streaming baseline
            g = random_ref_graph(50, 160, seed=seed)
            store = EdgeBlockStore.write(str(tmp_path / f"o{seed}"), g, block_edges=16)
            comms, _ = online_all_se(store, gamma=2)
            assert comms == all_communities_brute(g, 2)


class TestCostShape:
    def test_ls_se_reads_and_memory_below_oa_se(self, tmp_path):
        v, e = build_dataset_pandas("email", scale=0.2)
        g = as_ref_graph(e, v)
        s1 = EdgeBlockStore.write(str(tmp_path / "a"), g, block_edges=256)
        s2 = EdgeBlockStore.write(str(tmp_path / "b"), g, block_edges=256)
        c1, s1 = local_search_se(s1, k=5, gamma=5)
        c2, s2 = online_all_se(s2, gamma=5, k=5)
        assert [w for w, _ in c1] == [w for w, _ in c2]
        assert s1.stats.bytes_read < s2.stats.bytes_read
        assert s1.stats.peak_resident_edges <= g.n_edges
