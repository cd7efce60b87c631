"""Tests for the partitioning helpers (BFS blocks, SlashBurn-lite)."""
import numpy as np
import pytest

from repro.baselines.partition import bfs_blocks, slashburn_lite
from repro.graph import generators as gen

from helpers import graph_from, small_dcsbm


@pytest.fixture(scope="module")
def g():
    return small_dcsbm(n=400, m=3200)


class TestBfsBlocks:
    def test_covers_all_nodes(self, g):
        labels = bfs_blocks(g, 50)
        assert (labels >= 0).all()

    def test_block_sizes_bounded(self, g):
        labels = bfs_blocks(g, 50)
        sizes = np.bincount(labels)
        assert sizes.max() <= 50

    def test_labels_contiguous(self, g):
        labels = bfs_blocks(g, 50)
        ids = np.unique(labels)
        assert np.array_equal(ids, np.arange(len(ids)))

    def test_single_block_when_target_ge_n(self, g):
        # connected graph: one BFS covers everything
        labels = bfs_blocks(g, g.n)
        assert len(np.unique(labels)) == 1

    def test_locality_beats_random_split(self, g):
        """BFS blocks must keep more edges internal than a random blocking
        of the same sizes (that's their whole purpose for NB-LIN)."""
        labels = bfs_blocks(g, 50)
        internal = (labels[g.src] == labels[g.dst]).mean()
        rng = np.random.default_rng(0)
        rand = labels.copy()
        rng.shuffle(rand)
        internal_rand = (rand[g.src] == rand[g.dst]).mean()
        assert internal > internal_rand

    def test_invalid_target_raises(self, g):
        with pytest.raises(ValueError):
            bfs_blocks(g, 0)

    def test_disconnected_graph(self):
        gg = graph_from((4, np.array([0, 1, 2, 3]), np.array([1, 0, 3, 2])))
        labels = bfs_blocks(gg, 2)
        assert (labels >= 0).all()
        assert labels[0] == labels[1] and labels[2] == labels[3]


class TestSlashburnLite:
    def test_components_small_or_cap_hit(self, g):
        hubs, comps = slashburn_lite(g, block_max=40)
        is_hub = np.zeros(g.n, dtype=bool)
        is_hub[hubs] = True
        covered = np.concatenate(comps) if comps else np.empty(0, dtype=np.int64)
        # hubs + spokes partition the node set
        assert len(covered) + len(hubs) == g.n
        assert not is_hub[covered].any()

    def test_no_edge_crosses_components(self, g):
        hubs, comps = slashburn_lite(g, block_max=40)
        comp_of = np.full(g.n, -1)
        for ci, nodes in enumerate(comps):
            comp_of[nodes] = ci
        is_hub = np.zeros(g.n, dtype=bool)
        is_hub[hubs] = True
        spoke_edge = ~is_hub[g.src] & ~is_hub[g.dst]
        assert (comp_of[g.src[spoke_edge]] == comp_of[g.dst[spoke_edge]]).all()

    def test_hubs_are_high_degree(self, g):
        hubs, _ = slashburn_lite(g, block_max=40)
        deg = g.out_deg + g.in_deg
        if len(hubs):
            assert deg[hubs].mean() > deg.mean()

    def test_star_hub_found(self):
        gg = graph_from(gen.star(50))
        hubs, comps = slashburn_lite(gg, block_max=5, hub_step_frac=0.02)
        assert 0 in hubs.tolist()
        assert all(len(c) <= 5 for c in comps)

    def test_already_small_components_no_hubs(self):
        gg = graph_from((4, np.array([0, 1, 2, 3]), np.array([1, 0, 3, 2])))
        hubs, comps = slashburn_lite(gg, block_max=2)
        assert len(hubs) == 0
        assert sorted(len(c) for c in comps) == [2, 2]
