"""Unit tests for the synthetic graph generators."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graph import generators as gen
from repro.graph.linalg import LocalGraph


class TestDcsbm:
    def test_node_count(self):
        n, src, dst, block = gen.dcsbm(500, 4000, seed=0)
        assert n == 500
        assert len(block) == 500

    def test_edge_count_close_to_target(self):
        n, src, dst, _ = gen.dcsbm(500, 4000, seed=0)
        assert abs(len(src) - 4000) <= 0.05 * 4000 + 500  # + min-degree edges

    def test_deterministic(self):
        a = gen.dcsbm(300, 2000, seed=42)
        b = gen.dcsbm(300, 2000, seed=42)
        assert np.array_equal(a[1], b[1]) and np.array_equal(a[2], b[2])

    def test_different_seeds_differ(self):
        a = gen.dcsbm(300, 2000, seed=1)
        b = gen.dcsbm(300, 2000, seed=2)
        assert not (np.array_equal(a[1], b[1]) and np.array_equal(a[2], b[2]))

    def test_no_self_loops(self):
        _, src, dst, _ = gen.dcsbm(400, 3000, seed=3)
        assert (src != dst).all()

    def test_no_duplicate_edges(self):
        n, src, dst, _ = gen.dcsbm(400, 3000, seed=3)
        key = src * n + dst
        assert len(np.unique(key)) == len(key)

    def test_no_dangling_by_default(self):
        n, src, dst, _ = gen.dcsbm(400, 1200, seed=4)
        assert (np.bincount(src, minlength=n) > 0).all()

    def test_allow_dangling(self):
        # with very few edges and dangling allowed, some nodes have out-deg 0
        n, src, dst, _ = gen.dcsbm(400, 450, seed=4, allow_dangling=True)
        assert (np.bincount(src, minlength=n) == 0).any()

    def test_endpoints_in_range(self):
        n, src, dst, _ = gen.dcsbm(250, 2000, seed=5)
        assert src.min() >= 0 and dst.min() >= 0
        assert src.max() < n and dst.max() < n

    def test_block_labels_contiguous_and_balanced(self):
        n, _, _, block = gen.dcsbm(320, 2500, n_blocks=8, seed=6)
        assert set(np.unique(block)) == set(range(8))
        sizes = np.bincount(block)
        assert sizes.max() - sizes.min() <= 1

    def test_block_homophily(self):
        """p_in=0.8 must leave most edges inside their source's block."""
        n, src, dst, block = gen.dcsbm(1000, 8000, n_blocks=8, p_in=0.8, seed=7)
        frac_in = (block[src] == block[dst]).mean()
        assert frac_in > 0.6

    def test_p_in_zero_breaks_homophily(self):
        n, src, dst, block = gen.dcsbm(1000, 8000, n_blocks=8, p_in=0.0, seed=7)
        frac_in = (block[src] == block[dst]).mean()
        assert frac_in < 0.4

    def test_degree_skew(self):
        """Zipf weights must produce hubs: max degree >> mean degree."""
        n, src, dst, _ = gen.dcsbm(2000, 16000, seed=8)
        deg = np.bincount(dst, minlength=n)
        assert deg.max() > 5 * deg.mean()

    def test_n_blocks_clamped(self):
        n, src, dst, block = gen.dcsbm(10, 30, n_blocks=64, seed=0)
        assert block.max() < 10

    @settings(max_examples=15, deadline=None)
    @given(
        n=st.integers(20, 200),
        avg_deg=st.integers(2, 10),
        seed=st.integers(0, 10_000),
    )
    def test_property_valid_graph(self, n, avg_deg, seed):
        nn, src, dst, block = gen.dcsbm(n, n * avg_deg, n_blocks=4, seed=seed)
        g = LocalGraph(nn, src, dst)
        assert g.n_dangling == 0
        assert (src != dst).all()
        assert len(block) == n


class TestErdosRenyi:
    def test_sizes(self):
        n, src, dst = gen.erdos_renyi(500, 4000, seed=0)
        assert n == 500
        assert abs(len(src) - 4000) <= 0.05 * 4000 + 500

    def test_deterministic(self):
        a = gen.erdos_renyi(300, 2000, seed=9)
        b = gen.erdos_renyi(300, 2000, seed=9)
        assert np.array_equal(a[1], b[1]) and np.array_equal(a[2], b[2])

    def test_no_self_loops_or_dups(self):
        n, src, dst = gen.erdos_renyi(300, 2000, seed=10)
        assert (src != dst).all()
        key = src * n + dst
        assert len(np.unique(key)) == len(key)

    def test_no_dangling_by_default(self):
        n, src, dst = gen.erdos_renyi(300, 400, seed=11)
        assert (np.bincount(src, minlength=n) > 0).all()

    def test_no_block_structure(self):
        """ER has no homophily w.r.t. any contiguous blocking."""
        n, src, dst = gen.erdos_renyi(1000, 8000, seed=12)
        block = (np.arange(n) * 8) // n
        frac_in = (block[src] == block[dst]).mean()
        assert frac_in < 0.25  # ~1/8 expected


class TestUtilityGraphs:
    def test_cycle(self):
        n, src, dst = gen.cycle(5)
        assert sorted(zip(src, dst)) == [(0, 1), (1, 2), (2, 3), (3, 4), (4, 0)]

    def test_star_degrees(self):
        n, src, dst = gen.star(6)
        g = LocalGraph(n, src, dst)
        assert g.out_deg[0] == 5
        assert (g.out_deg[1:] == 1).all()

    def test_complete(self):
        n, src, dst = gen.complete(4)
        assert len(src) == 12
        assert (src != dst).all()

    def test_chain_has_one_dangling(self):
        n, src, dst = gen.chain(7)
        g = LocalGraph(n, src, dst)
        assert g.n_dangling == 1
        assert g.out_deg[6] == 0

    def test_ensure_min_out_degree(self):
        rng = np.random.default_rng(0)
        src = np.array([0, 1], dtype=np.int64)
        dst = np.array([1, 2], dtype=np.int64)
        s2, d2 = gen.ensure_min_out_degree(4, src, dst, rng)
        deg = np.bincount(s2, minlength=4)
        assert (deg > 0).all()
        assert (s2 != d2).all()

    def test_ensure_min_out_degree_noop(self):
        rng = np.random.default_rng(0)
        n, src, dst = gen.cycle(5)
        s2, d2 = gen.ensure_min_out_degree(n, src, dst, rng)
        assert len(s2) == len(src)
