"""Tests for the dataset registry (Table II substitutes)."""
import numpy as np
import pytest

from repro.experiments.datasets import (
    DATASET_ORDER,
    DATASETS,
    er_twin,
    load_local,
    scaled,
)

SF = 0.02  # tiny for tests


class TestRegistry:
    def test_seven_datasets(self):
        assert len(DATASET_ORDER) == 7
        assert set(DATASET_ORDER) == set(DATASETS)

    def test_paper_table2_S_T(self):
        """The S/T values of Table II are preserved per dataset."""
        expect = {
            "slashdot-lite": (4, 15),
            "google-lite": (4, 40),
            "pokec-lite": (4, 10),
            "livejournal-lite": (4, 10),
            "wikilink-lite": (4, 5),
            "twitter-lite": (2, 5),
            "friendster-lite": (3, 20),
        }
        for name, (S, T) in expect.items():
            assert (DATASETS[name].S, DATASETS[name].T) == (S, T)

    def test_density_matches_paper(self):
        """avg degree of each substitute ≈ the paper graph's avg degree."""
        for spec in DATASETS.values():
            ours = spec.m / spec.n
            paper = spec.paper_m / spec.paper_n
            assert ours == pytest.approx(paper, rel=0.02)


class TestLoading:
    def test_load_deterministic(self):
        g1, _ = load_local("slashdot-lite", SF)
        g2, _ = load_local("slashdot-lite", SF)
        assert g1 is g2  # lru_cache returns the same object

    def test_scaled_preserves_density(self):
        spec = scaled(DATASETS["pokec-lite"], 0.1)
        orig = DATASETS["pokec-lite"]
        assert spec.m / spec.n == pytest.approx(orig.m / orig.n, rel=0.2)

    def test_scaled_identity_at_one(self):
        assert scaled(DATASETS["pokec-lite"], 1.0) is DATASETS["pokec-lite"]

    def test_scaled_minimum_size(self):
        spec = scaled(DATASETS["slashdot-lite"], 1e-9)
        assert spec.n >= 64

    def test_loaded_graph_size(self):
        g, spec = load_local("slashdot-lite", SF)
        assert g.n == spec.n
        assert abs(g.m - spec.m) <= 0.1 * spec.m + spec.n

    def test_no_dangling(self):
        for name in DATASET_ORDER[:3]:
            g, _ = load_local(name, SF)
            assert g.n_dangling == 0


class TestErTwin:
    def test_same_size(self):
        g, _ = load_local("pokec-lite", SF)
        t = er_twin("pokec-lite", SF)
        assert t.n == g.n
        assert abs(t.m - g.m) <= 0.1 * g.m + g.n

    def test_different_edges(self):
        g, _ = load_local("pokec-lite", SF)
        t = er_twin("pokec-lite", SF)
        assert not (
            len(g.src) == len(t.src)
            and np.array_equal(g.src, t.src)
            and np.array_equal(g.dst, t.dst)
        )

    def test_deterministic(self):
        assert er_twin("pokec-lite", SF) is er_twin("pokec-lite", SF)
