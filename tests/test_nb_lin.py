"""Tests for the NB-LIN baseline (block inverses + low-rank Woodbury)."""
import numpy as np
import pytest

from repro.baselines.nb_lin import NBLin
from repro.core.local_cpi import exact_rwr
from repro.metrics import l1_error, spearman

from helpers import small_dcsbm


@pytest.fixture(scope="module")
def g():
    return small_dcsbm(n=400, m=3200)


@pytest.fixture(scope="module")
def exact(g):
    return exact_rwr(g, 7, eps=1e-14)


class TestExactLimits:
    def test_single_block_is_exact(self, g, exact):
        """One block ⇒ W2 empty ⇒ Q⁻¹ is the full inverse ⇒ exact RWR."""
        nb = NBLin(g, block_size=g.n, rank=4)
        nb.preprocess()
        assert l1_error(nb.query(7), exact) < 1e-8

    def test_full_rank_is_exact(self, g, exact):
        """rank = n ⇒ the SVD reproduces W2 exactly ⇒ exact RWR."""
        nb = NBLin(g, block_size=100, rank=g.n)
        nb.preprocess()
        assert l1_error(nb.query(7), exact) < 1e-6

    def test_accuracy_improves_with_rank(self, g, exact):
        errs = []
        for rank in (8, 64, 256):
            nb = NBLin(g, block_size=100, rank=rank)
            nb.preprocess()
            errs.append(l1_error(nb.query(7), exact))
        assert errs[0] > errs[2]


class TestBehaviour:
    def test_query_requires_preprocess(self, g):
        with pytest.raises(RuntimeError):
            NBLin(g).query(0)

    def test_deterministic(self, g):
        a = NBLin(g, block_size=100, rank=32, seed=5)
        a.preprocess()
        b = NBLin(g, block_size=100, rank=32, seed=5)
        b.preprocess()
        assert np.allclose(a.query(7), b.query(7))

    def test_bytes_positive_after_preprocess(self, g):
        nb = NBLin(g, block_size=100, rank=32)
        assert nb.preprocessed_bytes == 0
        nb.preprocess()
        assert nb.preprocessed_bytes > 0

    def test_bytes_grow_with_rank(self, g):
        small = NBLin(g, block_size=100, rank=16)
        small.preprocess()
        big = NBLin(g, block_size=100, rank=128)
        big.preprocess()
        assert big.preprocessed_bytes > small.preprocessed_bytes

    def test_seed_ranked_high(self, g):
        nb = NBLin(g, block_size=100, rank=128)
        nb.preprocess()
        r = nb.query(7)
        assert 7 in np.argsort(-r)[:5]

    def test_different_seeds_different_results(self, g):
        nb = NBLin(g, block_size=100, rank=64)
        nb.preprocess()
        assert not np.allclose(nb.query(3), nb.query(300))

    def test_moderate_accuracy_default(self, g, exact):
        """The expected shape: usable but clearly lossy (paper Fig. 1c/4)."""
        nb = NBLin(g, block_size=100, rank=64)
        nb.preprocess()
        r = nb.query(7)
        assert l1_error(r, exact) < 1.0
        assert spearman(r, exact) > 0.2
