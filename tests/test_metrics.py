"""Unit tests for the accuracy metrics (L1 error, Spearman correlation)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics import l1_error, spearman


class TestL1Error:
    def test_zero_for_identical(self):
        x = np.array([0.1, 0.2, 0.7])
        assert l1_error(x, x) == 0.0

    def test_simple_value(self):
        assert l1_error(np.array([1.0, 0.0]), np.array([0.0, 1.0])) == 2.0

    def test_symmetry(self):
        a = np.array([0.3, 0.5, 0.2])
        b = np.array([0.1, 0.1, 0.8])
        assert l1_error(a, b) == l1_error(b, a)

    def test_triangle_inequality(self):
        rng = np.random.default_rng(0)
        a, b, c = rng.random(50), rng.random(50), rng.random(50)
        assert l1_error(a, c) <= l1_error(a, b) + l1_error(b, c) + 1e-12

    def test_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            l1_error(np.zeros(3), np.zeros(4))

    @settings(max_examples=20, deadline=None)
    @given(st.lists(st.floats(-1, 1), min_size=1, max_size=30))
    def test_property_nonnegative(self, vals):
        a = np.array(vals)
        assert l1_error(a, np.zeros_like(a)) >= 0


class TestSpearman:
    def test_perfect_correlation(self):
        e = np.array([0.1, 0.2, 0.3, 0.4])
        assert spearman(e, e) == pytest.approx(1.0)

    def test_monotone_transform_preserves(self):
        e = np.array([0.1, 0.2, 0.3, 0.4])
        assert spearman(np.exp(e), e) == pytest.approx(1.0)

    def test_reversed_is_minus_one(self):
        e = np.array([1.0, 2.0, 3.0, 4.0])
        assert spearman(e[::-1].copy(), e) == pytest.approx(-1.0)

    def test_constant_vector_returns_zero(self):
        assert spearman(np.ones(5), np.arange(5.0)) == 0.0

    def test_ties_handled(self):
        # zeros tie; correlation should be well-defined and < 1
        a = np.array([0.0, 0.0, 0.0, 1.0, 2.0])
        e = np.array([0.1, 0.2, 0.3, 0.4, 0.5])
        rho = spearman(a, e)
        assert 0 < rho < 1

    def test_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            spearman(np.zeros(3), np.zeros(4))

    def test_range(self):
        rng = np.random.default_rng(1)
        for _ in range(5):
            rho = spearman(rng.random(40), rng.random(40))
            assert -1.0 <= rho <= 1.0

    def test_matches_closed_form_no_ties(self):
        """Without ties, Spearman = 1 − 6·Σd²/(n(n²−1))."""
        rng = np.random.default_rng(2)
        a, e = rng.random(100), rng.random(100)
        ra = np.argsort(np.argsort(a)) + 1.0
        re = np.argsort(np.argsort(e)) + 1.0
        n = len(a)
        ref = 1 - 6 * ((ra - re) ** 2).sum() / (n * (n**2 - 1))
        assert spearman(a, e) == pytest.approx(ref, abs=1e-12)
