"""Tests for the chunked exact AR(1) sampler."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.datasets.ar1 import ar1, ar1_naive


class TestAr1:
    @pytest.mark.parametrize("rho", [0.0, 0.3, 0.9, 0.99, 0.999])
    def test_matches_naive_recursion(self, rho):
        # The chunked scaling identity must reproduce the per-element
        # recursion exactly (same Generator stream).
        a = ar1(3000, rho, seed=7)
        b = ar1_naive(3000, rho, seed=7)
        assert np.allclose(a, b, atol=1e-8)

    @pytest.mark.parametrize("n", [0, 1, 2, 5, 4097, 10_000])
    def test_lengths(self, n):
        assert len(ar1(n, 0.95, seed=0)) == n

    def test_chunk_boundary_continuity(self):
        # Values straddling the 4096-chunk boundary follow the same law.
        x = ar1(10_000, 0.999, seed=1)
        assert np.all(np.isfinite(x))
        assert np.abs(x).max() < 10  # marginals stay standard normal

    @pytest.mark.parametrize("rho", [0.5, 0.9, 0.99])
    def test_stationary_marginal(self, rho):
        x = ar1(200_000, rho, seed=2)
        assert abs(x.mean()) < 0.15
        assert abs(x.std() - 1.0) < 0.15

    @pytest.mark.parametrize("rho", [0.3, 0.7, 0.95])
    def test_lag1_autocorrelation(self, rho):
        x = ar1(200_000, rho, seed=3)
        lag1 = np.corrcoef(x[:-1], x[1:])[0, 1]
        assert abs(lag1 - rho) < 0.05

    def test_rho_zero_is_white_noise(self):
        x = ar1(50_000, 0.0, seed=4)
        assert abs(np.corrcoef(x[:-1], x[1:])[0, 1]) < 0.02

    @pytest.mark.parametrize("rho", [-0.1, 1.0, 1.5])
    def test_invalid_rho(self, rho):
        with pytest.raises(ValueError):
            ar1(10, rho)

    def test_deterministic_in_seed(self):
        assert np.array_equal(ar1(1000, 0.9, seed=5), ar1(1000, 0.9, seed=5))

    def test_list_seed_supported(self):
        a = ar1(100, 0.9, seed=[1, 2, 3])
        b = ar1(100, 0.9, seed=[1, 2, 3])
        c = ar1(100, 0.9, seed=[1, 2, 4])
        assert np.array_equal(a, b) and not np.array_equal(a, c)

    @given(st.floats(0.0, 0.999), st.integers(1, 2000))
    @settings(max_examples=50, deadline=None)
    def test_always_finite(self, rho, n):
        assert np.all(np.isfinite(ar1(n, rho, seed=0)))
