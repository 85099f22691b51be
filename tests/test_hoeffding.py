"""Tests for the Hoeffding minimum-population bounds (Theorems 9–10)."""
import math

import pytest

from repro.core import min_neighborhood_size, min_possible_worlds


class TestMinPossibleWorlds:
    def test_paper_example5(self):
        """Example 5: DBLP, n=682819, k=30, ε=0.05, 1−β=98% → ≈16625."""
        t = min_possible_worlds(682819, 31, beta=0.02, eps=0.05)
        assert abs(t - 16625) <= 2  # ceil rounding slack

    def test_monotone_in_eps(self):
        a = min_possible_worlds(10_000, 5, 0.05, 0.05)
        b = min_possible_worlds(10_000, 5, 0.05, 0.10)
        assert a > b

    def test_monotone_in_beta(self):
        a = min_possible_worlds(10_000, 5, 0.01, 0.05)
        b = min_possible_worlds(10_000, 5, 0.20, 0.05)
        assert a > b

    def test_monotone_in_n(self):
        assert min_possible_worlds(10**6, 5, 0.05, 0.05) > min_possible_worlds(
            10**3, 5, 0.05, 0.05
        )

    def test_formula(self):
        n, m, beta, eps = 5000, 7, 0.05, 0.1
        want = math.ceil(2 / eps**2 * math.log(m * (n - m) / beta))
        assert min_possible_worlds(n, m, beta, eps) == want

    def test_invalid_params(self):
        with pytest.raises(ValueError):
            min_possible_worlds(100, 5, 0.0, 0.05)
        with pytest.raises(ValueError):
            min_possible_worlds(100, 5, 0.05, 0.0)

    def test_m_clamped(self):
        # m ≥ n must not produce a negative pair count
        assert min_possible_worlds(10, 50, 0.05, 0.3) >= 1


class TestMinNeighborhoodSize:
    def test_core_uses_k_plus_1(self):
        a = min_neighborhood_size(10_000, 5, 0.05, 0.05, model="core")
        t = min_possible_worlds(10_000, 6, 0.05, 0.05)
        assert a == t + 1

    def test_truss_uses_k(self):
        """§VI-C: a k-truss has ≥ k nodes, so m = k."""
        a = min_neighborhood_size(10_000, 5, 0.05, 0.05, model="truss")
        t = min_possible_worlds(10_000, 5, 0.05, 0.05)
        assert a == t + 1

    def test_size_bound_uses_l(self):
        """§VI-B: a size-bounded community has ≥ l nodes, so m = l."""
        a = min_neighborhood_size(
            10_000, 5, 0.05, 0.05, model="core", size_lower_bound=30
        )
        t = min_possible_worlds(10_000, 30, 0.05, 0.05)
        assert a == t + 1

    def test_unknown_model(self):
        with pytest.raises(ValueError):
            min_neighborhood_size(100, 5, 0.05, 0.05, model="clique")

    def test_saturates_small_graphs(self):
        """At laptop scale the bound exceeds n — callers clamp to the
        component, i.e. sample from everything reachable."""
        assert min_neighborhood_size(600, 5, 0.05, 0.05) > 600
