"""Tests for the paper's analytical results (Section 4, Appendix A).

Each bound is checked three ways where possible: on the paper's own
worked examples, against exact closed forms, and against Monte-Carlo
simulation of the sampling scheme itself.
"""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.theory import bounds

# The running example from Section 4.1 of the paper.
PAPER_M = np.array([100.0, 100.0, 200.0, 400.0])
PAPER_W = np.array([10.0, 10.0, 20.0, 50.0])


def mc_gsw(m, w, delta, n_runs, seed):
    """Monte-Carlo of the GSW estimator (reference implementation)."""
    g = np.random.default_rng(seed)
    p_incl = w / (delta + w)
    cal = m * (delta + w) / w
    draws = g.random((n_runs, len(m))) <= p_incl
    return draws @ cal


class TestConsistency:
    def test_paper_example(self):
        lo, hi, theta = bounds.consistency(PAPER_M, PAPER_W)
        assert lo == 8.0 and hi == 10.0 and theta == pytest.approx(1.25)

    def test_scaled_weights_give_theta_one(self):
        m = np.array([1.0, 5.0, 9.0])
        _, _, theta = bounds.consistency(m, 3.7 * m)
        assert theta == pytest.approx(1.0)

    def test_theta_at_least_one(self):
        g = np.random.default_rng(0)
        for _ in range(20):
            m, w = g.random(10) + 0.1, g.random(10) + 0.1
            assert bounds.consistency(m, w)[2] >= 1.0

    def test_rejects_nonpositive(self):
        with pytest.raises(ValueError):
            bounds.consistency(np.array([1.0, 0.0]), np.array([1.0, 1.0]))
        with pytest.raises(ValueError):
            bounds.consistency(np.array([1.0, 1.0]), np.array([-1.0, 1.0]))


class TestGSWMoments:
    def test_paper_example_inclusion_probs(self):
        # Δ=30: probabilities 1/4, 1/4, 2/5, 5/8 as printed in the paper.
        p = PAPER_W / (30.0 + PAPER_W)
        assert np.allclose(p, [0.25, 0.25, 0.4, 0.625])

    def test_expected_sample_size_formula(self):
        es = bounds.expected_sample_size(PAPER_W, 30.0)
        assert es == pytest.approx(0.25 + 0.25 + 0.4 + 0.625)

    def test_unbiasedness_monte_carlo(self):
        est = mc_gsw(PAPER_M, PAPER_W, 30.0, 200_000, seed=1)
        assert np.mean(est) == pytest.approx(PAPER_M.sum(), rel=0.01)

    def test_variance_formula_matches_monte_carlo(self):
        var_exact = bounds.gsw_variance(PAPER_M, PAPER_W, 30.0)
        est = mc_gsw(PAPER_M, PAPER_W, 30.0, 200_000, seed=2)
        assert np.var(est) == pytest.approx(var_exact, rel=0.02)

    def test_variance_zero_when_delta_tiny(self):
        # Δ→0 keeps every row with calibrated ≈ m: estimator ≈ exact sum.
        var = bounds.gsw_variance(PAPER_M, PAPER_W, 1e-9)
        assert var < 1e-3

    @given(
        arrays(np.float64, 6, elements=st.floats(0.5, 100.0)),
        st.floats(0.5, 50.0),
    )
    @settings(max_examples=30, deadline=None)
    def test_variance_formula_property(self, m, delta):
        # w = m (optimal): Var = Δ·Σm; check against the closed form.
        assert bounds.gsw_variance(m, m, delta) == pytest.approx(delta * m.sum())


class TestTheorem3:
    def test_bound_holds_exactly(self):
        delta = 30.0
        rstd = bounds.rstd_exact(PAPER_M, PAPER_W, delta)
        _, _, theta = bounds.consistency(PAPER_M, PAPER_W)
        es = bounds.expected_sample_size(PAPER_W, delta)
        assert rstd <= bounds.rstd_bound(theta, es) + 1e-12

    @given(
        arrays(np.float64, 8, elements=st.floats(0.5, 50.0)),
        arrays(np.float64, 8, elements=st.floats(0.5, 50.0)),
        st.floats(1.0, 100.0),
    )
    @settings(max_examples=50, deadline=None)
    def test_bound_holds_property(self, m, w, delta):
        rstd = bounds.rstd_exact(m, w, delta)
        _, _, theta = bounds.consistency(m, w)
        es = bounds.expected_sample_size(w, delta)
        assert rstd <= bounds.rstd_bound(theta, es) * (1 + 1e-9)

    def test_monte_carlo_rstd_within_bound(self):
        delta = 30.0
        est = mc_gsw(PAPER_M, PAPER_W, delta, 100_000, seed=3)
        M = PAPER_M.sum()
        rstd_mc = float(np.sqrt(np.mean(((est - M) / M) ** 2)))
        _, _, theta = bounds.consistency(PAPER_M, PAPER_W)
        es = bounds.expected_sample_size(PAPER_W, delta)
        assert rstd_mc <= bounds.rstd_bound(theta, es) * 1.05

    def test_infinite_bound_for_empty_sample(self):
        assert bounds.rstd_bound(1.0, 0.0) == float("inf")


class TestCorollary4:
    def test_optimal_weights_theta_one_bound(self):
        # w = m: RSTD ≤ sqrt(1/E|S|).
        m = np.array([5.0, 50.0, 500.0, 5000.0])
        delta = 100.0
        rstd = bounds.rstd_exact(m, m, delta)
        es = bounds.expected_sample_size(m, delta)
        assert rstd <= np.sqrt(1.0 / es) + 1e-12

    def test_optimal_beats_mismatched_weights(self):
        g = np.random.default_rng(4)
        m = np.exp(g.normal(0, 1.5, 500)) + 0.1
        w_bad = np.exp(g.normal(0, 1.5, 500)) + 0.1
        delta_opt = m.sum() / 50          # both sized to E|S| ≈ comparable
        delta_bad = w_bad.sum() / 50
        assert bounds.rstd_exact(m, m, delta_opt) < bounds.rstd_exact(m, w_bad, delta_bad)


class TestDeviations:
    def test_trend_deviation_proportional_measures(self):
        m = np.array([1.0, 2.0, 3.0])
        assert bounds.trend_deviation(m, 7.0 * m) == pytest.approx(1.0)

    def test_trend_deviation_paper_pair(self):
        m1 = np.array([100.0, 100.0, 200.0, 400.0])
        m2 = np.array([1.0, 1.0, 2.0, 1.0])
        r = m1 / m2  # [100,100,100,400]
        assert bounds.trend_deviation(m1, m2) == pytest.approx(4.0)

    def test_range_deviation(self):
        m1 = np.array([10.0, 10.0])
        m2 = np.array([1.0, 5.0])
        # per-row max/min: 10/1=10, 10/5=2 → δ=10
        assert bounds.range_deviation([m1, m2]) == pytest.approx(10.0)

    def test_range_deviation_identical(self):
        m = np.array([3.0, 9.0, 27.0])
        assert bounds.range_deviation([m, m, m]) == pytest.approx(1.0)


class TestCorollaries56:
    def _setup(self, seed=5, n=300):
        g = np.random.default_rng(seed)
        base = np.exp(g.normal(0, 1.0, n)) + 0.5
        m1 = base * np.exp(g.normal(0, 0.2, n))
        m2 = 3.0 * base * np.exp(g.normal(0, 0.2, n))
        return [m1, m2]

    def test_geometric_bound_holds(self):
        ms = self._setup()
        k = len(ms)
        w = (ms[0] * ms[1]) ** (1.0 / k)
        delta = w.sum() / 40
        es = bounds.expected_sample_size(w, delta)
        for p in range(k):
            rstd = bounds.rstd_exact(ms[p], w, delta)
            assert rstd <= bounds.geometric_bound(ms, p, es) * (1 + 1e-9)

    def test_arithmetic_bound_holds(self):
        ms = self._setup(seed=6)
        w = (ms[0] + ms[1]) / 2.0
        delta = w.sum() / 40
        es = bounds.expected_sample_size(w, delta)
        for p in range(len(ms)):
            rstd = bounds.rstd_exact(ms[p], w, delta)
            assert rstd <= bounds.arithmetic_bound(ms, es) * (1 + 1e-9)

    def test_similar_trends_give_small_bounds(self):
        # If m2 = c·m1, ρ = 1 and the geometric bound equals sqrt(1/E|S|).
        m1 = np.array([2.0, 8.0, 32.0])
        ms = [m1, 5.0 * m1]
        assert bounds.geometric_bound(ms, 0, 10.0) == pytest.approx(np.sqrt(1 / 10.0))


class TestProposition7:
    def test_l1_bounded_by_theta_minus_one(self):
        l1, cap = bounds.l1_consistency_bound(PAPER_M, PAPER_W)
        assert l1 <= cap + 1e-12
        assert cap == pytest.approx(0.25)

    @given(
        arrays(np.float64, 10, elements=st.floats(0.5, 100.0)),
        arrays(np.float64, 10, elements=st.floats(0.5, 100.0)),
    )
    @settings(max_examples=50, deadline=None)
    def test_l1_bound_property(self, m, w):
        l1, cap = bounds.l1_consistency_bound(m, w)
        assert l1 <= cap * (1 + 1e-9)

    def test_identical_vectors_zero_distance(self):
        m = np.array([1.0, 2.0, 3.0])
        l1, cap = bounds.l1_consistency_bound(m, m * 9.0)
        assert l1 == pytest.approx(0.0)
        assert cap == pytest.approx(0.0)


class TestProposition1:
    def test_constant_a(self):
        # a = (1 + 2αβ + β²)/(1 − α²)
        v = bounds.arma11_variance(0.5, 0.2, 1.0, 0.0)
        assert v == pytest.approx((1 + 2 * 0.5 * 0.2 + 0.04) / (1 - 0.25))

    def test_epsilon_adds_linearly(self):
        base = bounds.arma11_variance(0.3, 0.1, 2.0, 0.0)
        assert bounds.arma11_variance(0.3, 0.1, 2.0, 1.5) == pytest.approx(base + 1.5)

    def test_rejects_nonstationary(self):
        with pytest.raises(ValueError):
            bounds.arma11_variance(1.0, 0.1, 1.0, 0.0)

    def test_matches_simulation(self):
        # Simulate M̂_t = M_t + ε_t for an ARMA(1,1) and compare variances.
        a1, b1, su, se = 0.6, 0.3, 1.0, 0.7
        g = np.random.default_rng(8)
        n = 400_000
        u = g.normal(0, su, n + 1)
        x = np.zeros(n)
        for t in range(1, n):
            x[t] = a1 * x[t - 1] + u[t] + b1 * u[t - 1]
        xhat = x + g.normal(0, se, n)
        predicted = bounds.arma11_variance(a1, b1, su**2, se**2)
        assert np.var(xhat[1000:]) == pytest.approx(predicted, rel=0.03)
