"""Tests for the Hoeffding-Serfling bounder (paper Algorithm 1)."""
from __future__ import annotations

import math

import numpy as np
import pytest

from repro.core.bounders import HoeffdingSerfling
from repro.core.stats import from_values

A, B, N = -50.0, 150.0, 100_000
H = HoeffdingSerfling()


def _state(vals):
    return from_values(vals)


def test_empty_state_returns_range():
    s = H.init_state()
    assert H.lbound(s, A, B, N, 0.05) == A
    assert H.rbound(s, A, B, N, 0.05) == B


def test_epsilon_closed_form():
    m, delta = 500, 1e-6
    rho = 1.0 - (m - 1) / N
    expected = (B - A) * math.sqrt(rho * math.log(1 / delta) / (2 * m))
    assert H.epsilon(m, A, B, N, delta) == pytest.approx(expected)


def test_ci_symmetric_around_mean():
    rng = np.random.default_rng(0)
    s = _state(rng.uniform(20, 40, 400))
    lo, hi = H.ci(s, A, B, N, 1e-6)
    assert hi - s.mean == pytest.approx(s.mean - lo, rel=1e-9)


@pytest.mark.parametrize("m_small,m_large", [(10, 100), (100, 1000), (1000, 50000)])
def test_width_shrinks_with_m(m_small, m_large):
    rng = np.random.default_rng(1)
    vals = rng.uniform(0, 50, m_large)
    s_small, s_large = _state(vals[:m_small]), _state(vals)
    w_small = H.rbound(s_small, A, B, N, 0.01) - H.lbound(s_small, A, B, N, 0.01)
    w_large = H.rbound(s_large, A, B, N, 0.01) - H.lbound(s_large, A, B, N, 0.01)
    assert w_large < w_small


def test_dataset_size_monotonicity():
    """Larger N must only loosen the bounds (Section 3.3 property)."""
    s = _state(np.linspace(10, 30, 200))
    for N1, N2 in [(1000, 2000), (10_000, 1_000_000)]:
        assert H.lbound(s, A, B, N2, 0.01) <= H.lbound(s, A, B, N1, 0.01) + 1e-12
        assert H.rbound(s, A, B, N2, 0.01) >= H.rbound(s, A, B, N1, 0.01) - 1e-12


def test_smaller_delta_wider_interval():
    s = _state(np.linspace(10, 30, 200))
    w_loose = H.rbound(s, A, B, N, 0.1) - H.lbound(s, A, B, N, 0.1)
    w_tight = H.rbound(s, A, B, N, 1e-10) - H.lbound(s, A, B, N, 1e-10)
    assert w_tight > w_loose


def test_full_sample_nearly_exact():
    """When m == N the sampling-fraction term collapses the width."""
    vals = np.linspace(0, 100, 1000)
    s = _state(vals)
    lo, hi = H.ci(s, A, B, 1000, 0.05)
    assert hi - lo < (B - A) * 0.2
    assert lo <= vals.mean() <= hi


def test_bounds_clipped_to_range():
    s = _state([A + 0.1] * 3)  # tiny sample near a: raw bound would dip < a
    assert H.lbound(s, A, B, N, 1e-9) >= A
    assert H.rbound(s, A, B, N, 1e-9) <= B


def test_width_is_pma_value_insensitive():
    """PMA (paper §2.3.3): width depends on the sample only through m."""
    s1 = _state(np.full(300, 10.0))
    s2 = _state(np.linspace(-20, 120, 300))
    w1 = H.rbound(s1, A, B, N, 0.01) - H.lbound(s1, A, B, N, 0.01)
    w2 = H.rbound(s2, A, B, N, 0.01) - H.lbound(s2, A, B, N, 0.01)
    assert w1 == pytest.approx(w2, rel=1e-12)


def test_phos_lbound_depends_on_b():
    """PHOS (Definition 3): the lower bound moves when b moves."""
    s = _state(np.linspace(10, 30, 300))
    assert H.lbound(s, A, B, N, 0.01) != pytest.approx(
        H.lbound(s, A, B + 100, N, 0.01)
    )


@pytest.mark.parametrize("delta", [0.3, 0.1])
def test_coverage_without_replacement(delta):
    """SSI guarantee: across repeated WR samples, failures < delta."""
    rng = np.random.default_rng(42)
    pop = np.clip(rng.normal(30, 20, 5000), A, B)
    mu = pop.mean()
    failures = 0
    trials = 300
    for _ in range(trials):
        sample = rng.choice(pop, 200, replace=False)
        lo, hi = H.ci(_state(sample), A, B, len(pop), delta)
        if not (lo <= mu <= hi):
            failures += 1
    assert failures / trials <= delta  # conservative bound: typically 0


@pytest.mark.parametrize("bad", [(5, 4), (0, -1)])
def test_invalid_range_rejected(bad):
    a, b = bad
    s = _state([1.0])
    with pytest.raises(ValueError):
        H.lbound(s, a, b, N, 0.05)


def test_invalid_delta_rejected():
    s = _state([1.0])
    for d in (0.0, 1.0, -0.5, 2.0):
        with pytest.raises(ValueError):
            H.lbound(s, A, B, N, d)
