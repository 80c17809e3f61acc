"""Tests for the empirical Bernstein-Serfling bounder (Algorithm 2)."""
from __future__ import annotations

import math

import numpy as np
import pytest

from repro.core.bounders import (
    BERNSTEIN_KAPPA,
    EmpiricalBernsteinSerfling,
    HoeffdingSerfling,
    bernstein_rho,
)
from repro.core.stats import from_values

A, B, N = -50.0, 150.0, 100_000
EB = EmpiricalBernsteinSerfling()
H = HoeffdingSerfling()


def _state(vals):
    return from_values(vals)


def test_kappa_constant():
    assert BERNSTEIN_KAPPA == pytest.approx(7.0 / 3.0 + 3.0 / math.sqrt(2.0))


@pytest.mark.parametrize(
    "m,N_,expected",
    [
        (10, 100, 1 - 9 / 100),
        (50, 100, 1 - 49 / 100),
        (60, 100, (1 - 0.6) * (1 + 1 / 60)),
        (100, 100, 0.0),
    ],
)
def test_rho_piecewise(m, N_, expected):
    assert bernstein_rho(m, N_) == pytest.approx(expected)


def test_epsilon_closed_form():
    m, sigma, delta = 400, 7.0, 1e-8
    rho = bernstein_rho(m, N)
    log_term = math.log(5.0 / delta)
    expected = sigma * math.sqrt(2 * rho * log_term / m) + BERNSTEIN_KAPPA * (
        B - A
    ) * log_term / m
    assert EB.epsilon(m, sigma, A, B, N, delta) == pytest.approx(expected)


def test_empty_state_returns_range():
    s = EB.init_state()
    assert EB.lbound(s, A, B, N, 0.05) == A
    assert EB.rbound(s, A, B, N, 0.05) == B


def test_tighter_than_hoeffding_when_variance_small():
    """The paper's headline claim about Bernstein vs Hoeffding."""
    rng = np.random.default_rng(0)
    vals = rng.normal(50, 2.0, 5000)  # sigma << (b - a)
    s = _state(vals)
    w_eb = EB.rbound(s, A, B, N, 1e-10) - EB.lbound(s, A, B, N, 1e-10)
    w_h = H.rbound(s, A, B, N, 1e-10) - H.lbound(s, A, B, N, 1e-10)
    assert w_eb < w_h


def test_no_pma_width_shrinks_when_clipping():
    """Raising the smallest values shrinks sigma-hat, hence the width."""
    rng = np.random.default_rng(1)
    vals = rng.uniform(0, 100, 3000)
    clipped = np.maximum(vals, 50.0)
    w0 = EB.rbound(_state(vals), A, B, N, 0.01) - EB.lbound(_state(vals), A, B, N, 0.01)
    w1 = EB.rbound(_state(clipped), A, B, N, 0.01) - EB.lbound(
        _state(clipped), A, B, N, 0.01
    )
    assert w1 < w0


def test_phos_lbound_depends_on_b():
    s = _state(np.linspace(10, 30, 300))
    assert EB.lbound(s, A, B, N, 0.01) != pytest.approx(
        EB.lbound(s, A, B + 100, N, 0.01)
    )


def test_dataset_size_monotonicity():
    s = _state(np.linspace(10, 30, 500))
    for N1, N2 in [(600, 1200), (10_000, 10_000_000)]:
        assert EB.lbound(s, A, B, N2, 0.01) <= EB.lbound(s, A, B, N1, 0.01) + 1e-12
        assert EB.rbound(s, A, B, N2, 0.01) >= EB.rbound(s, A, B, N1, 0.01) - 1e-12


def test_width_shrinks_with_m():
    rng = np.random.default_rng(2)
    vals = rng.normal(40, 10, 50_000)
    w = []
    for m in (100, 1000, 10_000, 50_000):
        s = _state(vals[:m])
        w.append(EB.rbound(s, A, B, N, 1e-6) - EB.lbound(s, A, B, N, 1e-6))
    assert w == sorted(w, reverse=True)


@pytest.mark.parametrize("delta", [0.3, 0.1])
def test_coverage_without_replacement(delta):
    rng = np.random.default_rng(7)
    pop = np.clip(rng.lognormal(2.0, 1.0, 5000), A, B)  # skewed population
    mu = pop.mean()
    failures = 0
    trials = 300
    for _ in range(trials):
        sample = rng.choice(pop, 250, replace=False)
        lo, hi = EB.ci(_state(sample), A, B, len(pop), delta)
        if not (lo <= mu <= hi):
            failures += 1
    assert failures / trials <= delta


def test_constant_sample_width_is_range_term_only():
    s = _state(np.full(1000, 42.0))
    lo, hi = EB.ci(s, A, B, N, 1e-6)
    log_term = math.log(5.0 / (1e-6 / 2))
    expected_eps = BERNSTEIN_KAPPA * (B - A) * log_term / 1000
    assert hi - lo == pytest.approx(2 * expected_eps, rel=1e-6)
