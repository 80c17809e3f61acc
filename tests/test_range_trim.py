"""Tests for RangeTrim (Algorithms 4 and 6).

Keys: the streaming clip-based update is equivalent to the batch
"sample minus its extreme" formulation in any arrival order, RangeTrim
removes PHOS (Lbound ignores b, Rbound ignores a), and correctness
(coverage) is preserved.
"""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bounders import EmpiricalBernsteinSerfling, HoeffdingSerfling
from repro.core.range_trim import RangeTrim, trimmed_ci_from_stats
from repro.core.stats import from_values

A, B, N = -50.0, 150.0, 100_000

BOUNDERS = [HoeffdingSerfling, EmpiricalBernsteinSerfling]


def _stream(rt, vals):
    s = rt.init_state()
    for v in vals:
        s = rt.update_state(s, float(v))
    return s


@pytest.mark.parametrize("inner_cls", BOUNDERS)
@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_streaming_equals_batch(inner_cls, seed):
    rng = np.random.default_rng(seed)
    vals = rng.normal(30, 10, 500)
    inner = inner_cls()
    rt = RangeTrim(inner_cls())
    s = _stream(rt, vals)
    ci_stream = rt.ci(s, A, B, N, 1e-8)
    ci_batch = trimmed_ci_from_stats(inner, from_values(vals), A, B, N, 1e-8)
    assert ci_stream[0] == pytest.approx(ci_batch[0], rel=1e-12)
    assert ci_stream[1] == pytest.approx(ci_batch[1], rel=1e-12)


@pytest.mark.parametrize("inner_cls", BOUNDERS)
def test_streaming_order_invariant(inner_cls):
    rng = np.random.default_rng(5)
    vals = rng.uniform(0, 100, 200)
    cis = []
    for perm_seed in range(4):
        order = np.random.default_rng(perm_seed).permutation(len(vals))
        rt = RangeTrim(inner_cls())
        s = _stream(rt, vals[order])
        cis.append(rt.ci(s, A, B, N, 1e-6))
    for ci in cis[1:]:
        assert ci[0] == pytest.approx(cis[0][0], rel=1e-12)
        assert ci[1] == pytest.approx(cis[0][1], rel=1e-12)


@given(st.lists(st.floats(min_value=-49.0, max_value=149.0, allow_nan=False), min_size=2, max_size=60))
@settings(max_examples=60, deadline=None)
def test_streaming_equals_batch_hypothesis(vals):
    inner = HoeffdingSerfling()
    rt = RangeTrim(HoeffdingSerfling())
    s = _stream(rt, vals)
    ci_stream = rt.ci(s, A, B, N, 1e-4)
    ci_batch = trimmed_ci_from_stats(inner, from_values(vals), A, B, N, 1e-4)
    assert ci_stream[0] == pytest.approx(ci_batch[0], rel=1e-9, abs=1e-9)
    assert ci_stream[1] == pytest.approx(ci_batch[1], rel=1e-9, abs=1e-9)


@pytest.mark.parametrize("inner_cls", BOUNDERS)
def test_phos_removed(inner_cls):
    """Lbound must ignore b entirely; Rbound must ignore a."""
    rng = np.random.default_rng(6)
    vals = rng.normal(40, 5, 400)
    rt = RangeTrim(inner_cls())
    s = _stream(rt, vals)
    assert rt.lbound(s, A, B, N, 0.01) == rt.lbound(s, A, B + 1e6, N, 0.01)
    assert rt.rbound(s, A, B, N, 0.01) == rt.rbound(s, A - 1e6, B, N, 0.01)


@pytest.mark.parametrize("inner_cls", BOUNDERS)
def test_tighter_when_observed_range_small(inner_cls):
    """The point of RangeTrim: big win when (MAX-MIN) << (b-a)."""
    rng = np.random.default_rng(7)
    vals = rng.uniform(45, 55, 2000)  # observed range ~10, catalog range 200
    inner = inner_cls()
    rt = RangeTrim(inner_cls())
    s_plain = from_values(vals)
    s_rt = _stream(rt, vals)
    w_plain = inner.rbound(s_plain, A, B, N, 0.005) - inner.lbound(
        s_plain, A, B, N, 0.005
    )
    w_rt = rt.rbound(s_rt, A, B, N, 0.005) - rt.lbound(s_rt, A, B, N, 0.005)
    assert w_rt < w_plain


def test_empty_and_single_sample():
    rt = RangeTrim(EmpiricalBernsteinSerfling())
    s = rt.init_state()
    assert rt.lbound(s, A, B, N, 0.05) == A
    assert rt.rbound(s, A, B, N, 0.05) == B
    s = rt.update_state(s, 10.0)
    # One sample: both trimmed states are empty -> full-range bounds.
    assert rt.lbound(s, A, B, N, 0.05) == A
    assert rt.rbound(s, A, B, N, 0.05) == B


def test_duplicates_handled():
    rt = RangeTrim(HoeffdingSerfling())
    inner = HoeffdingSerfling()
    vals = [5.0, 5.0, 3.0, 3.0, 7.0, 7.0]
    s = _stream(rt, vals)
    ci_stream = rt.ci(s, A, B, N, 0.01)
    ci_batch = trimmed_ci_from_stats(inner, from_values(vals), A, B, N, 0.01)
    assert ci_stream[0] == pytest.approx(ci_batch[0])
    assert ci_stream[1] == pytest.approx(ci_batch[1])


@pytest.mark.parametrize("inner_cls", BOUNDERS)
@pytest.mark.parametrize("delta", [0.3, 0.1])
def test_coverage_preserved(inner_cls, delta):
    """Theorem 2: RangeTrim CIs still fail with probability < delta."""
    rng = np.random.default_rng(9)
    pop = np.clip(rng.normal(60, 30, 4000), A, B)
    mu = pop.mean()
    rt = RangeTrim(inner_cls())
    failures = 0
    trials = 250
    for _ in range(trials):
        sample = rng.choice(pop, 200, replace=False)
        s = _stream(rt, sample)
        lo, hi = rt.ci(s, A, B, len(pop), delta)
        if not (lo <= mu <= hi):
            failures += 1
    assert failures / trials <= delta


def test_uses_n_minus_one():
    """Algorithm 4 line 12: the inner bounder sees dataset size N-1."""
    rng = np.random.default_rng(10)
    vals = rng.normal(30, 10, 300)
    inner = HoeffdingSerfling()
    rt = RangeTrim(HoeffdingSerfling())
    s = _stream(rt, vals)
    st_ = from_values(vals)
    expected_lo = inner.lbound(st_.drop_max(), A, st_.vmax, N - 1, 0.01)
    assert rt.lbound(s, A, B, N, 0.01) == pytest.approx(expected_lo, rel=1e-12)
