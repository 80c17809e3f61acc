"""RangeTrim (paper Algorithms 4 and 6): eliminate PHOS from any
range-based SSI error bounder.

The wrapper maintains, alongside the running observed extremes ``a'``
(min) and ``b'`` (max), two inner states:

* ``S_l`` — fed ``min(v, b')`` for each arrival: for unique values this
  is exactly the sample minus its final maximum (each superseded max is
  inserted at the moment it is superseded), and
* ``S_r`` — fed ``max(v, a')``: the sample minus its final minimum.

``lbound`` then calls the inner bounder on ``S_l`` with range ``[a, b']``
and dataset size ``N-1`` — correct because, conditioned on ``max S``,
``S - {max S}`` is a uniform without-replacement sample from
``D_{<max S}`` (Lemma 4) whose average lower-bounds ``AVG(D)``, and the
dataset-size monotonicity property covers ``N-1 >= |D_{<max S}|``
(Theorem 2). Symmetrically for ``rbound``.

The net effect: ``lbound`` no longer depends on the catalog upper range
bound ``b`` (only on the observed max), and ``rbound`` no longer depends
on ``a`` — no PHOS, and when the observed range is much smaller than
``(b-a)`` the intervals are much tighter.

The overall CI is ``[lbound(delta/2), rbound(delta/2)]`` — the same
union-bound split as for the unwrapped bounder, so RangeTrim costs no
extra confidence budget (Algorithm 4 line 12).

:func:`trimmed_ci_from_stats` is the batch form used by the scan engine:
given merged ``GroupStats`` it derives ``S_l``/``S_r`` arithmetically
(drop one copy of the max / min). ``tests/test_range_trim.py`` verifies
streaming == batch on random streams.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, Optional

from repro.core.bounders import Bounder
from repro.core.stats import GroupStats


@dataclass
class RangeTrimState:
    """State of Algorithm 6: two inner states + running extremes."""

    s_l: Any
    s_r: Any
    a_prime: Optional[float] = None  # running observed min
    b_prime: Optional[float] = None  # running observed max


class RangeTrim(Bounder):
    """Algorithm 6: wrap an inner range-based bounder, removing PHOS."""

    def __init__(self, inner: Bounder):
        self.inner = inner
        self.name = f"{inner.name}+rt"
        self.constant_memory = inner.constant_memory

    def init_state(self) -> RangeTrimState:
        return RangeTrimState(
            s_l=self.inner.init_state(), s_r=self.inner.init_state()
        )

    def update_state(self, state: RangeTrimState, v: float) -> RangeTrimState:
        if state.a_prime is None:
            # First sample only initializes the extremes (Alg 4 lines 3-4);
            # it enters an inner state later, when it is superseded.
            state.a_prime = v
            state.b_prime = v
            return state
        state.s_l = self.inner.update_state(state.s_l, min(v, state.b_prime))
        state.s_r = self.inner.update_state(state.s_r, max(v, state.a_prime))
        state.a_prime = min(state.a_prime, v)
        state.b_prime = max(state.b_prime, v)
        return state

    def lbound(self, state: RangeTrimState, a, b, N, delta) -> float:
        if state.b_prime is None:  # no samples yet
            return a
        # b is deliberately ignored: the observed max replaces it.
        return self.inner.lbound(state.s_l, a, state.b_prime, max(1, N - 1), delta)

    def rbound(self, state: RangeTrimState, a, b, N, delta) -> float:
        if state.a_prime is None:
            return b
        return self.inner.rbound(state.s_r, state.a_prime, b, max(1, N - 1), delta)


def trimmed_ci_from_stats(
    inner: Bounder,
    stats: GroupStats,
    a: float,
    b: float,
    N: int,
    delta: float,
) -> tuple[float, float]:
    """Batch RangeTrim CI from merged sample statistics.

    Equivalent to running :class:`RangeTrim` over the sample in any
    order (the trimmed states only depend on the multiset): ``S_l`` is
    the sample minus one copy of its max, with range ``[a, max]``, and
    ``S_r`` minus one copy of its min, with range ``[min, b]``.
    """
    if stats.m == 0:
        return (a, b)
    lo = inner.lbound(
        stats.drop_max(), a, stats.vmax, max(1, N - 1), delta / 2.0
    )
    hi = inner.rbound(
        stats.drop_min(), stats.vmin, b, max(1, N - 1), delta / 2.0
    )
    return (lo, hi)
