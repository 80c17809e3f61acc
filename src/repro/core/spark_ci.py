"""Per-group confidence intervals as a single Catalyst aggregation.

This is the "DataFrame aggregation over sampled partitions, computing
range-trimmed CIs per group" surface of the reproduction: given a
DataFrame that *is* a without-replacement sample (e.g. a prefix of a
scramble), one ``groupBy().agg()`` computes the mergeable statistics
``(m, sum, sum of squares, min, max)`` and the CI formulas are pure
Spark ``Column`` expressions, so the whole thing runs inside Catalyst
with no Python UDFs.

``tests/test_spark_ci.py`` asserts these Columns agree with the NumPy
reference in :mod:`repro.core.vectorized` to float tolerance.
"""
from __future__ import annotations

import math
from typing import Sequence

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.bounders import BERNSTEIN_KAPPA


def _hoeffding_eps(m: Column, a: Column, b: Column, N: Column, delta: float) -> Column:
    rho = F.greatest(F.lit(0.0), F.lit(1.0) - (m - F.lit(1.0)) / N)
    return (b - a) * F.sqrt(rho * F.lit(math.log(1.0 / delta)) / (F.lit(2.0) * m))


def _bernstein_eps(
    m: Column, sigma: Column, a: Column, b: Column, N: Column, delta: float
) -> Column:
    rho = F.when(
        m <= N / F.lit(2.0), F.lit(1.0) - (m - F.lit(1.0)) / N
    ).otherwise((F.lit(1.0) - m / N) * (F.lit(1.0) + F.lit(1.0) / m))
    rho = F.greatest(F.lit(0.0), rho)
    log_term = F.lit(math.log(5.0 / delta))
    return sigma * F.sqrt(F.lit(2.0) * rho * log_term / m) + F.lit(
        BERNSTEIN_KAPPA
    ) * (b - a) * log_term / m


def _sigma(m: Column, tot: Column, sq: Column) -> Column:
    mean = tot / m
    return F.sqrt(F.greatest(F.lit(0.0), sq / m - mean * mean))


def _eps(kind, m, tot, sq, a, b, N, delta) -> Column:
    if kind == "hoeffding":
        return _hoeffding_eps(m, a, b, N, delta)
    if kind == "bernstein":
        return _bernstein_eps(m, _sigma(m, tot, sq), a, b, N, delta)
    raise ValueError(f"unknown bounder kind {kind!r} (Spark path)")


def avg_ci(
    sample: DataFrame,
    value_col: str,
    group_cols: Sequence[str],
    *,
    a: float,
    b: float,
    N,
    delta: float,
    bounder: str = "bernstein",
    range_trim: bool = True,
) -> DataFrame:
    """(1-delta) per-group CIs for AVG(value_col) over a WR sample.

    ``N`` may be an int (same dataset size for every group) or a Column
    name in ``sample`` carrying a per-group size upper bound. Output
    columns: the group columns plus ``m``, ``avg``, ``ci_lo``, ``ci_hi``.
    """
    v = F.col(value_col)
    n_col = F.first(F.col(N)) if isinstance(N, str) else F.lit(float(N))
    aggd = sample.groupBy(*[F.col(c) for c in group_cols]).agg(
        F.count(v).cast("double").alias("m"),
        F.sum(v).alias("tot"),
        F.sum(v * v).alias("sq"),
        F.min(v).alias("vmin"),
        F.max(v).alias("vmax"),
        n_col.alias("N"),
    )
    m, tot, sq = F.col("m"), F.col("tot"), F.col("sq")
    vmin, vmax, N_ = F.col("vmin"), F.col("vmax"), F.col("N")
    a_l, b_l = F.lit(float(a)), F.lit(float(b))
    d_side = delta / 2.0

    if not range_trim:
        eps = _eps(bounder, m, tot, sq, a_l, b_l, N_, d_side)
        lo, hi = tot / m - eps, tot / m + eps
    else:
        # Batch RangeTrim (Algorithms 4/6): left state drops one copy of
        # the max and uses [a, vmax] with size N-1; right state symmetric.
        m_t = F.greatest(m - F.lit(1.0), F.lit(1.0))
        N_t = F.greatest(N_ - F.lit(1.0), F.lit(1.0))
        tot_l, sq_l = tot - vmax, F.greatest(F.lit(0.0), sq - vmax * vmax)
        tot_r, sq_r = tot - vmin, F.greatest(F.lit(0.0), sq - vmin * vmin)
        lo = tot_l / m_t - _eps(bounder, m_t, tot_l, sq_l, a_l, vmax, N_t, d_side)
        hi = tot_r / m_t + _eps(bounder, m_t, tot_r, sq_r, vmin, b_l, N_t, d_side)
        lo = F.when(m < F.lit(1.5), a_l).otherwise(lo)
        hi = F.when(m < F.lit(1.5), b_l).otherwise(hi)

    clip = lambda c: F.least(b_l, F.greatest(a_l, c))  # noqa: E731
    return aggd.select(
        *group_cols,
        F.col("m").cast("long").alias("m"),
        (tot / m).alias("avg"),
        clip(lo).alias("ci_lo"),
        clip(hi).alias("ci_hi"),
    )
