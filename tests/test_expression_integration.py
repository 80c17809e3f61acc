"""Appendix B end-to-end: derived range bounds feeding the CI machinery.

An aggregate over an expression of catalog-bounded columns gets derived
range bounds [inf f, sup f]; those bounds are legal inputs for any
range-based bounder, so the per-group CIs must still enclose the true
expression averages.
"""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro.core.expressions import convex_bounds, monotone_bounds
from repro.core.spark_ci import avg_ci


@pytest.fixture(scope="module")
def sample(scramble):
    return scramble.df.filter(F.col("row_id") < 6000).persist()


def test_monotone_expression_ci(scramble, sample, flights_pdf):
    """AVG(DepDelay / 10 + 5): monotone in DepDelay."""
    a0, b0 = scramble.catalog.bounds("DepDelay")
    f = lambda d: d / 10 + 5  # noqa: E731
    a, b = monotone_bounds(f, [(a0, b0)], increasing=[True])
    out = avg_ci(
        sample.withColumn("expr", F.col("DepDelay") / 10 + 5),
        "expr",
        ["Airline"],
        a=a,
        b=b,
        N=len(flights_pdf),
        delta=1e-9,
        bounder="bernstein",
        range_trim=True,
    ).toPandas().set_index("Airline")
    truth = (flights_pdf.DepDelay / 10 + 5).groupby(flights_pdf.Airline).mean()
    for airline, mu in truth.items():
        if airline in out.index:
            row = out.loc[airline]
            assert row.ci_lo - 1e-9 <= mu <= row.ci_hi + 1e-9


def test_convex_expression_ci(scramble, sample, flights_pdf):
    """AVG(((DepDelay - 10) / 100)^2): convex, needs derived bounds."""
    a0, b0 = scramble.catalog.bounds("DepDelay")
    f = lambda d: ((d - 10) / 100) ** 2  # noqa: E731
    a, b = convex_bounds(f, [(a0, b0)])
    assert a == pytest.approx(0.0, abs=1e-6)
    expr = F.pow((F.col("DepDelay") - 10) / 100, 2)
    out = avg_ci(
        sample.withColumn("expr", expr),
        "expr",
        ["Airline"],
        a=a,
        b=b,
        N=len(flights_pdf),
        delta=1e-9,
        bounder="bernstein",
        range_trim=True,
    ).toPandas().set_index("Airline")
    truth = (((flights_pdf.DepDelay - 10) / 100) ** 2).groupby(
        flights_pdf.Airline
    ).mean()
    for airline, mu in truth.items():
        if airline in out.index:
            row = out.loc[airline]
            assert row.ci_lo - 1e-9 <= mu <= row.ci_hi + 1e-9
            assert row.ci_lo >= a - 1e-9 and row.ci_hi <= b + 1e-9
