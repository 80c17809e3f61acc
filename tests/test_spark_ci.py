"""The pure-Spark (Catalyst) CI aggregation must match the NumPy path."""
from __future__ import annotations

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core import vectorized as V
from repro.core.spark_ci import avg_ci
from repro.oracle import assert_equivalent

A, B = -60.0, 700.0
DELTA = 1e-9


@pytest.fixture(scope="module")
def sample_df(scramble):
    # A scramble prefix IS a without-replacement sample of every view.
    return scramble.df.filter(F.col("row_id") < 8000).persist()


@pytest.mark.parametrize("bounder", ["hoeffding", "bernstein"])
@pytest.mark.parametrize("range_trim", [False, True])
def test_matches_vectorized(sample_df, bounder, range_trim):
    N = 1_000_000
    out = avg_ci(
        sample_df,
        "DepDelay",
        ["Airline"],
        a=A,
        b=B,
        N=N,
        delta=DELTA,
        bounder=bounder,
        range_trim=range_trim,
    ).toPandas().set_index("Airline").sort_index()

    pdf = sample_df.select("Airline", "DepDelay").toPandas()
    g = pdf.groupby("Airline").DepDelay
    stats = g.agg(["count", "sum", "min", "max"])
    stats["sq"] = g.apply(lambda s: float((s**2).sum()))
    stats = stats.sort_index()
    lo, hi = V.ci(
        bounder,
        stats["count"].to_numpy(float),
        stats["sum"].to_numpy(),
        stats["sq"].to_numpy(),
        stats["min"].to_numpy(),
        stats["max"].to_numpy(),
        A,
        B,
        N,
        DELTA,
        range_trim,
    )
    np.testing.assert_allclose(out["ci_lo"].to_numpy(), lo, rtol=1e-9)
    np.testing.assert_allclose(out["ci_hi"].to_numpy(), hi, rtol=1e-9)
    np.testing.assert_allclose(
        out["avg"].to_numpy(), (stats["sum"] / stats["count"]).to_numpy(), rtol=1e-9
    )


def test_group_stats_against_oracle(sample_df):
    """The underlying aggregation is checked against DuckDB row-for-row."""
    got = sample_df.groupBy("Airline").agg(
        F.count("DepDelay").alias("m"),
        F.avg("DepDelay").alias("avg"),
        F.min("DepDelay").alias("vmin"),
        F.max("DepDelay").alias("vmax"),
    )
    assert_equivalent(
        got,
        "SELECT Airline, COUNT(DepDelay) AS m, AVG(DepDelay) AS avg, "
        "MIN(DepDelay) AS vmin, MAX(DepDelay) AS vmax "
        "FROM sample GROUP BY Airline",
        sample=sample_df.select("Airline", "DepDelay"),
    )


@pytest.mark.parametrize("bounder", ["hoeffding", "bernstein"])
def test_intervals_cover_true_group_means(scramble, sample_df, flights_pdf, bounder):
    """With delta=1e-9 every group CI must contain the true group AVG."""
    true_means = flights_pdf.groupby("Airline").DepDelay.mean()
    true_sizes = flights_pdf.groupby("Airline").DepDelay.count()
    out = avg_ci(
        sample_df,
        "DepDelay",
        ["Airline"],
        a=A,
        b=B,
        N=int(true_sizes.max()),
        delta=DELTA,
        bounder=bounder,
        range_trim=True,
    ).toPandas().set_index("Airline")
    for airline, mu in true_means.items():
        if airline in out.index:
            row = out.loc[airline]
            assert row.ci_lo - 1e-9 <= mu <= row.ci_hi + 1e-9


def test_no_grouping_single_row(sample_df):
    out = avg_ci(
        sample_df, "DepDelay", [], a=A, b=B, N=30_000, delta=1e-6
    ).toPandas()
    assert len(out) == 1
    assert out.ci_lo[0] <= out.avg[0] <= out.ci_hi[0]


def test_per_group_N_column(sample_df, spark):
    """N may be a per-group column carried in the sample DataFrame."""
    withN = sample_df.withColumn("n_upper", F.lit(50_000.0))
    out = avg_ci(
        withN, "DepDelay", ["Airline"], a=A, b=B, N="n_upper", delta=1e-6
    ).toPandas()
    out_lit = avg_ci(
        sample_df, "DepDelay", ["Airline"], a=A, b=B, N=50_000, delta=1e-6
    ).toPandas()
    merged = out.merge(out_lit, on="Airline", suffixes=("_col", "_lit"))
    np.testing.assert_allclose(
        merged.ci_lo_col.to_numpy(), merged.ci_lo_lit.to_numpy(), rtol=1e-9
    )
