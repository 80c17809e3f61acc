"""Tests for scramble construction (Definition 4)."""
from __future__ import annotations

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.fastframe.scramble import DEFAULT_BLOCK_SIZE, build_scramble
from repro.oracle import assert_equivalent


def test_block_size_default_matches_paper(scramble):
    assert scramble.block_size == DEFAULT_BLOCK_SIZE == 25


def test_row_ids_are_a_permutation(scramble):
    ids = scramble.df.select("row_id").toPandas()["row_id"].to_numpy()
    assert len(ids) == scramble.n_rows
    assert np.array_equal(np.sort(ids), np.arange(scramble.n_rows))


def test_block_ids_consistent(scramble):
    pdf = scramble.df.select("row_id", "block_id").toPandas()
    assert (pdf.block_id == pdf.row_id // scramble.block_size).all()
    assert pdf.block_id.max() == scramble.n_blocks - 1


def test_scramble_preserves_multiset(scramble, flights_pdf):
    """The shuffle must not lose, duplicate, or alter any tuple."""
    got = scramble.df.groupBy("Airline").agg(
        F.count(F.lit(1)).alias("n"), F.sum("DepDelay").alias("s")
    )
    assert_equivalent(
        got,
        "SELECT Airline, COUNT(*) AS n, SUM(DepDelay) AS s "
        "FROM flights GROUP BY Airline",
        flights=flights_pdf,
    )


def test_scramble_actually_shuffles(scramble):
    """A prefix of the scramble must not be a prefix of the source order."""
    head = scramble.df.filter(F.col("row_id") < 1000).select("DepTime").toPandas()
    # The source generator draws DepTime uniformly; a random prefix keeps
    # that distribution, while a sorted or clustered layout would not.
    assert head.DepTime.std() > 200


def test_scramble_deterministic_in_seed(flights_df):
    s1 = build_scramble(flights_df, seed=99)
    s2 = build_scramble(flights_df, seed=99)
    a = s1.df.select("row_id", "DepDelay").toPandas().sort_values("row_id")
    b = s2.df.select("row_id", "DepDelay").toPandas().sort_values("row_id")
    assert np.array_equal(a.DepDelay.to_numpy(), b.DepDelay.to_numpy())
    s1.df.unpersist()
    s2.df.unpersist()


def test_rows_per_block_accounts_for_partial_tail(scramble):
    rpb = scramble.rows_per_block
    assert rpb.sum() == scramble.n_rows
    assert (rpb[:-1] == scramble.block_size).all()
    assert 1 <= rpb[-1] <= scramble.block_size


def test_prefix_is_uniform_sample(scramble, flights_pdf):
    """Scanning a scramble prefix = without-replacement sampling: the
    prefix mean should be within a Hoeffding bound of the true mean."""
    m = 5000
    prefix = (
        scramble.df.filter(F.col("row_id") < m).select("DepDelay").toPandas()
    )
    mu, rng = flights_pdf.DepDelay.mean(), np.ptp(flights_pdf.DepDelay)
    eps = rng * np.sqrt(np.log(2 / 1e-6) / (2 * m))
    assert abs(prefix.DepDelay.mean() - mu) < eps
