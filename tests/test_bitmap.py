"""Tests for the block bitmap indexes."""
from __future__ import annotations

import numpy as np
import pytest

from repro.fastframe.bitmap import (
    build_column_bitmap,
    get_column_bitmap,
    group_bitmap_matrix,
    group_domain,
)


def test_column_bitmap_matches_direct(scramble, flights_pdf):
    bm = build_column_bitmap(scramble, "Airline")
    pdf = scramble.df.select("Airline", "block_id").toPandas()
    for value in bm.values[:5]:
        expected = np.zeros(scramble.n_blocks, dtype=bool)
        expected[pdf[pdf.Airline == value].block_id.unique()] = True
        assert np.array_equal(bm.row(value), expected)


def test_column_bitmap_unknown_value(scramble):
    bm = get_column_bitmap(scramble, "Airline")
    with pytest.raises(KeyError):
        bm.row("NOPE")


def test_bitmap_cached(scramble):
    assert get_column_bitmap(scramble, "Origin") is get_column_bitmap(
        scramble, "Origin"
    )


def test_group_domain_matches_distinct(scramble, flights_pdf):
    dom = group_domain(scramble, ("Airline",))
    assert sorted(g[0] for g in dom) == sorted(flights_pdf.Airline.unique())


def test_pair_domain(scramble, flights_pdf):
    dom = group_domain(scramble, ("DayOfWeek", "Origin"))
    expected = set(
        flights_pdf[["DayOfWeek", "Origin"]].drop_duplicates().itertuples(
            index=False, name=None
        )
    )
    assert set(dom) == expected


def test_single_column_group_matrix(scramble):
    groups, matrix = group_bitmap_matrix(scramble, ("Airline",))
    bm = get_column_bitmap(scramble, "Airline")
    for i, g in enumerate(groups):
        assert np.array_equal(matrix[i], bm.row(g[0]))


def test_pair_matrix_is_conjunction_superset(scramble):
    """AND of per-column bitmaps: never a false negative for the pair."""
    groups, matrix = group_bitmap_matrix(scramble, ("DayOfWeek", "Origin"))
    pdf = scramble.df.select("DayOfWeek", "Origin", "block_id").toPandas()
    gindex = {g: i for i, g in enumerate(groups)}
    for (d, o), sub in list(pdf.groupby(["DayOfWeek", "Origin"]))[:10]:
        true_blocks = np.zeros(scramble.n_blocks, dtype=bool)
        true_blocks[sub.block_id.unique()] = True
        # conjunction covers every block that truly contains the pair
        assert not np.any(true_blocks & ~matrix[gindex[(d, o)]])


def test_matrix_shapes(scramble):
    groups, matrix = group_bitmap_matrix(scramble, ("Origin",))
    assert matrix.shape == (len(groups), scramble.n_blocks)
    assert matrix.dtype == bool
