"""Tests for the catalog range-bound inference."""
from __future__ import annotations

import pytest

from repro.fastframe.catalog import Catalog, build_catalog


def test_catalog_ranges_match_pandas(flights_df, flights_pdf):
    cat = build_catalog(flights_df)
    a, b = cat.bounds("DepDelay")
    assert a == pytest.approx(flights_pdf.DepDelay.min())
    assert b == pytest.approx(flights_pdf.DepDelay.max())


def test_catalog_counts_rows(flights_df, flights_pdf):
    cat = build_catalog(flights_df)
    assert cat.n_rows == len(flights_pdf)


def test_catalog_covers_all_numeric_columns(flights_df):
    cat = build_catalog(flights_df)
    assert {"DepDelay", "DepTime", "DayOfWeek"} <= set(cat.ranges)
    assert "Origin" not in cat.ranges  # strings have no range bounds


def test_catalog_unknown_column_raises():
    with pytest.raises(KeyError):
        Catalog(ranges={"x": (0, 1)}).bounds("y")


def test_scramble_carries_catalog(scramble, flights_pdf):
    a, b = scramble.catalog.bounds("DepDelay")
    assert a <= flights_pdf.DepDelay.min() <= flights_pdf.DepDelay.max() <= b
