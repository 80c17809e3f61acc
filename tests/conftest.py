"""Shared fixtures for Spark-backed tests.

Everything heavy is session-scoped: one tiny FLIGHTS table (SF=0.005,
~30K rows) and one scramble built from it, reused by the catalog /
scramble / bitmap / engine / query tests. The root conftest provides
the SparkSession fixture.
"""
from __future__ import annotations

import pytest

from repro.fastframe.scramble import build_scramble
from repro.synth_data import flights

TEST_SF = 0.005
TEST_SEED = 7


@pytest.fixture(scope="session")
def flights_df(spark):
    df = flights(spark, sf=TEST_SF, seed=TEST_SEED)
    df = df.persist()
    df.count()
    return df


@pytest.fixture(scope="session")
def flights_pdf(flights_df):
    return flights_df.toPandas()


@pytest.fixture(scope="session")
def scramble(flights_df):
    return build_scramble(flights_df, seed=TEST_SEED + 1)
