"""Smoke tests for the Table 5 / Table 6 experiment harnesses.

At the tiny test scale (SF=0.005) absolute speedups are meaningless;
what must hold: every run is correct, the tables are well-formed, and
cost accounting is internally consistent.
"""
from __future__ import annotations

import pytest

from repro.experiments.table5 import (
    BOUNDER_CONFIGS,
    PAPER_TABLE5,
    format_table5,
    run_table5,
)
from repro.experiments.table6 import (
    PAPER_TABLE6,
    TABLE6_QUERIES,
    format_table6,
    run_table6,
)

T5_QUERIES = ["F-q1", "F-q2", "F-q4", "F-q9"]  # keep the test run fast


@pytest.fixture(scope="module")
def t5(scramble):
    return run_table5(scramble, queries=T5_QUERIES, round_rows=2000)


@pytest.fixture(scope="module")
def t6(scramble):
    return run_table6(scramble, queries=["F-q5", "F-q3"], round_rows=2000)


def test_table5_shape(t5):
    # one Exact row + one row per bounder, per query
    assert len(t5) == len(T5_QUERIES) * (1 + len(BOUNDER_CONFIGS))
    assert set(t5["query"]) == set(T5_QUERIES)


def test_table5_all_correct(t5):
    assert t5.correct.all()


def test_table5_speedup_consistency(t5):
    approx = t5[t5.approach != "Exact"]
    expected = approx.exact_blocks / approx.blocks
    assert (abs(approx.speedup_blocks - expected) < 1e-9).all()


def test_table5_exact_rows_are_baseline(t5):
    exact = t5[t5.approach == "Exact"]
    assert (exact.speedup_wall == 1.0).all()
    assert (exact.speedup_blocks == 1.0).all()


def test_table5_format(t5):
    text = format_table5(t5)
    assert "Bernstein+RT" in text and "F-q1" in text
    assert "WRONG" not in text


def test_paper_table5_transcription_complete():
    assert set(PAPER_TABLE5) == {f"F-q{i}" for i in range(1, 10)}
    for row in PAPER_TABLE5.values():
        assert {"exact_s", "Hoeffding", "Hoeffding+RT", "Bernstein", "Bernstein+RT"} <= set(row)


def test_table6_shape(t6):
    assert len(t6) == 2 * 3  # 2 queries x 3 strategies
    assert set(t6.strategy) == {"Scan", "ActiveSync", "ActivePeek"}


def test_table6_all_correct(t6):
    assert t6.correct.all()


def test_table6_sync_peek_same_blocks(t6):
    for _, sub in t6.groupby("query"):
        sync = sub[sub.strategy == "ActiveSync"].blocks.iloc[0]
        peek = sub[sub.strategy == "ActivePeek"].blocks.iloc[0]
        assert sync == peek


def test_table6_queries_match_paper():
    assert TABLE6_QUERIES == list(PAPER_TABLE6)


def test_table6_format(t6):
    text = format_table6(t6)
    assert "ActivePeek" in text and "WRONG" not in text
