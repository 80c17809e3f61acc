"""The Table 2 harness must reproduce the paper's classification."""
from __future__ import annotations

import pytest

from repro.experiments.table2 import (
    PAPER_TABLE2,
    format_table2,
    run_table2,
)


@pytest.fixture(scope="module")
def table2():
    return run_table2().set_index("bounder")


@pytest.mark.parametrize("name", sorted(PAPER_TABLE2))
def test_base_bounders_match_paper(table2, name):
    row = table2.loc[name]
    assert bool(row.pma) == PAPER_TABLE2[name]["PMA"]
    assert bool(row.phos) == PAPER_TABLE2[name]["PHOS"]
    assert row.memory == PAPER_TABLE2[name]["memory"]
    assert bool(row.matches_paper)


@pytest.mark.parametrize("name", ["hoeffding+rt", "bernstein+rt"])
def test_rt_removes_phos(table2, name):
    row = table2.loc[name]
    assert not bool(row.phos)
    assert bool(row.matches_paper)


def test_rt_preserves_pma_classification(table2):
    assert bool(table2.loc["hoeffding+rt"].pma)
    assert not bool(table2.loc["bernstein+rt"].pma)


def test_clip_sensitivity_column(table2):
    # the paper's direct no-PMA argument: Bernstein adapts, Hoeffding not
    assert bool(table2.loc["bernstein"].clip_sensitive)
    assert not bool(table2.loc["hoeffding"].clip_sensitive)


def test_format_produces_report(table2):
    text = format_table2(run_table2())
    assert "hoeffding" in text and "bernstein+rt" in text
