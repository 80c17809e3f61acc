"""Benchmark fixtures: one moderate-scale scramble + result collection.

``REPRO_BENCH_SF`` (default 0.6, ~3.6M rows ≈ 170 MB) controls scale.
The collector accumulates one row per benchmarked engine run; at session
teardown it derives the paper-style Table 5 / Table 6 summaries (speedup
over Exact / over Scan), prints them alongside the paper's numbers, and
writes ``results/table5.csv`` / ``results/table6.csv``.
"""
from __future__ import annotations

import os
from typing import Dict, List

import pandas as pd
import pytest

from repro.experiments.table5 import PAPER_TABLE5
from repro.experiments.table6 import PAPER_TABLE6
from repro.fastframe.scramble import build_scramble
from repro.synth_data import flights

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.6"))
BENCH_SEED = 7
RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "results")


@pytest.fixture(scope="session")
def bench_scramble(spark):
    df = flights(spark, sf=BENCH_SF, seed=BENCH_SEED)
    return build_scramble(df, seed=BENCH_SEED + 1)


class _Collector:
    def __init__(self):
        self.table5: List[Dict] = []
        self.table6: List[Dict] = []


_COLLECTOR = _Collector()


@pytest.fixture(scope="session")
def collector():
    return _COLLECTOR


def pytest_terminal_summary(terminalreporter, exitstatus, config):
    """Emit the paper-style tables after the benchmark run (uncaptured)."""
    os.makedirs(RESULTS_DIR, exist_ok=True)
    if _COLLECTOR.table5:
        _report_table5(pd.DataFrame(_COLLECTOR.table5))
    if _COLLECTOR.table6:
        _report_table6(pd.DataFrame(_COLLECTOR.table6))


def _report_table5(df: pd.DataFrame) -> None:
    df.to_csv(os.path.join(RESULTS_DIR, "table5.csv"), index=False)
    print("\n\n=== Table 5 (reproduced) — speedup over Exact ===")
    print(
        f"{'Query':<7}{'Exact(s)':>9} | "
        f"{'approach':<13}{'wall x':>9}{'blocks x':>10}{'paper x':>10}{'ok':>4}"
    )
    for q in sorted(df["query"].unique()):
        sub = df[df["query"] == q]
        exact = sub[sub.approach == "Exact"]
        if exact.empty:
            continue
        e_wall = exact.wall_s.iloc[0]
        e_blocks = exact.blocks.iloc[0]
        first = True
        for _, r in sub[sub.approach != "Exact"].iterrows():
            paper = PAPER_TABLE5.get(q, {}).get(r.approach, float("nan"))
            q_s = q if first else ""
            e_s = f"{e_wall:.3f}" if first else ""
            print(
                f"{q_s:<7}{e_s:>9} | "
                f"{r.approach:<13}{e_wall / max(r.wall_s, 1e-9):>8.2f}x"
                f"{e_blocks / max(r.blocks, 1):>9.2f}x"
                f"{paper:>9.2f}x{'  y' if r.correct else '  N':>4}"
            )
            first = False
    n_bad = int((~df.correct).sum())
    print(f"correctness: {len(df) - n_bad}/{len(df)} runs matched ground truth")


def _report_table6(df: pd.DataFrame) -> None:
    df.to_csv(os.path.join(RESULTS_DIR, "table6.csv"), index=False)
    print("\n\n=== Table 6 (reproduced) — speedup over Scan (Bernstein+RT) ===")
    print(
        f"{'Query':<7}{'Scan(s)':>9} | "
        f"{'strategy':<12}{'wall x':>9}{'blocks x':>10}{'paper x':>10}{'ok':>4}"
    )
    for q in sorted(df["query"].unique()):
        sub = df[df["query"] == q]
        scan = sub[sub.strategy == "Scan"]
        if scan.empty:
            continue
        s_wall = scan.wall_s.iloc[0]
        s_blocks = scan.blocks.iloc[0]
        first = True
        for _, r in sub[sub.strategy != "Scan"].iterrows():
            paper = PAPER_TABLE6.get(q, {}).get(r.strategy, float("nan"))
            q_s = q if first else ""
            s_s = f"{s_wall:.3f}" if first else ""
            print(
                f"{q_s:<7}{s_s:>9} | "
                f"{r.strategy:<12}{s_wall / max(r.wall_s, 1e-9):>8.2f}x"
                f"{s_blocks / max(r.blocks, 1):>9.2f}x"
                f"{paper:>9.2f}x{'  y' if r.correct else '  N':>4}"
            )
            first = False
    n_bad = int((~df.correct).sum())
    print(f"correctness: {len(df) - n_bad}/{len(df)} runs matched ground truth")
