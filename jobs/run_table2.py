"""Entrypoint: emit the paper's Table 2 (bounder property checks).

Pure NumPy — no Spark needed, runnable directly or via spark-submit.

Usage: python jobs/run_table2.py [--out results/table2.csv]
"""
from __future__ import annotations

import argparse

from repro.experiments.table2 import format_table2, run_table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--out", default="results/table2.csv")
    args = ap.parse_args()
    df = run_table2()
    df.to_csv(args.out, index=False)
    print(format_table2(df))
    print(f"wrote {args.out}")


if __name__ == "__main__":
    main()
