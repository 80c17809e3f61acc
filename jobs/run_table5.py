"""spark-submit entrypoint: reproduce the paper's Table 5.

Builds the FLIGHTS scramble, runs F-q1..F-q9 under Exact and the four
bounders (Hoeffding/Bernstein x RangeTrim), writes the tidy results CSV
and prints the paper-style summary.

Usage: spark-submit jobs/run_table5.py [--sf 0.2] [--out results/table5.csv]
"""
from __future__ import annotations

import argparse

from repro.experiments.table5 import format_table5, run_table5
from repro.fastframe.scramble import build_scramble
from repro.synth_data import flights

from _session import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.2)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--out", default="results/table5.csv")
    args = ap.parse_args()

    spark = get_spark("run_table5")
    sc = build_scramble(flights(spark, sf=args.sf, seed=args.seed), seed=args.seed + 1)
    df = run_table5(sc)
    df.to_csv(args.out, index=False)
    print(format_table5(df))
    print(f"wrote {args.out}")
    spark.stop()


if __name__ == "__main__":
    main()
