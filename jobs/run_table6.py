"""spark-submit entrypoint: reproduce the paper's Table 6.

Builds the FLIGHTS scramble and runs the GROUP BY queries under
Scan / ActiveSync / ActivePeek with the Bernstein+RT bounder.

Usage: spark-submit jobs/run_table6.py [--sf 0.2] [--out results/table6.csv]
"""
from __future__ import annotations

import argparse

from repro.experiments.table6 import format_table6, run_table6
from repro.fastframe.scramble import build_scramble
from repro.synth_data import flights

from _session import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.2)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--out", default="results/table6.csv")
    args = ap.parse_args()

    spark = get_spark("run_table6")
    sc = build_scramble(flights(spark, sf=args.sf, seed=args.seed), seed=args.seed + 1)
    df = run_table6(sc)
    df.to_csv(args.out, index=False)
    print(format_table6(df))
    print(f"wrote {args.out}")
    spark.stop()


if __name__ == "__main__":
    main()
