"""spark-submit entrypoint reproducing paper Table III.

Usage::

    spark-submit jobs/table3.py [--b 20] [--trials 200] [--names a,b,...]

Prints one paper-style row per dataset and writes
``results/table3.csv``.
"""
from __future__ import annotations

import argparse
import pathlib

from _session import get_spark

from repro.exp.table3 import run_table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--b", type=int, default=20)
    ap.add_argument("--trials", type=int, default=200)
    ap.add_argument("--names", type=str, default="")
    ap.add_argument("--out", type=str, default="results/table3.csv")
    args = ap.parse_args()
    spark = get_spark("table3")
    names = args.names.split(",") if args.names else None
    df = run_table3(spark, names=names, b=args.b, trials=args.trials)
    out = pathlib.Path(args.out)
    out.parent.mkdir(parents=True, exist_ok=True)
    df.to_csv(out, index=False)
    print(f"wrote {out}")
    spark.stop()


if __name__ == "__main__":
    main()
