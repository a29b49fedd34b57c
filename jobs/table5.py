"""spark-submit entrypoint reproducing paper Table V (AKT vs GAS)."""
from __future__ import annotations

import argparse
import pathlib

from _session import get_spark

from repro.exp.table5 import run_table5


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--b", type=int, default=10)
    ap.add_argument("--names", type=str, default="")
    ap.add_argument("--out", type=str, default="results/table5.csv")
    args = ap.parse_args()
    spark = get_spark("table5")
    names = args.names.split(",") if args.names else None
    df = run_table5(spark, names=names, b=args.b)
    out = pathlib.Path(args.out)
    out.parent.mkdir(parents=True, exist_ok=True)
    df.to_csv(out, index=False)
    print(f"wrote {out}")
    spark.stop()


if __name__ == "__main__":
    main()
