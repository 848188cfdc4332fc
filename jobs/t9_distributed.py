"""spark-submit entrypoint for t9: distributed sketch via unbiased merge (sec 5.5).

Usage: spark-submit jobs/t9_distributed.py [--scale test|bench]
Prints the reproduced table and writes results/t9_distributed*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t9_distributed as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t9_distributed")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t9", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t9_distributed_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
