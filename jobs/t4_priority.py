"""spark-submit entrypoint for t4: USS vs priority sampling (Fig 5).

Usage: spark-submit jobs/t4_priority.py [--scale test|bench]
Prints the reproduced table and writes results/t4_priority*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t4_priority as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t4_priority")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab, totals = exp.run(spark, **params("t4", args.scale))
    print(tab.to_string(index=False))
    print()
    print(totals.to_string(index=False))
    tab.to_csv(f"results/t4_priority_{args.scale}.csv", index=False)
    totals.to_csv(f"results/t4_priority_totals_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
