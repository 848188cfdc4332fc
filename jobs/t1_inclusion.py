"""spark-submit entrypoint for t1: empirical inclusion probabilities vs PPS (Fig 2).

Usage: spark-submit jobs/t1_inclusion.py [--scale test|bench]
Prints the reproduced table and writes results/t1_inclusion*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t1_inclusion as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t1_inclusion")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    per_item = exp.run(spark, **params("t1", args.scale))
    tab = exp.summarize(per_item)
    print(tab.to_string(index=False))
    per_item.to_csv(f"results/t1_inclusion_items_{args.scale}.csv", index=False)
    tab.to_csv(f"results/t1_inclusion_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
