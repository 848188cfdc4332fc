"""spark-submit entrypoint for t2: RRMSE by skew and subset size (Fig 3).

Usage: spark-submit jobs/t2_skew.py [--scale test|bench]
Prints the reproduced table and writes results/t2_skew*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t2_skew as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t2_skew")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t2", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t2_skew_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
