"""spark-submit entrypoint for t3: USS vs bottom-k uniform sampling (Fig 4).

Usage: spark-submit jobs/t3_bottomk.py [--scale test|bench]
Prints the reproduced table and writes results/t3_bottomk*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t3_bottomk as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t3_bottomk")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t3", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t3_bottomk_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
