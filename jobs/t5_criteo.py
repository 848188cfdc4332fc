"""spark-submit entrypoint for t5: 1/2-way marginals on ad impressions (Fig 6).

Usage: spark-submit jobs/t5_criteo.py [--scale test|bench]
Prints the reproduced table and writes results/t5_criteo*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t5_criteo as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t5_criteo")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t5", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t5_criteo_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
