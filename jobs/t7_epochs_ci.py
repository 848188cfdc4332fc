"""spark-submit entrypoint for t7: CI coverage + variance on sorted stream (Figs 8-9).

Usage: spark-submit jobs/t7_epochs_ci.py [--scale test|bench]
Prints the reproduced table and writes results/t7_epochs_ci*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t7_epochs_ci as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t7_epochs_ci")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t7", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t7_epochs_ci_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
