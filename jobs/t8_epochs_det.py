"""spark-submit entrypoint for t8: Det vs Unbiased SS per epoch (Fig 10).

Usage: spark-submit jobs/t8_epochs_det.py [--scale test|bench]
Prints the reproduced table and writes results/t8_epochs_det*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t8_epochs_det as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t8_epochs_det")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    tab = exp.run(spark, **params("t8", args.scale))
    print(tab.to_string(index=False))
    tab.to_csv(f"results/t8_epochs_det_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
