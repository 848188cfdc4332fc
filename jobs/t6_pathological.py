"""spark-submit entrypoint for t6: two-phase pathological stream (Fig 7).

Usage: spark-submit jobs/t6_pathological.py [--scale test|bench]
Prints the reproduced table and writes results/t6_pathological*.csv.
"""
import argparse
import os

import pandas as pd

from repro.experiments import t6_pathological as exp
from repro.experiments.scales import get_session, params


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = get_session("t6_pathological")
    os.makedirs("results", exist_ok=True)
    pd.set_option("display.width", 220)
    inc, err = exp.run(spark, **params("t6", args.scale))
    print(inc.to_string(index=False))
    print()
    print(err.to_string(index=False))
    inc.to_csv(f"results/t6_pathological_inclusion_{args.scale}.csv", index=False)
    err.to_csv(f"results/t6_pathological_error_{args.scale}.csv", index=False)
    spark.stop()


if __name__ == "__main__":
    main()
