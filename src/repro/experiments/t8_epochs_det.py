"""T8 (paper Figure 10): Deterministic vs Unbiased SS on the sorted stream.

Same frequency-sorted pathological stream as T7. Deterministic Space
Saving's bins end up holding only the last (most frequent) items, so
every early epoch is estimated as 0 and the final epochs absorb the
whole total — the paper reports ~50x the error of Unbiased Space
Saving on epochs 9-10, with the 0-estimate winning only for epochs so
small (< 0.002% of the total) that unbiased overestimation costs more.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.space_saving import (
    DeterministicSpaceSaving,
    UnbiasedSpaceSaving,
)
from repro.experiments.common import run_replications, rrmse
from repro.experiments.t7_epochs_ci import epoch_setup

_SCHEMA = "seed long, epoch long, method string, est double"


def run(
    spark: SparkSession,
    *,
    n_items: int = 5000,
    total: int = 1_000_000,
    shape: float = 0.3,
    m: int = 500,
    n_epochs: int = 10,
    n_reps: int = 60,
    seed: int = 0,
) -> pd.DataFrame:
    """Per-epoch RRMSE for both algorithms and the error ratio."""
    cfg = epoch_setup(
        n_items=n_items, total=total, shape=shape, n_epochs=n_epochs
    )
    epochs, truths = cfg["epochs"], cfg["truths"]
    stream_arr = cfg["stream"]  # numpy: pickles compactly to the workers
    epoch_sets = [
        set(np.flatnonzero(epochs == e).tolist()) for e in range(n_epochs)
    ]

    def one_rep(rep_seed: int) -> pd.DataFrame:
        recs = []
        for method, cls in (
            ("unbiased_ss", UnbiasedSpaceSaving),
            ("deterministic_ss", DeterministicSpaceSaving),
        ):
            sk = cls.from_stream(stream_arr.tolist(), m, seed=rep_seed)
            for e, s in enumerate(epoch_sets):
                recs.append((rep_seed, e, method, sk.subset_sum(s)[0]))
        return pd.DataFrame(recs, columns=["seed", "epoch", "method", "est"])

    rows = run_replications(spark, n_reps, one_rep, _SCHEMA, base_seed=seed)
    out = []
    for e in range(len(epoch_sets)):
        rec = {"epoch": e, "truth": float(truths[e]),
               "truth_frac": float(truths[e] / cfg["counts"].sum())}
        for method, grp in rows[rows["epoch"] == e].groupby("method"):
            rec[f"rrmse_{method}"] = rrmse(grp["est"].to_numpy(), truths[e])
        rec["det_over_uss"] = (
            rec["rrmse_deterministic_ss"] / rec["rrmse_unbiased_ss"]
            if rec.get("rrmse_unbiased_ss")
            else float("inf")
        )
        out.append(rec)
    return pd.DataFrame(out)
