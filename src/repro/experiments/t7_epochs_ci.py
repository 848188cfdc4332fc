"""T7 (paper Figures 8-9): variance estimate and CI coverage on a
pathological frequency-sorted stream.

The stream presents items grouped by item in *ascending* frequency
order — the worst case for Unbiased Space Saving (sec 7.1). The item
universe is split into ``n_epochs`` contiguous blocks of distinct items
("epochs"); each epoch's total count is estimated with an eq.-5
variance estimate and a 95% Normal interval. Paper claims: the variance
estimate is accurate-to-upward-biased (exact for mid epochs, inflated
for early ones), intervals deliver >= advertised coverage wherever the
CLT applies (mid epochs with ~3-13 sampled items undercover), and the
variance tracks that of a true PPS sample.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.space_saving import UnbiasedSpaceSaving
from repro.core.variance import pps_reference_variance
from repro.experiments.common import run_replications
from repro.streams.orders import epoch_of_items, sorted_stream
from repro.streams.weibull import weibull_counts

_SCHEMA = (
    "seed long, epoch long, est double, var double, lo double, hi double, "
    "c_s double"
)


def epoch_setup(
    *, n_items: int, total: int, shape: float, n_epochs: int
) -> dict:
    """Counts (ascending), the sorted stream, and epoch membership."""
    counts = weibull_counts(n_items, shape=shape, target_total=total)
    counts = np.sort(counts)  # ascending: epoch 0 = rarest items
    epochs = epoch_of_items(len(counts), n_epochs)
    stream = sorted_stream(counts, ascending=True)
    truths = np.asarray(
        [counts[epochs == e].sum() for e in range(n_epochs)], dtype=np.float64
    )
    return {
        "counts": counts,
        "epochs": epochs,
        "stream": stream,
        "truths": truths,
    }


def run(
    spark: SparkSession,
    *,
    n_items: int = 5000,
    total: int = 1_000_000,
    shape: float = 0.3,
    m: int = 500,
    n_epochs: int = 10,
    n_reps: int = 80,
    seed: int = 0,
    level: float = 0.95,
) -> pd.DataFrame:
    """Per-epoch: truth, mean estimate, empirical vs estimated vs PPS SD,
    and empirical CI coverage."""
    cfg = epoch_setup(
        n_items=n_items, total=total, shape=shape, n_epochs=n_epochs
    )
    counts, epochs, truths = cfg["counts"], cfg["epochs"], cfg["truths"]
    stream_arr = cfg["stream"]  # numpy: pickles compactly to the workers
    epoch_sets = [
        set(np.flatnonzero(epochs == e).tolist()) for e in range(n_epochs)
    ]

    def one_rep(rep_seed: int) -> pd.DataFrame:
        sk = UnbiasedSpaceSaving.from_stream(
            stream_arr.tolist(), m, seed=rep_seed
        )
        recs = []
        for e, s in enumerate(epoch_sets):
            est, var, lo, hi = sk.subset_sum_ci(s, level=level)
            _, c_s = sk.subset_sum(s)
            recs.append((rep_seed, e, est, var, lo, hi, float(c_s)))
        return pd.DataFrame(
            recs, columns=["seed", "epoch", "est", "var", "lo", "hi", "c_s"]
        )

    rows = run_replications(spark, n_reps, one_rep, _SCHEMA, base_seed=seed)
    out = []
    for e in range(n_epochs):
        grp = rows[rows["epoch"] == e]
        truth = truths[e]
        emp_sd = float(grp["est"].std(ddof=1))
        est_sd = float(np.sqrt(grp["var"]).mean())
        pps_sd = float(
            np.sqrt(pps_reference_variance(counts, epochs == e, m))
        )
        cover = float(
            np.mean((grp["lo"] <= truth) & (truth <= grp["hi"]))
        )
        out.append(
            {
                "epoch": e,
                "truth": float(truth),
                "mean_est": float(grp["est"].mean()),
                "rel_bias": float((grp["est"].mean() - truth) / truth),
                "empirical_sd": emp_sd,
                "estimated_sd": est_sd,
                "pps_sd": pps_sd,
                "mean_items_in_sample": float(grp["c_s"].mean()),
                "coverage": cover,
                "n_reps": len(grp),
            }
        )
    return pd.DataFrame(out)
