"""T6 (paper Figure 7): the two-phase stream that breaks Deterministic SS.

The stream's first half is an i.i.d. draw over items ``0..n-1``, the
second half over disjoint items ``n..2n-1`` (data partitioned by a key
and fed partition-by-partition — the paper's "natural" pathological
case). Deterministic Space Saving forgets the first half's infrequent
items entirely: its bins end up holding second-half labels, so
first-half subset queries are near zero. Unbiased Space Saving keeps
sampling first-half items with PPS-like inclusion probabilities and
stays unbiased.

Outputs: per-item inclusion probabilities for first-half items, and
RRMSE of random first-half subset sums for both algorithms.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.space_saving import (
    DeterministicSpaceSaving,
    UnbiasedSpaceSaving,
)
from repro.experiments.common import (
    bucket_by_quantile,
    draw_subsets,
    run_replications,
    rrmse,
)
from repro.streams.orders import two_phase_stream
from repro.streams.weibull import weibull_counts

_SCHEMA = "seed long, kind string, key long, method string, value double"


def run(
    spark: SparkSession,
    *,
    n_items_half: int = 1000,
    total_half: int = 150_000,
    shape: float = 0.5,
    m: int = 100,
    subset_size: int = 100,
    n_subsets: int = 30,
    n_reps: int = 80,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Returns (inclusion table, subset-error table)."""
    counts1 = weibull_counts(n_items_half, shape=shape, target_total=total_half)
    counts2 = weibull_counts(n_items_half, shape=shape, target_total=total_half)
    n_first = len(counts1)
    subsets = draw_subsets(n_first, subset_size, n_subsets, seed=777)
    subset_sets = [set(s.tolist()) for s in subsets]
    truths = np.asarray([counts1[s].sum() for s in subsets], dtype=np.float64)

    def one_rep(rep_seed: int) -> pd.DataFrame:
        rng = np.random.default_rng(rep_seed)
        stream, _ = two_phase_stream(counts1, counts2, rng)
        stream_list = stream.tolist()
        out = []
        for method, cls in (
            ("unbiased_ss", UnbiasedSpaceSaving),
            ("deterministic_ss", DeterministicSpaceSaving),
        ):
            sk = cls.from_stream(stream_list, m, seed=rep_seed)
            inc = np.zeros(n_first, dtype=np.float64)
            for item in sk.estimates():
                if item < n_first:
                    inc[item] = 1.0
            out.append(
                pd.DataFrame(
                    {
                        "seed": rep_seed,
                        "kind": "inc",
                        "key": np.arange(n_first),
                        "method": method,
                        "value": inc,
                    }
                )
            )
            est = np.asarray([sk.subset_sum(s)[0] for s in subset_sets])
            out.append(
                pd.DataFrame(
                    {
                        "seed": rep_seed,
                        "kind": "est",
                        "key": np.arange(len(subset_sets)),
                        "method": method,
                        "value": est,
                    }
                )
            )
        return pd.concat(out, ignore_index=True)

    rows = run_replications(spark, n_reps, one_rep, _SCHEMA, base_seed=seed)

    inc = rows[rows["kind"] == "inc"]
    pi = (
        inc.groupby(["method", "key"])["value"].mean().rename("pi").reset_index()
    )
    pi["count"] = counts1[pi["key"].to_numpy()]
    idx, _ = bucket_by_quantile(counts1.astype(float), 5)
    pi["bucket"] = idx[pi["key"].to_numpy()]
    inclusion_tab = (
        pi.groupby(["method", "bucket"])
        .agg(mean_count=("count", "mean"), pi_empirical=("pi", "mean"))
        .reset_index()
    )

    est = rows[rows["kind"] == "est"]
    err = []
    for method, grp in est.groupby("method"):
        per = grp.groupby("key")["value"].apply(
            lambda v: rrmse(v.to_numpy(), truths[v.name])
        )
        bias = grp.groupby("key")["value"].apply(
            lambda v: float(v.mean() - truths[v.name]) / truths[v.name]
        )
        err.append(
            {
                "method": method,
                "rrmse_mean": float(per.mean()),
                "rrmse_median": float(per.median()),
                "rel_bias_mean": float(bias.mean()),
                "n_subsets": len(per),
                "n_reps": n_reps,
            }
        )
    return inclusion_tab, pd.DataFrame(err)
