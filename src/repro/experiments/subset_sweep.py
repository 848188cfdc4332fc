"""Shared logic for the synthetic subset-sum sweeps (Tables T2-T4).

A sweep fixes a discretized-Weibull count vector, a set of random item
subsets (the paper's arbitrary filter conditions), and compares methods
by the relative root mean squared error (RRMSE) of each subset-sum
estimate across Monte-Carlo replications, bucketed by the subset's true
count (the x-axis of Figures 3-5).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.experiments.common import bucket_by_quantile, draw_subsets, rrmse
from repro.streams.weibull import weibull_counts

#: schema of per-replication estimate rows produced by sweep workers
EST_SCHEMA = "seed long, subset_id long, method string, est double"


def sweep_config(
    *,
    n_items: int,
    total: int,
    shape: float,
    subset_size: int,
    n_subsets: int,
    subset_seed: int = 123,
) -> dict:
    """Counts, subsets, and truths shared by every replication."""
    counts = weibull_counts(n_items, shape=shape, target_total=total)
    subsets = draw_subsets(len(counts), subset_size, n_subsets, seed=subset_seed)
    truths = np.asarray([counts[s].sum() for s in subsets], dtype=np.float64)
    return {
        "counts": counts,
        "subsets": subsets,
        "truths": truths,
        "total": float(counts.sum()),
    }


def estimates_rows(
    seed: int, estimates_by_method: dict[str, np.ndarray]
) -> pd.DataFrame:
    """Pack one replication's per-subset estimates into EST_SCHEMA rows."""
    frames = []
    for method, est in estimates_by_method.items():
        frames.append(
            pd.DataFrame(
                {
                    "seed": seed,
                    "subset_id": np.arange(len(est)),
                    "method": method,
                    "est": np.asarray(est, dtype=np.float64),
                }
            )
        )
    return pd.concat(frames, ignore_index=True)


def summarize(
    rows: pd.DataFrame,
    truths: np.ndarray,
    total: float,
    *,
    n_buckets: int = 4,
    extra: dict | None = None,
) -> pd.DataFrame:
    """RRMSE per method, bucketed by the subset's true-count fraction.

    Returns one row per (method, bucket): the mean true fraction of the
    bucket's subsets, mean/median RRMSE, and the replication count.
    """
    bucket_idx, _ = bucket_by_quantile(truths, n_buckets)
    out = []
    for method, grp in rows.groupby("method"):
        per_subset = grp.groupby("subset_id")["est"].apply(
            lambda v: rrmse(v.to_numpy(), truths[v.name])
        )
        n_reps = grp.groupby("subset_id")["est"].size().max()
        for b in range(n_buckets):
            sids = np.flatnonzero(bucket_idx == b)
            sel = per_subset.loc[per_subset.index.isin(sids)]
            if sel.empty:
                continue
            row = {
                "method": method,
                "bucket": b,
                "true_frac": float(truths[sids].mean() / total),
                "rrmse_mean": float(sel.mean()),
                "rrmse_median": float(sel.median()),
                "n_subsets": len(sel),
                "n_reps": int(n_reps),
            }
            if extra:
                row.update(extra)
            out.append(row)
    return pd.DataFrame(out)
