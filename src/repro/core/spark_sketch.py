"""Unbiased Space Saving as a Spark DataFrame aggregation (secs 5.3, 5.5).

This is the distributed form the paper designs the sketch for: each
partition builds a small unbiased sketch, the tiny per-partition
sketches are shipped to one place, and an unbiased merge (Theorem 2)
reduces them to a single ``m``-bin summary answering disaggregated
subset-sum and frequent-item queries.

Two per-partition strategies are provided:

* :func:`sketch_dataframe` (default, production path) — within each
  partition, Arrow batches are *exactly* aggregated into an item->count
  map which is unbiasedly reduced (priority/PPS sampling, sec 5.3
  multi-bin generalization) whenever it exceeds a spill cap. Exact
  partial aggregation + unbiased reduction is itself an unbiased
  reduction operation, and it vectorizes, unlike the row-at-a-time
  update.
* :func:`sketch_dataframe_streamwise` — runs the literal Algorithm 1
  kernel over each partition's rows in order; used to validate that the
  production path matches the paper's process distributionally.

Layering note (DESIGN.md): a JVM ``TypedImperativeAggregate`` is out of
scope offline; ``mapInPandas`` + driver merge realizes the identical
partial-aggregate/final-merge dataflow through Catalyst's Arrow scan.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark import TaskContext
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.kernel import SpaceSavingKernel
from repro.core.merge import reduce_counts
from repro.core.result import CountSketchResult

_NUMERIC = (
    T.ByteType, T.ShortType, T.IntegerType, T.LongType,
)


def _item_spark_type(df: DataFrame, item_col: str) -> tuple[str, type]:
    dt = df.schema[item_col].dataType
    if isinstance(dt, _NUMERIC):
        return "long", np.int64
    if isinstance(dt, T.StringType):
        return "string", object
    raise TypeError(
        f"item column {item_col!r} must be integral or string, got {dt}"
    )


def _partition_id() -> int:
    ctx = TaskContext.get()
    return ctx.partitionId() if ctx is not None else 0


def _partition_seed(seed: int) -> np.random.Generator:
    return np.random.default_rng(np.random.SeedSequence([seed, _partition_id()]))


def sketch_dataframe(
    df: DataFrame,
    item_col: str,
    m: int,
    *,
    weight_col: str | None = None,
    seed: int = 0,
    partition_bins: int | None = None,
    spill_factor: int = 8,
    method: str = "priority",
) -> CountSketchResult:
    """Build an m-bin unbiased count sketch of ``df`` grouped by ``item_col``.

    ``weight_col`` generalizes row counting to arbitrary non-negative
    per-row metrics (sec 5.3). ``partition_bins`` (default ``m``) bounds
    each partition's shipped sketch; ``spill_factor * partition_bins``
    bounds the in-memory exact map between reductions.
    """
    if m < 1:
        raise ValueError("m must be >= 1")
    pb = partition_bins or m
    cap = max(spill_factor * pb, pb + 1)
    item_sql_type, _ = _item_spark_type(df, item_col)

    cols = [F.col(item_col).alias("item")]
    if weight_col is not None:
        cols.append(F.col(weight_col).cast("double").alias("w"))
    projected = df.select(*cols)
    schema = (
        f"item {item_sql_type}, estimate double, threshold double, part_t double, pid int"
    )

    def build_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        rng = _partition_seed(seed)
        acc: dict = {}

        def spill(target: int) -> float:
            items = np.asarray(list(acc.keys()))
            vals = np.asarray(list(acc.values()), dtype=np.float64)
            red = reduce_counts(items, vals, target, rng, method=method)
            acc.clear()
            acc.update(zip(red.items.tolist(), red.estimates.tolist()))
            return red.threshold

        threshold = 0.0
        t_part = 0.0
        for pdf in batches:
            if weight_col is None:
                agg = pdf["item"].value_counts()
            else:
                agg = pdf.groupby("item", sort=False)["w"].sum()
            t_part += float(agg.to_numpy().sum())
            get = acc.get
            for x, c in zip(agg.index.tolist(), agg.to_numpy().tolist()):
                acc[x] = get(x, 0.0) + c
            if len(acc) > cap:
                threshold = max(threshold, spill(pb))
        if len(acc) > pb:
            threshold = max(threshold, spill(pb))
        yield pd.DataFrame(
            {
                "item": list(acc.keys()),
                "estimate": list(acc.values()),
                "threshold": threshold,
                "part_t": t_part,
                "pid": _partition_id(),
            }
        )

    parts = projected.mapInPandas(build_partition, schema=schema).toPandas()
    return _final_merge(parts, m, seed, method)


def sketch_dataframe_streamwise(
    df: DataFrame,
    item_col: str,
    m: int,
    *,
    seed: int = 0,
    partition_bins: int | None = None,
    method: str = "priority",
) -> CountSketchResult:
    """Literal Algorithm 1 per partition, then the unbiased merge."""
    pb = partition_bins or m
    item_sql_type, _ = _item_spark_type(df, item_col)
    schema = (
        f"item {item_sql_type}, estimate double, threshold double, part_t double, pid int"
    )

    def build_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        rng = _partition_seed(seed)
        kern = SpaceSavingKernel(
            pb, unbiased=True, seed=int(rng.integers(2**63))
        )
        for pdf in batches:
            kern.update_many(pdf["item"].tolist())
        est = kern.estimates()
        yield pd.DataFrame(
            {
                "item": list(est.keys()),
                "estimate": [float(c) for c in est.values()],
                "threshold": float(kern.n_min),
                "part_t": float(kern.t),
                "pid": _partition_id(),
            }
        )

    parts = df.select(F.col(item_col).alias("item")).mapInPandas(
        build_partition, schema=schema
    ).toPandas()
    return _final_merge(parts, m, seed, method)


def _final_merge(
    parts: pd.DataFrame, m: int, seed: int, method: str
) -> CountSketchResult:
    """Exact by-item union of partition sketches + unbiased reduction.

    The reported ``threshold`` is the max of the final reduction
    threshold and every partition threshold — a conservative
    ``N_min``-analogue for the eq. 5 variance estimator.
    """
    if parts.empty:
        return CountSketchResult(
            np.asarray([]), np.asarray([], dtype=np.float64), 0.0, 0.0
        )
    total = float(parts.groupby("pid")["part_t"].first().sum())
    merged = parts.groupby("item", sort=False)["estimate"].sum()
    rng = np.random.default_rng(np.random.SeedSequence([seed, 1 << 20]))
    red = reduce_counts(
        merged.index.to_numpy(), merged.to_numpy(), m, rng, method=method
    )
    thr = max(red.threshold, float(parts["threshold"].max()))
    return CountSketchResult(red.items, red.estimates, thr, total)


def exact_counts(
    df: DataFrame, item_col: str, *, weight_col: str | None = None
) -> DataFrame:
    """Exact pre-aggregation ``item -> n_i`` (the expensive ground truth).

    Used for oracle checks and to feed the pre-aggregated baselines
    (priority sampling, bottom-k).
    """
    if weight_col is None:
        return df.groupBy(F.col(item_col).alias("item")).agg(
            F.count(F.lit(1)).cast("double").alias("n")
        )
    return df.groupBy(F.col(item_col).alias("item")).agg(
        F.sum(F.col(weight_col).cast("double")).alias("n")
    )
