"""Canonical parameter sets per table, plus a spark-submit session helper.

``BENCH`` is the scale used for EXPERIMENTS.md numbers (paper scale
reduced per DESIGN.md substitution #2 — same m/items/rows regime,
smaller absolutes). ``TEST`` is the micro scale used by the pytest
smoke tests. Jobs accept ``--scale test|bench``.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession

BENCH: dict[str, dict] = {
    "t1": dict(n_items=1000, total=300_000, shape=0.15, m=100, n_reps=300),
    "t2": dict(
        shapes=(0.3, 0.6, 1.0, 2.0), n_items=1000, total=300_000, m=200,
        subset_size=100, n_subsets=40, n_reps=60,
    ),
    "t3": dict(
        shape=0.3, n_items=1000, total=300_000, m=100,
        subset_size=100, n_subsets=40, n_reps=100,
    ),
    "t4": dict(
        shape=0.3, n_items=1000, total=300_000, m=200,
        subset_size=100, n_subsets=40, n_reps=100,
    ),
    "t5": dict(n_rows=1_000_000, m=5000, n_reps=16),
    "t6": dict(
        n_items_half=1000, total_half=150_000, shape=0.5, m=100,
        subset_size=100, n_subsets=30, n_reps=100,
    ),
    "t7": dict(
        n_items=10_000, total=2_000_000, shape=0.3, m=1000,
        n_epochs=10, n_reps=100,
    ),
    "t8": dict(
        n_items=10_000, total=2_000_000, shape=0.3, m=1000,
        n_epochs=10, n_reps=50,
    ),
    "t9": dict(sf=0.05, m=500, n_reps=25, n_partitions=16),
}

TEST: dict[str, dict] = {
    "t1": dict(n_items=300, total=30_000, shape=0.15, m=50, n_reps=60),
    "t2": dict(
        shapes=(0.3, 2.0), n_items=300, total=40_000, m=60,
        subset_size=40, n_subsets=12, n_reps=15,
    ),
    "t3": dict(
        n_items=300, total=40_000, m=50, subset_size=40, n_subsets=12,
        n_reps=15,
    ),
    "t4": dict(
        n_items=300, total=40_000, m=60, subset_size=40, n_subsets=12,
        n_reps=15,
    ),
    "t5": dict(n_rows=15_000, m=400, n_reps=5),
    "t6": dict(
        n_items_half=200, total_half=20_000, m=40, subset_size=20,
        n_subsets=8, n_reps=30,
    ),
    "t7": dict(n_items=500, total=80_000, m=100, n_epochs=5, n_reps=40),
    "t8": dict(n_items=500, total=80_000, m=100, n_epochs=5, n_reps=20),
    "t9": dict(sf=0.004, m=150, n_reps=8, n_partitions=8),
}


def params(table: str, scale: str) -> dict:
    """Parameter dict for ``table`` at ``scale`` ('test' or 'bench')."""
    book = {"test": TEST, "bench": BENCH}[scale]
    return dict(book[table])


def get_session(app: str) -> SparkSession:
    """Session for spark-submit jobs (mirrors conftest.py settings)."""
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
