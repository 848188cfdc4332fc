"""Experiment harnesses — one module per reproduced table (see DESIGN.md).

Each module exposes ``run(spark, **scale-params) -> pandas.DataFrame``
returning the table's rows; ``jobs/`` wraps them for spark-submit and
``benchmarks/`` wraps them for pytest-benchmark. Monte-Carlo
replications run in parallel across cores via Spark (``common.py``).
"""
