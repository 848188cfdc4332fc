"""Micro-benchmarks of the sketch kernels themselves.

Measures single-thread update throughput of the Unbiased / Deterministic
Space Saving kernel (rows/s) and the Spark DataFrame operator's
wall-clock on TPC-H-lite lineitem — the constant factors behind every
table benchmark.
"""
import numpy as np

from repro.core.kernel import SpaceSavingKernel
from repro.core.spark_sketch import sketch_dataframe
from repro.streams.orders import permuted_stream
from repro.streams.weibull import weibull_counts
from repro.synth_data import lineitem

_COUNTS = weibull_counts(1000, shape=0.3, target_total=200_000)
_STREAM = permuted_stream(_COUNTS, np.random.default_rng(0)).tolist()


def test_kernel_unbiased_throughput(benchmark):
    def run():
        k = SpaceSavingKernel(200, unbiased=True, seed=1)
        k.update_many(_STREAM)
        return k

    k = benchmark(run)
    assert k.total() == len(_STREAM)


def test_kernel_deterministic_throughput(benchmark):
    def run():
        k = SpaceSavingKernel(200, unbiased=False, seed=1)
        k.update_many(_STREAM)
        return k

    k = benchmark(run)
    assert k.total() == len(_STREAM)


def test_spark_operator_lineitem(spark, benchmark):
    li = lineitem(spark, sf=0.1).repartition(16).cache()
    n = li.count()

    def run():
        return sketch_dataframe(li, "l_partkey", 1000, seed=3)

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    li.unpersist()
    assert res.t == float(n)
