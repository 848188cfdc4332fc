"""Micro-scale runs of every table harness: structure + key claims.

These are the paper's qualitative findings at toy scale; the full-scale
numbers live in benchmarks/ and EXPERIMENTS.md.
"""
import numpy as np
import pytest

from repro.experiments import (
    t1_inclusion,
    t2_skew,
    t3_bottomk,
    t4_priority,
    t5_criteo,
    t6_pathological,
    t7_epochs_ci,
    t8_epochs_det,
    t9_distributed,
)


class TestT1Inclusion:
    @pytest.fixture(scope="class")
    def per_item(self, spark):
        return t1_inclusion.run(
            spark, n_items=300, total=30_000, m=50, n_reps=60, seed=0
        )

    def test_structure(self, per_item):
        assert {"item", "count", "pi_pps", "pi_empirical"} <= set(per_item.columns)
        assert per_item["pi_empirical"].between(0, 1).all()

    def test_matches_pps(self, per_item):
        tab = t1_inclusion.summarize(per_item, n_buckets=5)
        assert (tab["abs_gap"] < 0.12).all()

    def test_heavy_items_certain(self, per_item):
        top = per_item.nlargest(5, "count")
        assert (top["pi_empirical"] > 0.95).all()


class TestT2Skew:
    def test_more_skew_less_error(self, spark):
        tab = t2_skew.run(
            spark,
            shapes=(0.3, 2.0),
            n_items=300,
            total=40_000,
            m=60,
            subset_size=40,
            n_subsets=12,
            n_reps=15,
        )
        mean_by_shape = tab.groupby("shape")["rrmse_mean"].mean()
        assert mean_by_shape[0.3] < mean_by_shape[2.0]


class TestT3BottomK:
    def test_uniform_sampling_much_worse(self, spark):
        tab = t3_bottomk.run(
            spark,
            n_items=300,
            total=40_000,
            m=50,
            subset_size=40,
            n_subsets=12,
            n_reps=15,
        )
        ratios = tab["bottomk_over_uss"].dropna()
        assert (ratios > 1.0).all()
        assert ratios.max() > 3.0


class TestT4Priority:
    def test_uss_competitive_and_total_exact(self, spark):
        tab, totals = t4_priority.run(
            spark,
            n_items=300,
            total=40_000,
            m=60,
            subset_size=40,
            n_subsets=12,
            n_reps=15,
        )
        by = tab.groupby("method")["rrmse_mean"].mean()
        assert by["unbiased_ss"] < 2.0 * by["priority"]
        t = totals.set_index("method")["total_rrmse"]
        assert t["unbiased_ss"] == 0.0
        assert t["priority"] > 0.0


class TestT5Criteo:
    def test_structure_and_ordering(self, spark):
        tab = t5_criteo.run(spark, n_rows=15_000, m=400, n_reps=5)
        assert {"method", "rel_mse_mean", "bucket"} <= set(tab.columns)
        for method, grp in tab.groupby("method"):
            g = grp.sort_values("bucket")
            # larger marginals are estimated (weakly) better
            assert g["rel_mse_mean"].iloc[-1] < g["rel_mse_mean"].iloc[0]


class TestT6Pathological:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return t6_pathological.run(
            spark,
            n_items_half=200,
            total_half=20_000,
            m=40,
            subset_size=20,
            n_subsets=8,
            n_reps=30,
        )

    def test_det_forgets_first_half(self, result):
        inc, _ = result
        det = inc[inc["method"] == "deterministic_ss"]
        uss = inc[inc["method"] == "unbiased_ss"]
        assert det["pi_empirical"].sum() < 0.3 * uss["pi_empirical"].sum()

    def test_det_biased_uss_not(self, result):
        _, err = result
        err = err.set_index("method")
        assert err.loc["deterministic_ss", "rel_bias_mean"] < -0.5
        assert abs(err.loc["unbiased_ss", "rel_bias_mean"]) < 0.15
        assert (
            err.loc["deterministic_ss", "rrmse_mean"]
            > err.loc["unbiased_ss", "rrmse_mean"]
        )


class TestT7EpochsCI:
    @pytest.fixture(scope="class")
    def tab(self, spark):
        return t7_epochs_ci.run(
            spark, n_items=500, total=80_000, m=100, n_epochs=5, n_reps=40
        )

    def test_structure(self, tab):
        assert len(tab) == 5
        assert {"coverage", "empirical_sd", "estimated_sd", "pps_sd"} <= set(
            tab.columns
        )

    def test_coverage_good_where_clt_applies(self, tab):
        # epochs with >= ~10 sampled items should be near/above nominal
        ok = tab[tab["mean_items_in_sample"] >= 10]
        assert (ok["coverage"] >= 0.85).all()

    def test_variance_estimate_not_underestimating(self, tab):
        big = tab[tab["mean_items_in_sample"] >= 5]
        assert (big["estimated_sd"] >= 0.6 * big["empirical_sd"]).all()

    def test_unbiased_per_epoch(self, tab):
        big = tab[tab["mean_items_in_sample"] >= 5]
        assert (big["rel_bias"].abs() < 0.25).all()


class TestT8EpochsDet:
    def test_det_much_worse_on_late_epochs(self, spark):
        tab = t8_epochs_det.run(
            spark, n_items=500, total=80_000, m=100, n_epochs=5, n_reps=20
        )
        late = tab.iloc[-2:]
        assert (late["det_over_uss"] > 1.5).all()


class TestT9Distributed:
    def test_unbiased_and_covered(self, spark):
        tab = t9_distributed.run(
            spark, sf=0.004, m=150, n_reps=8, n_partitions=8
        )
        # average relative bias across brands ~ 0 (unbiased merge)
        assert abs(tab["rel_bias"].mean()) < 0.1
        assert tab["coverage"].mean() >= 0.8
