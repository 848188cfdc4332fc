"""Tests for the experiment utility layer (common, sweep, scales, t5)."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments.common import (
    bucket_by_quantile,
    draw_subsets,
    rrmse,
    run_replications,
)
from repro.experiments.scales import BENCH, TEST, params
from repro.experiments.subset_sweep import (
    estimates_rows,
    summarize,
    sweep_config,
)
from repro.experiments.t5_criteo import _eval_queries, build_queries
from repro.streams.criteo import impressions_pdf, tuple_item_column


class TestMetrics:
    def test_rrmse_zero_for_exact(self):
        assert rrmse(np.asarray([10.0, 10.0]), 10.0) == 0.0

    def test_rrmse_scale(self):
        assert rrmse(np.asarray([12.0, 8.0]), 10.0) == pytest.approx(0.2)

    def test_rrmse_rejects_zero_truth(self):
        with pytest.raises(ValueError):
            rrmse(np.asarray([1.0]), 0.0)

    def test_draw_subsets_deterministic(self):
        a = draw_subsets(100, 10, 5, seed=1)
        b = draw_subsets(100, 10, 5, seed=1)
        assert all((x == y).all() for x, y in zip(a, b))
        assert all(len(set(s.tolist())) == 10 for s in a)

    def test_bucket_by_quantile_cover_all(self):
        v = np.arange(100.0)
        idx, edges = bucket_by_quantile(v, 4)
        assert set(idx.tolist()) == {0, 1, 2, 3}
        assert len(edges) == 5
        assert (np.bincount(idx) == 25).all()


class TestRunReplications:
    def test_parallel_fan_out(self, spark):
        def fn(seed):
            return pd.DataFrame({"seed": [seed], "v": [seed * 2.0]})

        out = run_replications(spark, 9, fn, "seed long, v double", base_seed=5)
        assert sorted(out["seed"].tolist()) == list(range(5, 14))
        assert (out["v"] == out["seed"] * 2.0).all()


class TestSweepHelpers:
    def test_sweep_config_consistent(self):
        cfg = sweep_config(
            n_items=200, total=20_000, shape=0.5, subset_size=20, n_subsets=7
        )
        assert len(cfg["subsets"]) == 7
        assert len(cfg["truths"]) == 7
        assert cfg["total"] == cfg["counts"].sum()
        for s, t in zip(cfg["subsets"], cfg["truths"]):
            assert cfg["counts"][s].sum() == t

    def test_estimates_rows_schema(self):
        rows = estimates_rows(3, {"a": np.asarray([1.0, 2.0])})
        assert list(rows.columns) == ["seed", "subset_id", "method", "est"]
        assert len(rows) == 2

    def test_summarize_exact_estimates_zero_error(self):
        truths = np.asarray([10.0, 20.0, 30.0, 40.0])
        rows = pd.concat(
            [estimates_rows(s, {"x": truths}) for s in range(3)],
            ignore_index=True,
        )
        tab = summarize(rows, truths, 100.0, n_buckets=2)
        assert (tab["rrmse_mean"] == 0).all()


class TestScales:
    def test_params_copies(self):
        p = params("t1", "bench")
        p["m"] = -1
        assert BENCH["t1"]["m"] != -1

    def test_all_tables_present_in_both_scales(self):
        assert set(BENCH) == set(TEST) == {f"t{i}" for i in range(1, 10)}

    def test_unknown_scale(self):
        with pytest.raises(KeyError):
            params("t1", "huge")


class TestT5Queries:
    @pytest.fixture(scope="class")
    def agg(self):
        pdf = impressions_pdf(8000, seed=0)
        items = tuple_item_column(pdf).to_numpy()
        vc = pd.Series(items).value_counts()
        return vc.index.to_numpy(), vc.to_numpy().astype(float), float(len(pdf))

    def test_queries_above_threshold(self, agg):
        items, counts, total = agg
        queries = build_queries(items, counts, total, min_frac=0.01)
        truths = _eval_queries(items, counts, queries)
        assert (truths / total >= 0.01 - 1e-12).all()
        assert len(queries) > 0

    def test_eval_matches_pandas_groupby(self, agg):
        items, counts, total = agg
        from repro.streams.criteo import marginal_value

        q = build_queries(items, counts, total, min_frac=0.05)[:5]
        got = _eval_queries(items, counts, q)
        for query, val in zip(q, got):
            f, v = query[0], query[1]
            mask = marginal_value(items, f) == v
            if len(query) == 4:
                mask &= marginal_value(items, query[2]) == query[3]
            assert val == counts[mask].sum()

    def test_two_way_queries_present(self, agg):
        items, counts, total = agg
        queries = build_queries(items, counts, total, min_frac=0.002)
        assert any(len(q) == 4 for q in queries)
