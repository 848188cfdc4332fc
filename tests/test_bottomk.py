"""Bottom-k uniform item sampling tests."""
import numpy as np
import pytest

from repro.sampling.bottomk import (
    BottomKSample,
    StreamingBottomK,
    bottomk_from_counts,
)
from repro.streams.orders import permuted_stream


class TestVectorized:
    def test_exact_when_few_items(self):
        items = np.arange(3)
        counts = np.asarray([5.0, 6, 7])
        bk = bottomk_from_counts(items, counts, 10, np.random.default_rng(0))
        assert bk.tau == 0.0
        assert bk.subset_sum(set(items.tolist())) == 18.0

    def test_sample_size(self):
        g = np.random.default_rng(1)
        bk = bottomk_from_counts(np.arange(100), np.ones(100), 10, g)
        assert len(bk.items) == 10 and 0 < bk.tau < 1

    def test_subset_sum_unbiased_mc(self):
        counts = np.asarray([50.0] * 4 + [2.0] * 96)
        items = np.arange(100)
        subset = set(range(0, 100, 2))
        truth = counts[::2].sum()
        g = np.random.default_rng(2)
        ests = [
            bottomk_from_counts(items, counts, 20, g).subset_sum(subset)
            for _ in range(6000)
        ]
        assert abs(np.mean(ests) - truth) < 0.08 * truth

    def test_uniform_inclusion_regardless_of_count(self):
        counts = np.asarray([1000.0] + [1.0] * 99)
        items = np.arange(100)
        g = np.random.default_rng(3)
        hits = sum(
            0 in bottomk_from_counts(items, counts, 10, g).items
            for _ in range(4000)
        )
        # the heavy item is included ~ k/n = 10%, not ~100%
        assert 0.06 < hits / 4000 < 0.14


class TestStreaming:
    def test_validation(self):
        with pytest.raises(ValueError):
            StreamingBottomK(0)

    def test_counts_exact_for_kept_items(self):
        counts = np.asarray([7, 3, 9, 2, 5, 4, 8, 1, 6, 10])
        rng = np.random.default_rng(4)
        stream = permuted_stream(counts, rng)
        sb = StreamingBottomK(4, seed=5)
        sb.update_many(stream.tolist())
        res = sb.result()
        for item, c in zip(res.items, res.counts):
            assert c == counts[int(item)]

    def test_exact_when_under_k(self):
        sb = StreamingBottomK(10, seed=0)
        sb.update_many(["a", "a", "b"])
        res = sb.result()
        assert res.tau == 0.0
        assert res.subset_sum({"a", "b"}) == 3.0

    def test_size_bounded(self):
        sb = StreamingBottomK(5, seed=1)
        sb.update_many([str(i) for i in range(500)])
        assert len(sb.result().items) == 5

    def test_mean_matches_vectorized_mc(self):
        counts = np.asarray([20, 5, 5, 5, 5, 5, 5])
        items = np.arange(len(counts))
        subset = {0, 1}
        truth = 25.0
        ests_s, ests_v = [], []
        for r in range(2500):
            rng = np.random.default_rng(r)
            stream = permuted_stream(counts, rng)
            sb = StreamingBottomK(3, seed=r)
            sb.update_many(stream.tolist())
            ests_s.append(sb.result().subset_sum(subset))
            ests_v.append(
                bottomk_from_counts(
                    items, counts.astype(float), 3, np.random.default_rng(10_000 + r)
                ).subset_sum(subset)
            )
        assert abs(np.mean(ests_s) - truth) < 0.12 * truth
        assert abs(np.mean(ests_s) - np.mean(ests_v)) < 0.15 * truth


class TestPredicateMember:
    def test_callable_membership(self):
        bk = BottomKSample(np.asarray([1, 2, 3]), np.asarray([4.0, 5, 6]), 0.5)
        assert bk.subset_sum(lambda x: x > 1) == (5 + 6) / 0.5
