"""Adaptive sample-and-hold (sec 5.4): unbiasedness and inferiority to USS."""
import random

import numpy as np
import pytest

from repro.core.space_saving import UnbiasedSpaceSaving
from repro.sketches.sample_and_hold import AdaptiveSampleAndHold


class TestBasics:
    def test_validation(self):
        with pytest.raises(ValueError):
            AdaptiveSampleAndHold(0)
        with pytest.raises(ValueError):
            AdaptiveSampleAndHold(5, beta=1.5)

    def test_exact_when_under_capacity(self):
        sh = AdaptiveSampleAndHold(10, seed=0)
        sh.update_many(list("aabbbc"))
        assert sh.p == 1.0
        assert sh.estimates() == {"a": 2.0, "b": 3.0, "c": 1.0}

    def test_size_bounded_after_resample(self):
        rng = random.Random(1)
        sh = AdaptiveSampleAndHold(20, seed=2)
        sh.update_many(str(rng.randrange(500)) for _ in range(3000))
        assert len(sh.counters) <= 20
        assert sh.p < 1.0

    def test_estimate_absent_zero(self):
        sh = AdaptiveSampleAndHold(5, seed=0)
        sh.update_many(list("ab"))
        assert sh.estimate("z") == 0.0

    def test_subset_sum(self):
        sh = AdaptiveSampleAndHold(10, seed=0)
        sh.update_many(list("aabbbc"))
        assert sh.subset_sum({"a", "b"}) == 5.0
        assert sh.subset_sum(lambda x: x == "c") == 1.0

    def test_geometric_support(self):
        sh = AdaptiveSampleAndHold(5, seed=3)
        draws = [sh._geometric(0.3) for _ in range(2000)]
        assert min(draws) == 1
        assert abs(np.mean(draws) - 1 / 0.3) < 0.2


class TestUnbiasedness:
    def test_monte_carlo_unbiased(self):
        # small sketch forced to resample repeatedly
        truth = {0: 40, 1: 25, 2: 6, 3: 6, 4: 6, 5: 6, 6: 6, 7: 5}
        base = [i for i, c in truth.items() for _ in range(c)]
        reps = 3000
        acc = np.zeros(len(truth))
        for r in range(reps):
            rng = np.random.default_rng(r)
            stream = np.asarray(base)
            rng.shuffle(stream)
            sh = AdaptiveSampleAndHold(4, seed=10_000 + r)
            sh.update_many(stream.tolist())
            for i in truth:
                acc[i] += sh.estimate(i)
        means = acc / reps
        for i, c in truth.items():
            # 5-sigma Monte-Carlo band; variance of SH is sizeable
            assert abs(means[i] - c) < 5 * 20 / np.sqrt(reps) + 0.8


class TestInferiorityToUSS:
    def test_uss_has_lower_subset_error(self):
        """Sec 5.4: SH injects geometric noise into every bin; USS wins."""
        rng = np.random.default_rng(0)
        counts = np.asarray([80] * 5 + [3] * 200)
        base = np.repeat(np.arange(len(counts)), counts)
        subset = set(range(5, 105))
        truth = counts[5:105].sum()
        m = 20
        reps = 300
        err_sh, err_uss = [], []
        for r in range(reps):
            stream = base.copy()
            rng.shuffle(stream)
            sh = AdaptiveSampleAndHold(m, seed=2 * r)
            sh.update_many(stream.tolist())
            err_sh.append(sh.subset_sum(subset) - truth)
            us = UnbiasedSpaceSaving.from_stream(stream.tolist(), m, seed=2 * r + 1)
            err_uss.append(us.subset_sum(subset)[0] - truth)
        rmse_sh = np.sqrt(np.mean(np.square(err_sh)))
        rmse_uss = np.sqrt(np.mean(np.square(err_uss)))
        assert rmse_uss < rmse_sh
