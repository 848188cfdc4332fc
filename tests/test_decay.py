"""Forward-decay time-weighted sketch tests (sec 5.3)."""
import math

import numpy as np
import pytest

from repro.core.decay import ForwardDecaySpaceSaving


class TestForwardDecay:
    def test_validation(self):
        with pytest.raises(ValueError):
            ForwardDecaySpaceSaving(5, rate=-1.0)

    def test_timestamps_must_be_monotone(self):
        sk = ForwardDecaySpaceSaving(5, rate=0.1, seed=0)
        sk.add("a", 1.0)
        with pytest.raises(ValueError):
            sk.add("b", 0.5)

    def test_zero_rate_is_plain_counting(self):
        sk = ForwardDecaySpaceSaving(10, rate=0.0, seed=0)
        for t, x in enumerate(["a", "a", "b", "c", "a"]):
            sk.add(x, float(t))
        assert sk.estimates() == {"a": 3.0, "b": 1.0, "c": 1.0}

    def test_exact_decayed_counts_under_capacity(self):
        rate = 0.5
        sk = ForwardDecaySpaceSaving(10, rate=rate, seed=0)
        rows = [("a", 0.0), ("b", 1.0), ("a", 2.0)]
        for x, t in rows:
            sk.add(x, t)
        q = 2.0
        est = sk.estimates(q)
        exact_a = math.exp(-rate * 2.0) + math.exp(-rate * 0.0)
        exact_b = math.exp(-rate * 1.0)
        assert math.isclose(est["a"], exact_a, rel_tol=1e-9)
        assert math.isclose(est["b"], exact_b, rel_tol=1e-9)

    def test_recent_items_weighted_more(self):
        # same raw count, but "new" arrives later -> larger decayed count
        sk = ForwardDecaySpaceSaving(10, rate=1.0, seed=0)
        for t in range(5):
            sk.add("old", float(t))
        for t in range(5, 10):
            sk.add("new", float(t))
        est = sk.estimates(10.0)
        assert est["new"] > est["old"]

    def test_size_bounded(self):
        sk = ForwardDecaySpaceSaving(4, rate=0.01, seed=1)
        for t in range(200):
            sk.add(t % 50, float(t))
        assert len(sk.estimates()) <= 4

    def test_unbiased_mc(self):
        rate = 0.1
        rows = [(i % 6, float(t)) for t, i in enumerate(range(30))]
        q = 30.0
        exact: dict = {}
        for x, t in rows:
            exact[x] = exact.get(x, 0.0) + math.exp(-rate * (q - t))
        reps = 3000
        acc = {x: 0.0 for x in exact}
        for r in range(reps):
            sk = ForwardDecaySpaceSaving(3, rate=rate, seed=r)
            for x, t in rows:
                sk.add(x, t)
            est = sk.estimates(q)
            for x in acc:
                acc[x] += est.get(x, 0.0)
        for x, e in exact.items():
            assert abs(acc[x] / reps - e) < 0.2 * e + 0.05, (x, acc[x] / reps, e)

    def test_result_normalized(self):
        sk = ForwardDecaySpaceSaving(5, rate=0.2, seed=0)
        sk.add("a", 0.0)
        sk.add("a", 1.0)
        res = sk.result(1.0)
        assert math.isclose(
            res.estimate("a"), math.exp(-0.2) + 1.0, rel_tol=1e-9
        )
