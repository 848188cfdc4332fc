"""CountMin comparator tests."""
import random

import pytest

from repro.sketches.countmin import CountMin


def _stream(seed, n=3000, n_items=200):
    rng = random.Random(seed)
    return [f"k{rng.randrange(n_items)}" for _ in range(n)]


class TestCountMin:
    def test_validation(self):
        with pytest.raises(ValueError):
            CountMin(width=0)

    def test_never_underestimates(self):
        stream = _stream(0)
        cm = CountMin(width=300, depth=4, seed=1)
        cm.update_many(stream)
        truth = {x: stream.count(x) for x in set(stream)}
        for x, n_x in truth.items():
            assert cm.estimate(x) >= n_x

    def test_error_bound_mostly_holds(self):
        stream = _stream(1)
        cm = CountMin(width=400, depth=5, seed=2)
        cm.update_many(stream)
        truth = {x: stream.count(x) for x in set(stream)}
        bound = cm.error_bound()
        violations = sum(
            1 for x, n_x in truth.items() if cm.estimate(x) - n_x > bound
        )
        assert violations <= max(2, len(truth) // 50)

    def test_weighted_updates(self):
        cm = CountMin(width=64, depth=3, seed=0)
        cm.update("a", 10)
        cm.update("a", 5)
        assert cm.estimate("a") >= 15
        assert cm.t == 15

    def test_absent_item_small(self):
        cm = CountMin(width=1024, depth=4, seed=3)
        cm.update_many(_stream(2, n=500))
        assert cm.estimate("never-seen") <= cm.error_bound()

    def test_deterministic_in_seed(self):
        a = CountMin(width=64, depth=3, seed=9)
        b = CountMin(width=64, depth=3, seed=9)
        for s in (a, b):
            s.update_many(_stream(3, n=300))
        assert (a.table == b.table).all()
