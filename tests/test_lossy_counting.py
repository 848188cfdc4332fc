"""Simplified Lossy Counting tests (paper sec 5.2)."""
import random

import pytest

from repro.sketches.lossy_counting import LossyCounting


def _stream(seed, n=2000, n_items=150):
    rng = random.Random(seed)
    return [rng.randrange(n_items) for _ in range(n)]


class TestLossyCounting:
    def test_validation(self):
        with pytest.raises(ValueError):
            LossyCounting(0)

    def test_decrement_schedule(self):
        lc = LossyCounting(10)
        lc.update_many(_stream(0, n=95))
        assert lc.decrements == 9  # floor(95/10)

    def test_counter_is_lower_bound(self):
        stream = _stream(1)
        lc = LossyCounting(25)
        lc.update_many(stream)
        truth = {x: stream.count(x) for x in set(stream)}
        for x, c in lc.counters.items():
            assert 0 < c <= truth[x]

    def test_upper_bound_view(self):
        stream = _stream(2)
        lc = LossyCounting(25)
        lc.update_many(stream)
        truth = {x: stream.count(x) for x in set(stream)}
        for x, ub in lc.upper_bound_view().items():
            assert ub >= truth[x]

    def test_error_at_most_decrements(self):
        stream = _stream(3)
        lc = LossyCounting(30)
        lc.update_many(stream)
        truth = {x: stream.count(x) for x in set(stream)}
        for x, n_x in truth.items():
            assert n_x - lc.estimate(x) <= lc.decrements

    def test_frequent_item_retained(self):
        rng = random.Random(4)
        stream = ["hot"] * 600 + [f"x{rng.randrange(400)}" for _ in range(1400)]
        rng.shuffle(stream)
        lc = LossyCounting(20)
        lc.update_many(stream)
        # an item with frequency > t/m survives the schedule
        assert lc.estimate("hot") > 0

    def test_size_not_bounded_by_m(self):
        # between decrements, fresh items coexist with long-lived heavy
        # counters: size may exceed m (sec 5.2). Three heavies at 1/3
        # frequency survive every 5-row decrement; four fresh items then
        # arrive before the next decrement fires.
        lc = LossyCounting(5)
        lc.update_many(["a", "b", "c"] * 20)  # t=60, counts a=b=c=8
        lc.update_many(["d", "e", "f", "g"])  # t=64 < next decrement at 65
        assert lc.size() == 7 > 5

    def test_exact_small_stream(self):
        lc = LossyCounting(100)
        lc.update_many(list("aabbc"))
        assert lc.estimates() == {"a": 2, "b": 2, "c": 1}
