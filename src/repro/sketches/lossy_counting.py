"""Simplified Lossy Counting (Manku & Motwani 2002), as in paper sec 5.2.

The paper's simplified description: apply the same decrement reduction
as Misra-Gries but on a *fixed schedule* — after every ``m`` rows all
counters are decremented by 1 (zeros dropped) — to find items with
frequency > n/m. Unlike Misra-Gries the number of counters is not
bounded by ``m``; in the worst case it grows to ``O(m log(n/m))``.

Adding the number of decrement rounds back to any non-zero counter
recovers (an upper bound on) the original count, mirroring the
Space Saving relationship.
"""
from __future__ import annotations

from typing import Hashable, Iterable


class LossyCounting:
    """Fixed-schedule decrementing counter sketch."""

    def __init__(self, m: int):
        if m < 1:
            raise ValueError("m must be >= 1")
        self.m = m
        self.counters: dict = {}
        self.decrements = 0
        self.t = 0

    def update(self, item: Hashable) -> None:
        """Process one row for ``item``."""
        c = self.counters
        c[item] = c.get(item, 0) + 1
        self.t += 1
        if self.t % self.m == 0:
            self.decrements += 1
            dead = [x for x in c if c[x] <= 1]
            for x in c:
                c[x] -= 1
            for x in dead:
                del c[x]

    def update_many(self, items: Iterable[Hashable]) -> None:
        """Process rows in stream order."""
        for x in items:
            self.update(x)

    def estimate(self, item: Hashable) -> int:
        """Lower-bound estimate; true count is at most this + decrements."""
        return self.counters.get(item, 0)

    def estimates(self) -> dict:
        """item -> counter for all tracked items."""
        return dict(self.counters)

    def upper_bound_view(self) -> dict:
        """Counter + decrement rounds: an upper bound on each true count."""
        d = self.decrements
        return {x: c + d for x, c in self.counters.items()}

    def size(self) -> int:
        """Current number of counters (not bounded by m, sec 5.2)."""
        return len(self.counters)
