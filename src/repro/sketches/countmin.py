"""CountMin sketch (Cormode & Muthukrishnan 2005).

Prior art the paper cites for sum queries with *known* filter
conditions (sec 3) and the counting sketch used on Criteo-style
historical counts by Shrivastava et al. (2016). Included as a
comparator: estimates are upward biased (``n_i <= N_hat_i <= n_i +
eps * n_tot`` w.h.p. with ``eps = e / width``), so aggregating many
CountMin point queries accumulates bias, unlike Unbiased Space Saving.
"""
from __future__ import annotations

import zlib
from typing import Hashable, Iterable

import numpy as np


class CountMin:
    """depth x width counter matrix with independent salted hashes."""

    def __init__(self, *, width: int, depth: int = 4, seed: int = 0):
        if width < 1 or depth < 1:
            raise ValueError("width and depth must be >= 1")
        self.width = width
        self.depth = depth
        self.seed = seed
        self.table = np.zeros((depth, width), dtype=np.int64)
        self.t = 0

    def _cols(self, item: Hashable) -> list[int]:
        key = repr(item).encode()
        return [
            zlib.crc32(key, (self.seed << 8) | r) % self.width
            for r in range(self.depth)
        ]

    def update(self, item: Hashable, count: int = 1) -> None:
        """Add ``count`` occurrences of ``item``."""
        self.t += count
        for r, c in enumerate(self._cols(item)):
            self.table[r, c] += count

    def update_many(self, items: Iterable[Hashable]) -> None:
        """Process rows in stream order."""
        for x in items:
            self.update(x)

    def estimate(self, item: Hashable) -> int:
        """Min over rows: upward-biased point estimate of the count."""
        return int(min(self.table[r, c] for r, c in enumerate(self._cols(item))))

    def error_bound(self, delta_rows: int | None = None) -> float:
        """``e/width * n_tot`` — the standard w.h.p. overcount bound."""
        return float(np.e / self.width * self.t)
