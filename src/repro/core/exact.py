"""Exact-enumeration reference for Algorithm 1 (tiny inputs only).

Enumerates every randomization path of the Space Saving update rule with
exact :class:`fractions.Fraction` probabilities, yielding the exact
distribution over sketch states and exact expected count estimates.
Used by tests to verify Theorem 1 (unbiasedness of Unbiased Space
Saving) and the failure of unbiasedness for the deterministic variant,
with zero Monte-Carlo error.

State space is exponential in stream length; keep streams <= ~10 rows
and m <= 3.
"""
from __future__ import annotations

from fractions import Fraction
from typing import Hashable, Sequence

#: a state is a sorted tuple of (item, count) pairs — one per bin in use
State = tuple[tuple[Hashable, int], ...]


def _canon(bins: Sequence[tuple[Hashable, int]]) -> State:
    return tuple(sorted(bins, key=lambda p: (str(p[0]), p[1])))


def exact_state_distribution(
    stream: Sequence[Hashable], m: int, *, unbiased: bool = True
) -> dict[State, Fraction]:
    """Exact distribution over final sketch states after ``stream``.

    Random choices enumerated: uniform tie-breaking among minimum bins,
    and (for the unbiased variant) the ``1/(N_min+1)`` label flip.
    """
    dist: dict[State, Fraction] = {(): Fraction(1)}
    for x in stream:
        nxt: dict[State, Fraction] = {}

        def put(state: State, p: Fraction) -> None:
            nxt[state] = nxt.get(state, Fraction(0)) + p

        for state, p in dist.items():
            bins = list(state)
            idx = next((i for i, (it, _) in enumerate(bins) if it == x), None)
            if idx is not None:
                it, c = bins[idx]
                bins[idx] = (it, c + 1)
                put(_canon(bins), p)
            elif len(bins) < m:
                bins.append((x, 1))
                put(_canon(bins), p)
            else:
                mn = min(c for _, c in bins)
                mins = [i for i, (_, c) in enumerate(bins) if c == mn]
                tie = Fraction(1, len(mins))
                for i in mins:
                    it, c = bins[i]
                    if unbiased:
                        p_flip = Fraction(1, c + 1)
                        flipped = list(bins)
                        flipped[i] = (x, c + 1)
                        put(_canon(flipped), p * tie * p_flip)
                        kept = list(bins)
                        kept[i] = (it, c + 1)
                        put(_canon(kept), p * tie * (1 - p_flip))
                    else:
                        flipped = list(bins)
                        flipped[i] = (x, c + 1)
                        put(_canon(flipped), p * tie)
        dist = nxt
    return dist


def exact_expected_estimates(
    stream: Sequence[Hashable], m: int, *, unbiased: bool = True
) -> dict[Hashable, Fraction]:
    """Exact ``E[N_hat_i]`` for every item appearing in ``stream``.

    For Unbiased Space Saving this must equal the true count of each
    item exactly (Theorem 1).
    """
    dist = exact_state_distribution(stream, m, unbiased=unbiased)
    exp: dict[Hashable, Fraction] = {x: Fraction(0) for x in set(stream)}
    for state, p in dist.items():
        for it, c in state:
            if it in exp:
                exp[it] += p * c
    return exp


def exact_inclusion_probabilities(
    stream: Sequence[Hashable], m: int, *, unbiased: bool = True
) -> dict[Hashable, Fraction]:
    """Exact ``P(item is a label in the final sketch)`` per item."""
    dist = exact_state_distribution(stream, m, unbiased=unbiased)
    inc: dict[Hashable, Fraction] = {x: Fraction(0) for x in set(stream)}
    for state, p in dist.items():
        for it, _ in state:
            if it in inc:
                inc[it] += p
    return inc
