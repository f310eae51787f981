"""Periodic source-rate pattern (paper §V-A, "Source Rate Simulation").

A basic cycle of ten multipliers ``[3,7,4,2,1,10,8,5,6,9]`` (in units of
W_u) is replicated to a sequence of 20; six permutations of that sequence
are generated per query, yielding 120 source-rate changes per query.
"""
from __future__ import annotations

import numpy as np

BASE_CYCLE: tuple[int, ...] = (3, 7, 4, 2, 1, 10, 8, 5, 6, 9)


def periodic_pattern(*, n_permutations: int = 6, seed: int = 7) -> list[int]:
    """The full evaluation sequence of source-rate multipliers.

    Each permutation shuffles the 20-element (replicated) cycle with a
    deterministic RNG; the total length is ``20 * n_permutations`` = 120
    for the paper's setting.
    """
    rng = np.random.default_rng(seed)
    seq: list[int] = []
    base = list(BASE_CYCLE) * 2
    for _ in range(n_permutations):
        perm = list(base)
        rng.shuffle(perm)
        seq.extend(perm)
    return seq


def pretrain_rates(n: int, *, seed: int) -> list[float]:
    """Random rate multipliers in (1, 10), guaranteed disjoint from the
    integer multipliers used during tuning (paper: 'rates used in tuning
    differ from those in pre-training')."""
    rng = np.random.default_rng(seed)
    out: list[float] = []
    while len(out) < n:
        x = float(rng.uniform(1.0, 10.0))
        if abs(x - round(x)) > 0.05:  # avoid the tuning multipliers
            out.append(round(x, 3))
    return out
