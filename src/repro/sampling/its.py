"""Inverse transformation sampling (§2.3).

Initialization computes the cumulative distribution (O(d)); generation
draws one uniform real and binary-searches the CDF (O(log d)). The batch
generation's vectorized binary search is the SDG "cycle stage" — each loop
iteration touches one cache line per walker, which is exactly what the
step-interleaved trace executor models.
"""
from __future__ import annotations

import numpy as np

from repro.core import rng
from repro.sampling.base import bisect_first_greater


def init(weights: np.ndarray) -> np.ndarray:
    """Initialization phase: inclusive cumulative sums (the CDF, unnormalized)."""
    return np.cumsum(weights)


def generate_scalar(cum: np.ndarray, seed: int, qid: int, step: int) -> int:
    """Pick the smallest i with x < cum[i] for x ~ U[0, total).

    Returns -1 when the distribution has zero total mass (dead walker —
    e.g. MetaPath with no label-matching edge).
    """
    d = len(cum)
    total = float(cum[-1]) if d else 0.0
    if total <= 0.0:
        return -1
    x = rng.uniform_scalar(seed, qid, step, 0) * total
    i = int(np.searchsorted(cum, x, side="right"))
    return min(i, d - 1)


def generate_batch(
    cum_flat: np.ndarray,
    starts: np.ndarray,
    counts: np.ndarray,
    totals: np.ndarray,
    seed: int,
    qids: np.ndarray,
    steps: np.ndarray,
) -> np.ndarray:
    """Vectorized generation over a ring.

    ``cum_flat`` holds each walker's segment CDF at ``[starts, starts+counts)``
    (either the preprocessed whole-graph table or the per-step Gather
    output). Returns local indices; -1 for zero-mass segments.
    """
    x = rng.uniform(seed, qids, steps, 0) * totals
    ends = starts + counts
    idx = bisect_first_greater(cum_flat, starts, ends, x)
    local = np.minimum(idx - starts, np.maximum(counts - 1, 0)).astype(np.int64)
    return np.where((totals > 0) & (counts > 0), local, -1)
