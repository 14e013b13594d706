"""NAIVE sampling (§2.3): uniform choice over E_v, no initialization.

Only valid for unbiased RW. Generation is one integer draw; O(1) time and
space.
"""
from __future__ import annotations

import numpy as np

from repro.core import rng


def generate_scalar(d: int, seed: int, qid: int, step: int) -> int:
    """Pick a uniform local edge index in [0, d)."""
    return rng.randint_scalar(seed, qid, step, 0, d)


def generate_batch(deg: np.ndarray, seed: int, qids: np.ndarray, steps: np.ndarray) -> np.ndarray:
    """Vectorized generation for a ring of walkers (deg[i] = d of walker i)."""
    return rng.randint(seed, qids, steps, 0, deg)
