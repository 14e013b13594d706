"""Counter-RNG: determinism, uniformity, lane decorrelation."""
import numpy as np
import pytest

from repro.core import rng


def test_uniform_range():
    u = rng.uniform(1, np.arange(100_000), 0, 0)
    assert u.min() >= 0.0 and u.max() < 1.0


def test_uniform_deterministic():
    a = rng.uniform(7, np.arange(64), 3, 2)
    b = rng.uniform(7, np.arange(64), 3, 2)
    assert np.array_equal(a, b)


def test_scalar_matches_vector():
    vec = rng.uniform(9, np.arange(32), 5, 1)
    for q in range(32):
        assert rng.uniform_scalar(9, q, 5, 1) == vec[q]


def test_randint_scalar_matches_vector():
    vec = rng.randint(9, np.arange(32), 5, 1, 17)
    for q in range(32):
        assert rng.randint_scalar(9, q, 5, 1, 17) == vec[q]


@pytest.mark.parametrize("bound", [1, 2, 7, 64, 1000])
def test_randint_bounds(bound):
    x = rng.randint(3, np.arange(20_000), 0, 0, bound)
    assert x.min() >= 0 and x.max() < bound


def test_randint_vector_bounds():
    bounds = np.array([1, 5, 10, 100] * 250)
    x = rng.randint(3, np.arange(1000), 2, 0, bounds)
    assert np.all(x >= 0) and np.all(x < bounds)


def test_uniform_mean_and_spread():
    u = rng.uniform(11, np.arange(200_000), 0, 0)
    assert abs(u.mean() - 0.5) < 0.005
    assert abs(u.var() - 1 / 12) < 0.005


@pytest.mark.parametrize("lane", ["seed", "qid", "step", "draw"])
def test_lane_changes_value(lane):
    base = dict(seed=1, qid=2, step=3, draw=4)
    a = rng.uniform(**base)
    base[lane] = base[lane] + 1
    b = rng.uniform(**base)
    assert a != b


def test_lanes_decorrelated():
    """Correlation between adjacent steps/qids must be ~0."""
    u1 = rng.uniform(1, np.arange(50_000), 0, 0)
    u2 = rng.uniform(1, np.arange(50_000), 1, 0)
    assert abs(np.corrcoef(u1, u2)[0, 1]) < 0.02
    u3 = rng.uniform(1, 0, np.arange(50_000), 0)
    u4 = rng.uniform(1, 1, np.arange(50_000), 0)
    assert abs(np.corrcoef(u3, u4)[0, 1]) < 0.02


def test_broadcasting_shapes():
    u = rng.uniform(1, np.arange(8)[:, None], np.arange(5)[None, :], 0)
    assert u.shape == (8, 5)
    assert len(np.unique(u)) == 40


def test_randint_uniformity_chi2ish():
    x = rng.randint(5, np.arange(120_000), 0, 0, 6)
    counts = np.bincount(x, minlength=6)
    expected = 20_000
    assert np.all(np.abs(counts - expected) < 5 * np.sqrt(expected))


def test_mix64_bijective_sample():
    xs = np.arange(100_000, dtype=np.uint64)
    assert len(np.unique(rng._mix64(xs))) == len(xs)
