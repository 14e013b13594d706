"""Shared fixtures: small deterministic graphs and apps for unit tests."""
from __future__ import annotations

import numpy as np
import pytest

from repro.graph import generators as gen
from repro.graph.csr import CSRGraph, from_arrays


@pytest.fixture(scope="session")
def small_graph() -> CSRGraph:
    """~1k-vertex power-law graph, weighted + labeled (5 labels)."""
    return gen.rmat(1000, 4000, seed=11, name="small")


@pytest.fixture(scope="session")
def dense_graph() -> CSRGraph:
    """Denser uniform graph (d_avg ~ 16) for sampler-heavy tests."""
    return gen.erdos_renyi(400, 3200, seed=13, name="dense")


@pytest.fixture(scope="session")
def sink_graph() -> CSRGraph:
    """Directed graph with a dead-end (vertex 3 has no out-edges)."""
    src = np.array([0, 0, 1, 2, 2])
    dst = np.array([1, 2, 3, 3, 0])
    return from_arrays(src, dst, 4, weight=np.arange(1.0, 6.0), name="sink")


@pytest.fixture(scope="session")
def star_graph() -> CSRGraph:
    """One hub (0) with weighted spokes — exact sampling distributions."""
    n_leaf = 8
    src = np.concatenate([np.zeros(n_leaf, dtype=np.int64), np.arange(1, n_leaf + 1)])
    dst = np.concatenate([np.arange(1, n_leaf + 1), np.zeros(n_leaf, dtype=np.int64)])
    w = np.concatenate([np.arange(1.0, n_leaf + 1.0), np.ones(n_leaf)])
    lab = np.concatenate([np.arange(n_leaf) % 3, np.zeros(n_leaf)]).astype(np.int64)
    return from_arrays(src, dst, n_leaf + 1, weight=w, label=lab, name="star")


@pytest.fixture(scope="session")
def sources_small(small_graph) -> np.ndarray:
    return gen.random_sources(small_graph, 40, seed=5)
