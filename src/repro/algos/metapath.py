"""MetaPath walks (§2.2): label-constrained walks on labeled graphs.

A walk at step i may only take edges whose label equals ``H[i mod |H|]``;
among those it chooses uniformly. The label filter can zero out *every*
edge (the reason KnightKing's O-REJ cannot express MetaPath, §2.4) — a
walker with no valid edge terminates. Default schema length is 5 with
labels drawn from the graph's label set at random (§3), deterministically
in ``seed``.
"""
from __future__ import annotations

from functools import partial

import numpy as np

from repro.core.model import RandomWalkApp, WalkerType
from repro.graph.csr import CSRGraph


def metapath_weight(
    csr: CSRGraph,
    flat_idx: np.ndarray,
    prev: np.ndarray,
    steps: np.ndarray,
    *,
    schema: tuple,
) -> np.ndarray:
    """Vectorized Weight UDF: 1 for schema-matching labels, else 0."""
    sch = np.asarray(schema, dtype=np.int64)
    want = sch[steps % len(sch)]
    return (csr.label[flat_idx] == want).astype(np.float64)


def random_schema(csr: CSRGraph, length: int = 5, seed: int = 0) -> tuple:
    """Random schema over the labels that actually occur in the graph."""
    labels = np.unique(csr.label) if csr.num_edges else np.array([0])
    g = np.random.default_rng(seed)
    return tuple(int(x) for x in g.choice(labels, size=length))


def make_app(
    schema: tuple | None = None,
    csr: CSRGraph | None = None,
    schema_len: int = 5,
    seed: int = 0,
    **_,
) -> RandomWalkApp:
    if schema is None:
        if csr is None:
            raise ValueError("provide a schema or a csr to derive one from")
        schema = random_schema(csr, schema_len, seed)
    return RandomWalkApp(
        name="metapath",
        walker_type=WalkerType.DYNAMIC,
        sampler="its",
        target_length=len(schema),
        weight_fn=partial(metapath_weight, schema=tuple(schema)),
        params={"schema": tuple(schema)},
    )
