"""Whole-graph sampler preprocessing for unbiased/static RW (Algorithm 3).

For each vertex v, run the Weight function over E_v and the sampler's
initialization phase on the result, storing flattened tables aligned with
the CSR edge array. The engines then skip Gather at query time (§4.2).

Tables are cached on ``csr.aux`` keyed by ``(method, kind)`` where kind is
``"unbiased"`` (uniform weights) or ``"static"`` (edge weights), so a
benchmark that runs many engines on the same graph preprocesses once —
mirroring the paper's separation of preprocessing vs execution time. Use
``build(..., force=True)`` (or time ``build_tables``) to measure the
preprocessing cost itself.
"""
from __future__ import annotations

import numpy as np

from repro.graph.csr import CSRGraph
from repro.sampling import alias as alias_m
from repro.sampling import its as its_m
from repro.sampling.base import segment_cumsum


def static_weights(csr: CSRGraph, kind: str) -> np.ndarray:
    """Transition weights per edge slot: uniform (unbiased) or edge weight."""
    if kind == "unbiased":
        return np.ones(csr.num_edges)
    if kind == "static":
        return csr.weight
    raise ValueError(f"unknown kind {kind!r} (dynamic RW has no preprocessing)")


def build_tables(csr: CSRGraph, method: str, kind: str) -> dict:
    """Algorithm 3 over the whole graph for one (method, kind)."""
    w = static_weights(csr, kind)
    deg = csr.degrees()
    if method == "naive":
        if kind != "unbiased":
            raise ValueError("NAIVE supports unbiased RW only (§2.3)")
        return {}
    if method == "its":
        cum, totals = segment_cumsum(w, deg)
        return {"cum": cum, "totals": totals}
    if method == "alias":
        prob = np.ones(csr.num_edges)
        a1 = np.zeros(csr.num_edges, dtype=np.int64)
        a2 = np.zeros(csr.num_edges, dtype=np.int64)
        indptr = csr.indptr
        for v in range(csr.num_vertices):
            s, e = int(indptr[v]), int(indptr[v + 1])
            if e > s:
                p, f, g = alias_m.init(w[s:e])
                prob[s:e], a1[s:e], a2[s:e] = p, f, g
        return {"prob": prob, "a1": a1, "a2": a2}
    if method in ("rej", "orej"):
        # REJ preprocessing: per-vertex p* (O-REJ needs none; for unbiased/
        # static runs O-REJ reuses the raw weights with a global user bound).
        pmax = np.zeros(csr.num_vertices)
        nz = deg > 0
        if csr.num_edges:
            red = np.maximum.reduceat(w, csr.indptr[:-1][nz])
            pmax[nz] = red
        return {"pmax": pmax, "weights": w}
    raise ValueError(f"unknown sampling method {method!r}")


def build(csr: CSRGraph, method: str, kind: str, force: bool = False) -> dict:
    """Cached Algorithm 3 (see module docstring)."""
    key = (method, kind)
    if force or key not in csr.aux:
        csr.aux[key] = build_tables(csr, method, kind)
    return csr.aux[key]


def its_dynamic_init(weights_flat: np.ndarray, counts: np.ndarray):
    """Per-step ITS init over gathered ragged segments (dynamic RW ring)."""
    return segment_cumsum(weights_flat, counts)


def alias_dynamic_init(weights_flat: np.ndarray, counts: np.ndarray):
    """Per-step ALIAS init over gathered segments — O(d) *per walker per
    step* with Python-level constant, which is exactly the pathology the
    paper measures for BL on dynamic RW (Table 6 OOT cells)."""
    n_flat = len(weights_flat)
    prob = np.ones(n_flat)
    a1 = np.zeros(n_flat, dtype=np.int64)
    a2 = np.zeros(n_flat, dtype=np.int64)
    ends = np.cumsum(counts)
    starts = ends - counts
    ok = np.ones(len(counts), dtype=bool)
    for i, (s, e) in enumerate(zip(starts, ends)):
        seg = weights_flat[s:e]
        if e == s or float(seg.sum()) <= 0.0:
            ok[i] = False
            continue
        p, f, g = alias_m.init(seg)
        prob[s:e], a1[s:e], a2[s:e] = p, f, g
    return prob, a1, a2, ok


def rej_dynamic_init(weights_flat: np.ndarray, counts: np.ndarray) -> np.ndarray:
    """Per-step REJ init: per-segment max weight."""
    pmax = np.zeros(len(counts))
    nz = counts > 0
    if len(weights_flat):
        ends = np.cumsum(counts)
        starts = (ends - counts)[nz]
        pmax[nz] = np.maximum.reduceat(weights_flat, starts)
    return pmax
