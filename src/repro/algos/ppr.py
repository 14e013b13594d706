"""Personalized PageRank by random walks (§2.2).

Unbiased walks with a fixed termination probability per step (0.2 in §3,
i.e. expected length 5); the PPR score of v' is the fraction of walks
ending at v'. ``ppr_exact`` is the power-iteration reference used by the
tests to check that the Monte-Carlo estimate converges to the truth.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import Window

from repro.core.model import RandomWalkApp, WalkerType
from repro.graph.csr import CSRGraph


def make_app(stop_prob: float = 0.2, max_len_cap: int = 1000, **_) -> RandomWalkApp:
    return RandomWalkApp(
        name="ppr",
        walker_type=WalkerType.UNBIASED,
        sampler="naive",
        stop_prob=stop_prob,
        max_len_cap=max_len_cap,
        params={"stop_prob": stop_prob},
    )


def end_vertex_distribution(walks: DataFrame) -> DataFrame:
    """PPR scores from a long-format walks DataFrame: share of walks whose
    *last* vertex is v. Pure Spark SQL (checked against DuckDB in tests)."""
    w = Window.partitionBy("query_id").orderBy(F.desc("step"))
    ends = (
        walks.withColumn("rn", F.row_number().over(w))
        .where(F.col("rn") == 1)
        .select("query_id", "vertex")
    )
    n = ends.count()
    return (
        ends.groupBy("vertex")
        .agg((F.count("*") / F.lit(float(n))).alias("score"))
        .orderBy(F.desc("score"), "vertex")
    )


def ppr_exact(csr: CSRGraph, source: int, stop_prob: float = 0.2, iters: int = 100) -> np.ndarray:
    """Power-iteration reference.

    A walk that stops *at* vertex u contributes to u's score; with
    termination tested after each move, the end-vertex distribution is
    ``stop_prob · Σ_t (1-stop_prob)^t · P^t`` restarted at ``source``
    (plus the dead-end mass, which sticks where the walk got stuck).
    """
    n = csr.num_vertices
    deg = csr.degrees()
    score = np.zeros(n)
    cur = np.zeros(n)
    cur[source] = 1.0
    for _ in range(iters):
        nxt = np.zeros(n)
        # one unbiased transition
        mass = cur
        for v in np.flatnonzero(mass > 1e-15):
            d = deg[v]
            if d == 0:
                score[v] += mass[v]  # dead end: the walk ends here
                continue
            nbrs = csr.neighbors(v)
            np.add.at(nxt, nbrs, mass[v] / d)
        score += stop_prob * nxt
        cur = (1.0 - stop_prob) * nxt
        if cur.sum() < 1e-12:
            break
    return score / max(1e-300, score.sum())
