"""SSSP (Bellman-Ford rounds) as an iterative DataFrame computation (§3).

Same role as :mod:`repro.algos.bfs`: the conventional, bandwidth-bound
workload that Table 1 contrasts with random walks. ``sssp_csr`` is the
in-memory reference (Dijkstra) used for validation and trace generation.
"""
from __future__ import annotations

import heapq

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.csr import CSRGraph


def sssp_csr(csr: CSRGraph, source: int) -> np.ndarray:
    """Dijkstra distances (inf = unreachable) using edge weights."""
    n = csr.num_vertices
    dist = np.full(n, np.inf)
    dist[source] = 0.0
    pq = [(0.0, source)]
    while pq:
        d, v = heapq.heappop(pq)
        if d > dist[v]:
            continue
        s, e = int(csr.indptr[v]), int(csr.indptr[v + 1])
        for i in range(s, e):
            u = int(csr.dst[i])
            nd = d + float(csr.weight[i])
            if nd < dist[u]:
                dist[u] = nd
                heapq.heappush(pq, (nd, u))
    return dist


def sssp_spark(
    spark: SparkSession, edges: DataFrame, source: int, max_iters: int = 32
) -> DataFrame:
    """Bellman-Ford relaxation rounds over (src, dst, weight).

    Each round joins current distances with the edge list, takes the
    per-vertex minimum, and stops at a fixpoint. Returns (vertex, dist)
    for reachable vertices.
    """
    edges = edges.select("src", "dst", "weight").cache()
    dist = spark.createDataFrame([(source, 0.0)], "vertex LONG, dist DOUBLE").cache()
    for _ in range(max_iters):
        relaxed = (
            dist.join(edges, dist["vertex"] == edges["src"])
            .select(F.col("dst").alias("vertex"), (F.col("dist") + F.col("weight")).alias("dist"))
        )
        new_dist = (
            dist.unionByName(relaxed)
            .groupBy("vertex")
            .agg(F.min("dist").alias("dist"))
            .cache()
        )
        changed = (
            new_dist.join(dist.withColumnRenamed("dist", "old"), on="vertex", how="left")
            .where(F.col("old").isNull() | (F.col("dist") < F.col("old")))
        )
        if changed.isEmpty():
            dist = new_dist
            break
        dist = new_dist
    return dist
