"""BFS as an iterative DataFrame computation (conventional workload, §3).

The paper contrasts RW algorithms with BFS/SSSP because frontier-based
traversals stream neighbor lists (high bandwidth, modest latency
sensitivity). We implement BFS two ways:

* :func:`bfs_spark` — level-synchronous frontier expansion with Spark
  DataFrame joins (Catalyst owns the plan), for the relational pipeline
  and oracle tests;
* :func:`bfs_csr` — the in-memory CSR reference used both to validate the
  Spark result and to generate Table 1's streaming access trace.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.csr import CSRGraph


def bfs_csr(csr: CSRGraph, source: int) -> np.ndarray:
    """Array of BFS levels (-1 = unreachable) from the CSR graph."""
    dist = np.full(csr.num_vertices, -1, dtype=np.int64)
    dist[source] = 0
    frontier = np.array([source], dtype=np.int64)
    level = 0
    while len(frontier):
        level += 1
        flat = np.concatenate([csr.neighbors(int(v)) for v in frontier]) if len(frontier) else np.zeros(0, np.int64)
        nxt = np.unique(flat)
        nxt = nxt[dist[nxt] < 0]
        dist[nxt] = level
        frontier = nxt
    return dist


def bfs_spark(
    spark: SparkSession, edges: DataFrame, source: int, max_iters: int = 64
) -> DataFrame:
    """Level-synchronous BFS over an edge DataFrame (src, dst).

    Returns (vertex, dist) for reachable vertices. Each level is a join of
    the frontier against the edge list followed by an anti-join against
    visited vertices — the classic Catalyst-friendly formulation.
    """
    edges = edges.select("src", "dst").cache()
    visited = spark.createDataFrame([(source, 0)], "vertex LONG, dist INT").cache()
    frontier = visited
    for level in range(1, max_iters + 1):
        nxt = (
            frontier.join(edges, frontier["vertex"] == edges["src"])
            .select(F.col("dst").alias("vertex"))
            .distinct()
            .join(visited, on="vertex", how="left_anti")
            .withColumn("dist", F.lit(level))
        )
        nxt = nxt.cache()
        if nxt.isEmpty():
            break
        visited = visited.unionByName(nxt).cache()
        frontier = nxt
    return visited
