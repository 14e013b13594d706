"""Compressed-sparse-row graph storage (paper Appendix B, "Graph storage").

ThunderRW stores the graph as CSR: a vertex index array pointing into a
flat edge array, with edge weights and edge labels as two parallel arrays.
We build the CSR on the driver from a Spark edge-list DataFrame
(``src, dst, weight, label``) and broadcast the NumPy arrays to executors
for the per-partition walk operator.

Neighbor lists are sorted by destination so Node2Vec's ``dist(v', u)``
check is a binary search over ``N_u`` — the O(log d_u) cost the paper
profiles in Table 2.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


@dataclass
class CSRGraph:
    """In-memory CSR graph with per-edge weight and label arrays.

    Attributes:
        indptr:  int64[|V|+1] — edge range of vertex v is
                 ``[indptr[v], indptr[v+1])``.
        dst:     int64[|E|] — destination vertex per edge slot, sorted
                 within each vertex's range.
        weight:  float64[|E|] — edge weight (transition weight for static RW).
        label:   int32[|E|] — edge label (MetaPath schema symbols).
        name:    dataset name for reporting.
    """

    indptr: np.ndarray
    dst: np.ndarray
    weight: np.ndarray
    label: np.ndarray
    name: str = "g"
    aux: dict = field(default_factory=dict)  # preprocessed sampler tables

    @property
    def num_vertices(self) -> int:
        return len(self.indptr) - 1

    @property
    def num_edges(self) -> int:
        return len(self.dst)

    def degrees(self) -> np.ndarray:
        return np.diff(self.indptr)

    @property
    def avg_degree(self) -> float:
        return self.num_edges / max(1, self.num_vertices)

    @property
    def max_degree(self) -> int:
        return int(self.degrees().max(initial=0))

    def memory_bytes(self) -> int:
        """Bytes held by the four CSR arrays (Table 5 "Memory" column)."""
        return (
            self.indptr.nbytes + self.dst.nbytes + self.weight.nbytes + self.label.nbytes
        )

    def neighbors(self, v: int) -> np.ndarray:
        return self.dst[self.indptr[v] : self.indptr[v + 1]]

    def edge_slice(self, v: int) -> slice:
        return slice(int(self.indptr[v]), int(self.indptr[v + 1]))

    def has_edge(self, u: int, v: int) -> bool:
        """Binary search for v in N_u (sorted dst) — Node2Vec's dist check."""
        lo, hi = int(self.indptr[u]), int(self.indptr[u + 1])
        i = int(np.searchsorted(self.dst[lo:hi], v)) + lo
        return i < hi and self.dst[i] == v

    def validate(self) -> None:
        """Structural invariants; raises AssertionError on violation."""
        assert self.indptr[0] == 0 and self.indptr[-1] == self.num_edges
        assert np.all(np.diff(self.indptr) >= 0), "indptr must be nondecreasing"
        if self.num_edges:
            assert self.dst.min() >= 0 and self.dst.max() < self.num_vertices
            assert np.all(self.weight > 0), "edge weights must be positive"
        d = self.degrees()
        starts = self.indptr[:-1][d > 0]
        ends = self.indptr[1:][d > 0]
        for s, e in zip(starts[:64], ends[:64]):  # spot-check sortedness
            assert np.all(np.diff(self.dst[s:e]) >= 0), "neighbor lists must be sorted"

    def to_edge_pdf(self) -> pd.DataFrame:
        """Flat edge list as pandas (src, dst, weight, label)."""
        src = np.repeat(np.arange(self.num_vertices, dtype=np.int64), self.degrees())
        return pd.DataFrame(
            {"src": src, "dst": self.dst.astype(np.int64),
             "weight": self.weight, "label": self.label.astype(np.int64)}
        )

    def to_edge_df(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.to_edge_pdf())


def from_arrays(
    src: np.ndarray,
    dst: np.ndarray,
    num_vertices: int,
    weight: np.ndarray | None = None,
    label: np.ndarray | None = None,
    name: str = "g",
) -> CSRGraph:
    """Build a CSR graph from parallel edge arrays (driver-side)."""
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    m = len(src)
    weight = np.ones(m) if weight is None else np.asarray(weight, dtype=np.float64)
    label = np.zeros(m, dtype=np.int32) if label is None else np.asarray(label, dtype=np.int32)
    # Sort by (src, dst) so each neighbor list is contiguous and sorted.
    order = np.lexsort((dst, src))
    src, dst, weight, label = src[order], dst[order], weight[order], label[order]
    counts = np.bincount(src, minlength=num_vertices)
    indptr = np.zeros(num_vertices + 1, dtype=np.int64)
    np.cumsum(counts, out=indptr[1:])
    g = CSRGraph(indptr=indptr, dst=dst, weight=weight, label=label, name=name)
    g.validate()
    return g


def from_edge_df(df: DataFrame, name: str = "g", num_vertices: int | None = None) -> CSRGraph:
    """Collect a Spark edge DataFrame (src, dst[, weight][, label]) into CSR.

    The relational side (dedup, column defaults, vertex-count discovery)
    runs in Spark SQL; only the final flat arrays land on the driver.
    """
    cols = df.columns
    if "weight" not in cols:
        df = df.withColumn("weight", F.lit(1.0))
    if "label" not in cols:
        df = df.withColumn("label", F.lit(0))
    df = df.select(
        F.col("src").cast("long"),
        F.col("dst").cast("long"),
        F.col("weight").cast("double"),
        F.col("label").cast("int"),
    )
    if num_vertices is None:
        row = df.select(
            F.greatest(F.max("src"), F.max("dst")).alias("mx")
        ).collect()[0]
        num_vertices = int(row["mx"]) + 1
    pdf = df.toPandas()
    return from_arrays(
        pdf["src"].to_numpy(),
        pdf["dst"].to_numpy(),
        num_vertices,
        pdf["weight"].to_numpy(),
        pdf["label"].to_numpy(),
        name=name,
    )


def undirected(src: np.ndarray, dst: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Mirror each edge (paper §2.1: undirected = two directed edges)."""
    return np.concatenate([src, dst]), np.concatenate([dst, src])
