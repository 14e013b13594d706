"""TPC-H-lite as a graph: the order→part bipartite purchase graph.

This module keeps the mandated relational substrate (``repro.synth_data`` +
the DuckDB oracle) in the loop: the edge list is derived with Spark SQL
from the ``lineitem`` fact table, and the degree statistics that the CSR
build must agree with are checked against DuckDB in the tests. It also
gives the walk engines an organically skewed bipartite dataset analogous
to the paper's amazon-clothing/amazon-book review graphs.

Vertex numbering: order o_orderkey k → vertex k-1; part p_partkey k →
vertex n_orders + k - 1. Edge weight = l_quantity (a natural positive
transition weight), label = hash of l_returnflag (3 classes).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro import synth_data
from repro.graph.csr import CSRGraph, from_edge_df


def purchase_edges(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> tuple[DataFrame, int, int]:
    """Spark edge DataFrame (src, dst, weight, label) from lineitem.

    Returns (edges, n_orders, n_parts). Duplicate (order, part) pairs are
    aggregated (weights summed) in Spark SQL so the CSR sees one edge per
    pair — the aggregation is what the oracle test cross-checks.
    """
    li = synth_data.lineitem(spark, sf=sf, seed=seed)
    n_orders = max(1, int(1_500_000 * sf))
    n_parts = max(1, int(200_000 * sf))
    edges = (
        li.groupBy("l_orderkey", "l_partkey")
        .agg(
            F.sum("l_quantity").alias("weight"),
            # Deterministic 3-way label from the dominant return flag.
            (F.ascii(F.max("l_returnflag")) % F.lit(3)).alias("label"),
        )
        .select(
            (F.col("l_orderkey") - 1).alias("src"),
            (F.lit(n_orders) + F.col("l_partkey") - 1).alias("dst"),
            F.col("weight").cast("double"),
            F.col("label").cast("int"),
        )
    )
    return edges, n_orders, n_parts


def purchase_graph(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> CSRGraph:
    """Undirected (mirrored) CSR of the order→part purchase graph."""
    edges, n_orders, n_parts = purchase_edges(spark, sf=sf, seed=seed)
    mirrored = edges.unionByName(
        edges.select(
            F.col("dst").alias("src"), F.col("src").alias("dst"), "weight", "label"
        )
    )
    return from_edge_df(mirrored, name=f"tpch-sf{sf}", num_vertices=n_orders + n_parts)
