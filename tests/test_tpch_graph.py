"""TPC-H-lite purchase graph: Spark SQL derivation + DuckDB oracle."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.graph.tpch_graph import purchase_edges, purchase_graph
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def edges(spark):
    e, n_orders, n_parts = purchase_edges(spark, sf=SF, seed=0)
    return e.cache(), n_orders, n_parts


def test_edges_match_duckdb_aggregation(spark, edges):
    e, n_orders, _ = edges
    li = synth_data.lineitem(spark, sf=SF, seed=0)
    assert_equivalent(
        e.select("src", "dst", "weight"),
        f"""
        SELECT l_orderkey - 1 AS src,
               {n_orders} + l_partkey - 1 AS dst,
               sum(l_quantity) AS weight
        FROM lineitem GROUP BY l_orderkey, l_partkey
        """,
        lineitem=li,
    )


def test_edges_are_bipartite(edges):
    e, n_orders, n_parts = edges
    pdf = e.toPandas()
    assert (pdf["src"] < n_orders).all()
    assert ((pdf["dst"] >= n_orders) & (pdf["dst"] < n_orders + n_parts)).all()
    assert (pdf["weight"] > 0).all()
    assert pdf["label"].isin([0, 1, 2]).all()


def test_purchase_graph_mirrored(spark):
    g = purchase_graph(spark, sf=SF, seed=0)
    g.validate()
    pdf = g.to_edge_pdf()
    pairs = set(zip(pdf["src"], pdf["dst"]))
    assert all((d, s) in pairs for s, d in list(pairs)[:300])


def test_purchase_graph_degree_matches_sql(spark, edges):
    e, n_orders, n_parts = edges
    g = purchase_graph(spark, sf=SF, seed=0)
    per_order = e.groupBy("src").count().toPandas().set_index("src")["count"]
    deg = g.degrees()
    for v, c in per_order.items():
        assert deg[int(v)] == c  # order side degree == distinct parts bought


def test_walks_run_on_tpch_graph(spark):
    from repro.algos import make_app
    from repro.core.engine import run_walks
    from repro.graph.generators import random_sources

    g = purchase_graph(spark, sf=SF, seed=0)
    app = make_app("deepwalk", length=6)
    src = random_sources(g, 30, seed=1)
    out = run_walks(g, app, src, engine="interleaved", seed=3)
    for path in out.paths().values():
        for u, v in zip(path[:-1], path[1:]):
            assert g.has_edge(int(u), int(v))
