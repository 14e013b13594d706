"""Conventional workloads (§3): BFS and SSSP, Spark vs CSR references."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.algos.bfs import bfs_csr, bfs_spark
from repro.algos.sssp import sssp_csr, sssp_spark
from repro.graph import generators as gen
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def graph():
    return gen.erdos_renyi(250, 1200, seed=21)


def test_bfs_csr_levels(graph):
    d = bfs_csr(graph, 0)
    assert d[0] == 0
    # every reachable non-source vertex has a predecessor one level up
    for v in np.flatnonzero(d > 0):
        preds = [u for u in range(graph.num_vertices) if graph.has_edge(u, int(v))]
        assert min(d[u] for u in preds if d[u] >= 0) == d[v] - 1


def test_bfs_spark_matches_csr(spark, graph):
    got = bfs_spark(spark, graph.to_edge_df(spark), 0).toPandas()
    ref = bfs_csr(graph, 0)
    assert len(got) == int((ref >= 0).sum())
    for _, row in got.iterrows():
        assert ref[int(row["vertex"])] == row["dist"]


def test_bfs_spark_level_histogram_oracle(spark, graph):
    """Aggregate the BFS result relationally and diff against DuckDB."""
    res = bfs_spark(spark, graph.to_edge_df(spark), 0)
    hist = res.groupBy("dist").agg(F.count("*").alias("n")).orderBy("dist")
    assert_equivalent(
        hist,
        "SELECT dist, count(*) AS n FROM bfs GROUP BY dist ORDER BY dist",
        bfs=res.toPandas(),
    )


def test_sssp_csr_triangle():
    from repro.graph.csr import from_arrays

    g = from_arrays(np.array([0, 0, 1]), np.array([1, 2, 2]), 3,
                    weight=np.array([1.0, 5.0, 1.0]))
    d = sssp_csr(g, 0)
    assert d[2] == 2.0  # path 0->1->2 beats direct 0->2


def test_sssp_spark_matches_dijkstra(spark, graph):
    got = sssp_spark(spark, graph.to_edge_df(spark), 0, max_iters=40).toPandas()
    ref = sssp_csr(graph, 0)
    assert len(got) == int(np.isfinite(ref).sum())
    for _, row in got.iterrows():
        assert ref[int(row["vertex"])] == pytest.approx(row["dist"])


def test_sssp_unreachable_absent(spark):
    from repro.graph.csr import from_arrays

    g = from_arrays(np.array([0]), np.array([1]), 3, weight=np.array([2.0]))
    got = sssp_spark(spark, g.to_edge_df(spark), 0).toPandas()
    assert set(got["vertex"]) == {0, 1}
