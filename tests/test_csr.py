"""CSR storage: construction, invariants, Spark/oracle round trips."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.csr import from_arrays, from_edge_df, undirected
from repro.oracle import assert_equivalent


def _toy():
    src = np.array([0, 0, 1, 2, 2, 2])
    dst = np.array([2, 1, 0, 1, 0, 3])
    return from_arrays(src, dst, 4, weight=np.arange(1.0, 7.0))


def test_shape_counts():
    g = _toy()
    assert g.num_vertices == 4
    assert g.num_edges == 6
    assert list(g.degrees()) == [2, 1, 3, 0]
    assert g.max_degree == 3
    assert g.avg_degree == pytest.approx(1.5)


def test_neighbor_lists_sorted():
    g = _toy()
    assert list(g.neighbors(0)) == [1, 2]
    assert list(g.neighbors(2)) == [0, 1, 3]
    assert list(g.neighbors(3)) == []


def test_weights_follow_sort():
    # edge (0,2) w=1 and (0,1) w=2 must swap with the dst sort
    g = _toy()
    s = g.edge_slice(0)
    assert list(g.dst[s]) == [1, 2]
    assert list(g.weight[s]) == [2.0, 1.0]


def test_has_edge_binary_search():
    g = _toy()
    assert g.has_edge(0, 1) and g.has_edge(2, 3)
    assert not g.has_edge(1, 3) and not g.has_edge(3, 0)


def test_memory_bytes_positive():
    g = _toy()
    assert g.memory_bytes() == g.indptr.nbytes + g.dst.nbytes + g.weight.nbytes + g.label.nbytes


def test_validate_rejects_bad_weight():
    g = _toy()
    g.weight[0] = -1.0
    with pytest.raises(AssertionError):
        g.validate()


def test_undirected_mirror():
    s, d = undirected(np.array([0, 1]), np.array([1, 2]))
    assert sorted(zip(s, d)) == [(0, 1), (1, 0), (1, 2), (2, 1)]


def test_from_arrays_default_weight_label():
    g = from_arrays(np.array([0]), np.array([1]), 2)
    assert g.weight[0] == 1.0 and g.label[0] == 0


def test_to_edge_pdf_roundtrip():
    g = _toy()
    pdf = g.to_edge_pdf()
    g2 = from_arrays(pdf["src"].to_numpy(), pdf["dst"].to_numpy(), 4,
                     pdf["weight"].to_numpy(), pdf["label"].to_numpy())
    assert np.array_equal(g.indptr, g2.indptr)
    assert np.array_equal(g.dst, g2.dst)
    assert np.array_equal(g.weight, g2.weight)


def test_from_edge_df_matches_local(spark):
    pdf = pd.DataFrame({"src": [0, 2, 1, 2], "dst": [2, 0, 0, 1],
                        "weight": [1.0, 2.0, 3.0, 4.0], "label": [0, 1, 0, 1]})
    g = from_edge_df(spark.createDataFrame(pdf))
    ref = from_arrays(pdf["src"].to_numpy(), pdf["dst"].to_numpy(), 3,
                      pdf["weight"].to_numpy(), pdf["label"].to_numpy())
    assert np.array_equal(g.indptr, ref.indptr)
    assert np.array_equal(g.dst, ref.dst)
    assert np.array_equal(g.weight, ref.weight)
    assert np.array_equal(g.label, ref.label)


def test_degree_table_oracle(spark, small_graph):
    """Out-degree aggregation in Spark SQL must match DuckDB over the
    same edge list — exercises the mandated oracle path."""
    edges = small_graph.to_edge_df(spark)
    got = edges.groupBy("src").count().withColumnRenamed("count", "deg")
    assert_equivalent(
        got,
        "SELECT src, count(*) AS deg FROM edges GROUP BY src",
        edges=small_graph.to_edge_pdf(),
    )
    # and the CSR must agree with the relational answer
    pdf = got.toPandas().set_index("src")["deg"]
    deg = small_graph.degrees()
    for v, d in pdf.items():
        assert deg[v] == d


def test_from_edge_df_infers_vertex_count(spark):
    pdf = pd.DataFrame({"src": [0, 5], "dst": [5, 0]})
    g = from_edge_df(spark.createDataFrame(pdf))
    assert g.num_vertices == 6
