"""Synthetic dataset generators (Table 5 analogues)."""
import numpy as np
import pytest

from repro.graph import generators as gen


ALL = list(gen.SUITE)


@pytest.mark.parametrize("name", ALL)
def test_dataset_valid(name):
    g = gen.make_dataset(name, scale=0.1)
    g.validate()
    assert g.num_edges > 0
    assert g.name == name


@pytest.mark.parametrize("name", ALL)
def test_dataset_deterministic(name):
    a = gen.make_dataset(name, scale=0.1, seed=3)
    b = gen.make_dataset(name, scale=0.1, seed=3)
    assert np.array_equal(a.dst, b.dst)
    assert np.array_equal(a.weight, b.weight)


@pytest.mark.parametrize("name", ALL)
def test_dataset_seed_changes_graph(name):
    a = gen.make_dataset(name, scale=0.1, seed=3)
    b = gen.make_dataset(name, scale=0.1, seed=4)
    assert not (len(a.dst) == len(b.dst) and np.array_equal(a.dst, b.dst))


@pytest.mark.parametrize("name", ALL)
def test_dataset_mirrored(name):
    """Undirected representation: each edge appears in both directions."""
    g = gen.make_dataset(name, scale=0.05)
    pdf = g.to_edge_pdf()
    fwd = set(zip(pdf["src"], pdf["dst"]))
    assert all((d, s) in fwd for s, d in list(fwd)[:500])


@pytest.mark.parametrize("name", ALL)
def test_weights_and_labels_protocol(name):
    """§6.1: weights uniform in [1,5); labels from a small alphabet."""
    g = gen.make_dataset(name, scale=0.05)
    assert g.weight.min() >= 1.0 and g.weight.max() < 5.0
    n_labels = gen.WK_NUM_LABELS if name == "wk" else gen.DEFAULT_NUM_LABELS
    assert g.label.min() >= 0 and g.label.max() < n_labels


def test_no_self_loops():
    g = gen.rmat(256, 2000, seed=1)
    pdf = g.to_edge_pdf()
    assert (pdf["src"] != pdf["dst"]).all()


def test_no_duplicate_edges():
    g = gen.erdos_renyi(128, 1000, seed=2)
    pdf = g.to_edge_pdf()
    assert not pdf.duplicated(["src", "dst"]).any()


def test_rmat_skew_exceeds_er():
    """R-MAT must produce a heavier-tailed degree distribution."""
    r = gen.rmat(2000, 8000, seed=5)
    e = gen.erdos_renyi(2000, 8000, seed=5)
    assert r.max_degree > 2 * e.max_degree


def test_bipartite_structure():
    g = gen.bipartite(300, 100, 1500, seed=6)
    pdf = g.to_edge_pdf()
    left = pdf["src"] < 300
    # every edge connects the two sides
    assert ((pdf["dst"] >= 300) == left).all()


def test_community_locality():
    """Most edges stay within a community block."""
    g = gen.community(1200, 6000, 12, p_in=0.95, seed=7)
    assert g.num_edges > 0
    # vertices grouped by generator-internal community; proxy: average
    # absolute src-dst distance is far below the uniform expectation.
    pdf = g.to_edge_pdf()
    # ER baseline with identical size
    e = gen.erdos_renyi(1200, 6000, seed=7)
    epdf = e.to_edge_pdf()
    # community graphs revisit few distinct partners per vertex block
    assert pdf["dst"].nunique() <= epdf["dst"].nunique() * 1.1


def test_hub_graph_concentration():
    g = gen.hub(2000, 10000, n_hubs=3, hub_frac=0.5, seed=8)
    deg = g.degrees()
    assert deg[:3].min() > 10 * deg[3:].mean()


def test_suite_scaling():
    small = gen.make_dataset("lj", scale=0.1)
    big = gen.make_dataset("lj", scale=1.0)
    assert big.num_edges > 3 * small.num_edges


def test_random_sources_deterministic_and_valid(small_graph):
    a = gen.random_sources(small_graph, 100, seed=1)
    b = gen.random_sources(small_graph, 100, seed=1)
    c = gen.random_sources(small_graph, 100, seed=2)
    assert np.array_equal(a, b)
    assert not np.array_equal(a, c)
    deg = small_graph.degrees()
    assert np.all(deg[a] > 0)


def test_suite_factory_subset():
    s = gen.suite(scale=0.05, names=["am", "lj"])
    assert set(s) == {"am", "lj"}


def test_spec_metadata_complete():
    for name, spec in gen.SUITE.items():
        assert spec.name == name
        assert spec.paper_v > 0 and spec.paper_e > 0
        assert spec.paper_dmax >= spec.paper_davg > 0
