"""Execution engines: bitwise cross-engine equivalence and walk validity.

The counter RNG makes every engine's walks a pure function of
(seed, qid, sampler) — so equivalence between the sequential engine, the
step-interleaved ring engine (any ring size), the BSP (KnightKing) and
ASP (GraphWalker) emulations is tested EXACTLY, not statistically.
"""
import numpy as np
import pytest

from repro.algos import make_app
from repro.core.engine import run_walks
from repro.graph import generators as gen

SEED = 21


def _paths_equal(a, b):
    pa, pb = a.paths(), b.paths()
    assert set(pa) == set(pb)
    return all(np.array_equal(pa[q], pb[q]) for q in pa)


def _valid_walks(csr, out):
    for q, path in out.paths().items():
        assert path[0] >= 0
        for u, v in zip(path[:-1], path[1:]):
            assert csr.has_edge(int(u), int(v)), f"walk {q} used non-edge ({u},{v})"


APP_CASES = [
    ("ppr", "naive", {}),
    ("deepwalk", "alias", {"length": 12}),
    ("deepwalk", "its", {"length": 12}),
    ("deepwalk", "rej", {"length": 12}),
    ("deepwalk", "orej", {"length": 12}),
    ("deepwalk", "naive", {"length": 12, "weighted": False}),
    ("node2vec", "its", {"length": 8}),
    ("node2vec", "alias", {"length": 8}),
    ("node2vec", "rej", {"length": 8}),
    ("node2vec", "orej", {"length": 8}),
    ("metapath", "its", {}),
    ("metapath", "alias", {}),
    ("metapath", "rej", {}),
]


def _app(algo, sampler, kw, csr):
    return make_app(algo, csr=csr, **kw).with_sampler(sampler)


@pytest.mark.parametrize("algo,sampler,kw", APP_CASES)
def test_sequential_equals_interleaved(algo, sampler, kw, small_graph, sources_small):
    app = _app(algo, sampler, kw, small_graph)
    a = run_walks(small_graph, app, sources_small, engine="sequential", seed=SEED)
    b = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED, ring_size=7)
    assert _paths_equal(a, b)


@pytest.mark.parametrize("algo,sampler,kw", APP_CASES)
def test_sequential_equals_bsp(algo, sampler, kw, small_graph, sources_small):
    app = _app(algo, sampler, kw, small_graph)
    a = run_walks(small_graph, app, sources_small, engine="sequential", seed=SEED)
    b = run_walks(small_graph, app, sources_small, engine="bsp", seed=SEED)
    assert _paths_equal(a, b)


@pytest.mark.parametrize("ring_size", [1, 2, 13, 64, 4096])
def test_ring_size_invariance(ring_size, small_graph, sources_small):
    app = make_app("deepwalk", length=10)
    a = run_walks(small_graph, app, sources_small, engine="sequential", seed=SEED)
    b = run_walks(small_graph, app, sources_small, engine="interleaved",
                  seed=SEED, ring_size=ring_size)
    assert _paths_equal(a, b)


def test_asp_equals_sequential_unbiased(small_graph, sources_small):
    app = make_app("ppr")
    a = run_walks(small_graph, app, sources_small, engine="sequential", seed=SEED)
    b = run_walks(small_graph, app, sources_small, engine="asp", seed=SEED,
                  n_graph_partitions=5)
    assert _paths_equal(a, b)
    assert b.meta["partition_loads"] >= b.meta["n_partitions"] - 1


def test_asp_rejects_biased(small_graph, sources_small):
    with pytest.raises(ValueError):
        run_walks(small_graph, make_app("deepwalk"), sources_small, engine="asp", seed=SEED)


@pytest.mark.parametrize("algo,sampler,kw", APP_CASES)
def test_walks_use_real_edges(algo, sampler, kw, small_graph, sources_small):
    app = _app(algo, sampler, kw, small_graph)
    out = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED)
    _valid_walks(small_graph, out)


def test_target_length_respected(small_graph, sources_small):
    app = make_app("deepwalk", length=7)
    out = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED)
    for path in out.paths().values():
        assert len(path) <= 8  # source + 7 moves


def test_ppr_lengths_geometric(small_graph):
    src = gen.random_sources(small_graph, 3000, seed=2)
    app = make_app("ppr", stop_prob=0.2)
    out = run_walks(small_graph, app, src, engine="interleaved", seed=SEED)
    lens = np.array([len(p) - 1 for p in out.paths().values()])
    # mean of Geometric(0.2) is 5 (dead ends shorten a little)
    assert 3.5 < lens.mean() < 6.0


def test_dead_end_terminates(sink_graph):
    app = make_app("deepwalk", length=50)
    out = run_walks(sink_graph, app, np.array([0, 1, 2]), engine="interleaved", seed=SEED)
    for path in out.paths().values():
        # vertex 3 is a sink; any walk reaching it must stop there
        if 3 in path:
            assert path[-1] == 3
    seq = run_walks(sink_graph, app, np.array([0, 1, 2]), engine="sequential", seed=SEED)
    assert _paths_equal(out, seq)


def test_metapath_schema_enforced(small_graph, sources_small):
    app = make_app("metapath", csr=small_graph, schema_len=5, seed=1)
    schema = app.params["schema"]
    out = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED)
    g = small_graph
    for path in out.paths().values():
        for i, (u, v) in enumerate(zip(path[:-1], path[1:])):
            s, e = g.edge_slice(int(u)).start, g.edge_slice(int(u)).stop
            labs = g.label[s:e][g.dst[s:e] == v]
            assert schema[i % len(schema)] in labs


def test_walk_starts_at_source(small_graph, sources_small):
    app = make_app("deepwalk", length=5)
    out = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED)
    paths = out.paths()
    for qid, src in enumerate(sources_small):
        assert paths[qid][0] == src


def test_steps_are_contiguous(small_graph, sources_small):
    app = make_app("deepwalk", length=5)
    out = run_walks(small_graph, app, sources_small, engine="interleaved", seed=SEED)
    pdf = out.to_pandas().sort_values(["query_id", "step"])
    for _, grp in pdf.groupby("query_id"):
        assert list(grp["step"]) == list(range(len(grp)))


def test_custom_qids(small_graph, sources_small):
    app = make_app("deepwalk", length=5)
    qids = np.arange(100, 100 + len(sources_small))
    out = run_walks(small_graph, app, sources_small, engine="interleaved",
                    seed=SEED, qids=qids)
    assert set(out.paths()) == set(qids.tolist())


def test_qid_determines_walk_not_position(small_graph):
    """A query's walk depends on its qid, not on where it sits in the batch
    — this is what makes Spark partitioning transparent."""
    src = gen.random_sources(small_graph, 20, seed=9)
    app = make_app("deepwalk", length=10)
    qids = np.arange(20)
    full = run_walks(small_graph, app, src, engine="interleaved", seed=SEED, qids=qids)
    half = run_walks(small_graph, app, src[10:], engine="interleaved", seed=SEED,
                     qids=qids[10:])
    pf, ph = full.paths(), half.paths()
    for q in ph:
        assert np.array_equal(pf[q], ph[q])


def test_empty_sources(small_graph):
    app = make_app("deepwalk", length=5)
    out = run_walks(small_graph, app, np.array([], dtype=np.int64), engine="interleaved", seed=SEED)
    assert out.total_steps == 0


def test_single_query(small_graph):
    app = make_app("deepwalk", length=5)
    out = run_walks(small_graph, app, np.array([1]), engine="interleaved", seed=SEED)
    assert len(out.paths()) == 1


def test_unknown_engine(small_graph, sources_small):
    with pytest.raises(ValueError):
        run_walks(small_graph, make_app("ppr"), sources_small, engine="gpu")


def test_timers_populated(small_graph, sources_small):
    app = make_app("node2vec", length=5)
    timers = {}
    run_walks(small_graph, app, sources_small[:10], engine="interleaved",
              seed=SEED, timers=timers)
    assert timers.get("weight", 0) > 0
    assert timers.get("init", 0) > 0
    assert timers.get("gen", 0) > 0


def test_total_steps_counts_moves(small_graph):
    app = make_app("deepwalk", length=6)
    out = run_walks(small_graph, app, np.array([1, 2, 3]), engine="interleaved", seed=SEED)
    assert out.total_steps == sum(len(p) - 1 for p in out.paths().values())


def test_interleaved_meta(small_graph, sources_small):
    app = make_app("deepwalk", length=6)
    out = run_walks(small_graph, app, sources_small, engine="interleaved",
                    seed=SEED, ring_size=8)
    assert out.meta["ring_size"] == 8
    assert out.meta["ring_iterations"] >= 6


def test_bsp_meta_supersteps(small_graph, sources_small):
    app = make_app("deepwalk", length=6)
    out = run_walks(small_graph, app, sources_small, engine="bsp", seed=SEED)
    assert out.meta["supersteps"] == 6  # all queries reach the target length
