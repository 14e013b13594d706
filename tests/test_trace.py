"""Trace builders: lanes must reflect the real walks and workloads."""
import numpy as np
import pytest

from repro.algos import make_app
from repro.core.engine import run_walks
from repro.perf import trace
from repro.graph import generators as gen

SEED = 44


@pytest.mark.parametrize("algo,sampler", [
    ("ppr", "naive"), ("deepwalk", "alias"), ("deepwalk", "its"),
    ("deepwalk", "rej"), ("deepwalk", "orej"),
    ("node2vec", "alias"), ("metapath", "its"),
])
def test_lane_per_query_and_step_count(algo, sampler, small_graph, sources_small):
    app = make_app(algo, csr=small_graph, length=6).with_sampler(sampler)
    lanes, n_steps = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    assert len(lanes) == len(sources_small)
    out = run_walks(small_graph, app, sources_small, engine="sequential", seed=SEED)
    assert n_steps == out.total_steps  # trace replays the exact walks


def test_stage_tuple_shape(small_graph, sources_small):
    app = make_app("deepwalk", length=5)
    lanes, _ = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    for lane in lanes:
        for st in lane:
            assert len(st) == 4
            n_instr, addr, br, cyc = st
            assert n_instr > 0
            assert addr is None or addr >= 0
            assert isinstance(br, (bool, np.bool_)) and isinstance(cyc, (bool, np.bool_))


def test_alias_has_no_cycle_stages(small_graph, sources_small):
    app = make_app("deepwalk", length=5)  # alias
    lanes, _ = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    assert not any(st[3] for lane in lanes for st in lane)


def test_rej_marks_cycle_and_branches(small_graph, sources_small):
    app = make_app("deepwalk", length=8).with_sampler("rej")
    lanes, _ = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    flat = [st for lane in lanes for st in lane]
    assert any(st[3] for st in flat)          # cycle stages present
    assert any(st[2] for st in flat)          # some rejections mispredict


def test_addresses_in_known_regions(small_graph, sources_small):
    app = make_app("deepwalk", length=5).with_sampler("its")
    lanes, _ = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    hi = trace.R_SCRATCH + (1 << 32)
    for lane in lanes:
        for st in lane:
            if st[1] is not None:
                assert 0 <= st[1] < hi


def test_dynamic_uses_scratch_region(small_graph, sources_small):
    app = make_app("metapath", csr=small_graph)
    lanes, _ = trace.build_rw_lanes(small_graph, app, sources_small, seed=SEED)
    addrs = [st[1] for lane in lanes for st in lane if st[1] is not None]
    assert any(a >= trace.R_SCRATCH for a in addrs)


def test_bfs_lanes_cover_edges(small_graph):
    src = int(gen.random_sources(small_graph, 1, seed=1)[0])
    lanes, n_edges = trace.build_bfs_lanes(small_graph, src)
    assert n_edges > 0
    assert len(lanes) > 1
    # every lane starts with the indptr lookup
    assert all(lane[0][1] is not None and lane[0][1] < trace.R_DST for lane in lanes)


def test_sssp_lanes_rounds(small_graph):
    src = int(gen.random_sources(small_graph, 1, seed=1)[0])
    l1, e1 = trace.build_sssp_lanes(small_graph, src, rounds=1)
    l2, e2 = trace.build_sssp_lanes(small_graph, src, rounds=2)
    assert e2 == 2 * e1 and len(l2) == 2 * len(l1)


def test_stream_lines_one_stage_per_line():
    stages = trace._stream_lines(0, 0, 16, 8, 5)  # 16 items × 8B = 2 lines
    assert len(stages) == 2
    assert stages[0][1] == 0 and stages[1][1] == 64


def test_ppr_trace_total_steps_reasonable(small_graph):
    srcs = gen.random_sources(small_graph, 300, seed=3)
    app = make_app("ppr", stop_prob=0.2)
    _, n = trace.build_rw_lanes(small_graph, app, srcs, seed=SEED)
    assert 2.5 * 300 < n < 8 * 300  # E[len] ≈ 5
