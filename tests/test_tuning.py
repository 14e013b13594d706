"""Ring-size tuning (§5.4)."""
from repro.core.tuning import tune_ring_sizes
from repro.graph import generators as gen


def test_tuning_protocol_and_result():
    g = gen.erdos_renyi(300, 1500, seed=9)
    res = tune_ring_sizes(g, max_k=32, length=5, max_queries=120)
    ks = {1, 2, 4, 8, 16, 32}
    assert res.task_ring in ks
    assert res.search_ring in ks
    assert res.search_ring <= res.task_ring
    assert res.elapsed_s > 0
    assert set(res.per_method) == {"naive", "alias", "its", "rej", "orej"}
    # pass 2 sweeps only k' <= k*
    for m in ("its", "rej", "orej"):
        assert max(res.per_method[m][1]) <= res.task_ring


def test_tuning_times_recorded_per_k():
    g = gen.erdos_renyi(200, 800, seed=10)
    res = tune_ring_sizes(g, max_k=8, length=4, max_queries=60)
    best, times = res.per_method["alias"]
    assert best in times
    assert all(t > 0 for t in times.values())
    assert times[best] == min(times.values())
