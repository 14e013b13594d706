"""Table 1 benchmark: TMAM breakdown of conventional vs RW workloads."""
from repro.tables import table01


def test_table01(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table01.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table01.csv", index=False)
    row = df.set_index("method")
    # Paper's headline shape: RW far more memory-bound than BFS/SSSP,
    # conventional workloads use far more bandwidth.
    for rw in ("PPR", "DeepWalk"):
        assert row.loc[rw, "memory"] > 0.6
        for conv in ("BFS", "SSSP"):
            assert row.loc[rw, "memory"] > row.loc[conv, "memory"]
            assert row.loc[conv, "bandwidth_gbs"] > row.loc[rw, "bandwidth_gbs"]
    # dynamic RW is less memory-bound than static/unbiased RW
    assert row.loc["Node2Vec", "memory"] < row.loc["DeepWalk", "memory"]
    assert row.loc["MetaPath", "memory"] < row.loc["DeepWalk", "memory"]
    benchmark.extra_info["rows"] = df.to_dict("records")
