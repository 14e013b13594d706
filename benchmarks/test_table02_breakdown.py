"""Table 2 benchmark: per-step time breakdown."""
from repro.tables import table02


def test_table02(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table02.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table02.csv", index=False)
    row = df.set_index("method")
    # static RW: everything is Gen
    assert row.loc["PPR", "gen_frac"] == 1.0
    assert row.loc["DeepWalk", "gen_frac"] == 1.0
    # Node2Vec: computing p(e) is the largest component (paper: 89.9% —
    # compressed here because the vectorized UDF amortizes per-edge cost)
    assert row.loc["Node2Vec", "weight_frac"] > row.loc["Node2Vec", "init_frac"]
    assert row.loc["Node2Vec", "weight_frac"] > row.loc["Node2Vec", "gen_frac"]
    # MetaPath with ALIAS: Init is the biggest sampler cost component
    assert row.loc["MetaPath", "init_frac"] > row.loc["MetaPath", "gen_frac"]
    assert row.loc["MetaPath", "init_frac"] > row.loc["MetaPath", "weight_frac"]
    benchmark.extra_info["rows"] = df.to_dict("records")
