"""Table 10 benchmark: prefetch destination cache level."""
from repro.tables import table10


def test_table10(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table10.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table10.csv", index=False)
    # paper's shape: L1/L2/L3 hints within a few percent; NTA the worst
    assert (df["l1"] == 1.0).all()
    assert (df[["l2", "l3"]].min(axis=1) > 0.85).all()
    for _, r in df.iterrows():
        assert r["non_temporal"] <= min(r["l1"], r["l2"], r["l3"]) + 0.02
    benchmark.extra_info["rows"] = df.to_dict("records")
