"""Table 9 benchmark: ring-size tuning procedure timing."""
from repro.tables import table09


def test_table09(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table09.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table09.csv", index=False)
    assert (df["tuning_seconds"] > 0).all()
    # paper: tuning is cheap — under a minute per (scaled) graph
    assert (df["tuning_seconds"] < 120).all()
    # larger graphs take longer to tune, as in the paper's table
    row = df.set_index("dataset")["tuning_seconds"]
    if {"am", "wk"} <= set(row.index):
        assert row["wk"] > row["am"]
    benchmark.extra_info["rows"] = df.to_dict("records")
