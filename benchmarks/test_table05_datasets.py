"""Table 5 benchmark: generate the full analogue suite and its stats."""
from repro.tables import table05


def test_table05(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table05.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table05.csv", index=False)
    assert len(df) == 12
    row = df.set_index("name")
    # analogues keep the paper's qualitative structure
    assert row.loc["am", "memory_mb"] == df["memory_mb"].min()  # fits "LLC"
    assert row.loc["eu", "d_avg"] == max(row.loc[n, "d_avg"] for n in
                                         ("am", "yt", "up", "eu", "ac", "ab"))
    for skewed, even in [("yt", "up"), ("tw", "fs")]:
        assert (row.loc[skewed, "d_max"] / row.loc[skewed, "d_avg"]
                > row.loc[even, "d_max"] / row.loc[even, "d_avg"])
    benchmark.extra_info["rows"] = df.to_dict("records")
