"""Tables 7/8 benchmark: wo/si breakdown vs length and query count."""
from repro.tables import table07_08


def test_table07(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table07_08.compute_t7(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table07.csv", index=False)
    # memory bound stays dominant at every length (paper: >60%)
    assert (df["memory"] > 0.5).all()
    benchmark.extra_info["rows"] = df.to_dict("records")


def test_table08(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table07_08.compute_t8(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table08.csv", index=False)
    assert (df["memory"] > 0.5).all()
    benchmark.extra_info["rows"] = df.to_dict("records")
