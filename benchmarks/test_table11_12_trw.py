"""Tables 11/12 benchmark: step interleaving ON — the paper's payoff."""
from repro.tables import table07_08, table11_12


def test_table11(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table11_12.compute_t11(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table11.csv", index=False)
    wo = table07_08.compute_t7(scale=bench_scale)
    # paper: memory bound collapses, retiring and bandwidth rise
    assert (df["memory"].to_numpy() < wo["memory"].to_numpy() / 2).all()
    assert (df["retiring"].to_numpy() > wo["retiring"].to_numpy() * 2).all()
    assert (df["bandwidth_gbs"].to_numpy() > wo["bandwidth_gbs"].to_numpy()).all()
    benchmark.extra_info["rows"] = df.to_dict("records")


def test_table12(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table11_12.compute_t12(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table12.csv", index=False)
    wo = table07_08.compute_t8(scale=bench_scale)
    assert (df["memory"].to_numpy() < wo["memory"].to_numpy()).all()
    assert (df["cycles_per_step"].to_numpy() < wo["cycles_per_step"].to_numpy()).all()
    benchmark.extra_info["rows"] = df.to_dict("records")
