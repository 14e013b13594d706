"""Table 3 benchmark: empirical per-step complexity relations."""
from repro.tables import table03


def test_table03(benchmark, results_dir):
    df = benchmark.pedantic(lambda: table03.compute(), rounds=1, iterations=1)
    df.to_csv(results_dir / "table03.csv", index=False)
    violations = table03.check_relations(df)
    assert not violations, violations
    benchmark.extra_info["rows"] = df.to_dict("records")
