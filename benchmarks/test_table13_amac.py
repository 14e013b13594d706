"""Table 13 benchmark: switch mechanisms (wo/si, w/si, AMAC)."""
from repro.tables import table13


def test_table13(benchmark, results_dir, bench_scale):
    df = benchmark.pedantic(
        lambda: table13.compute(scale=bench_scale), rounds=1, iterations=1
    )
    df.to_csv(results_dir / "table13.csv", index=False)
    for _, r in df.iterrows():
        # instructions: wo/si <= w/si <= AMAC (state-keeping overhead)
        assert r["instr_wo_si"] <= r["instr_w_si"] <= r["instr_amac"]
        # cycles: interleaving wins big; AMAC never beats w/si
        assert r["cycles_w_si"] < r["cycles_wo_si"] / 2
        assert r["cycles_w_si"] <= r["cycles_amac"]
    # AMAC's instruction overhead is worst on the multi-cycle-stage
    # methods (ITS/REJ/O-REJ), mild on NAIVE/ALIAS — the paper's point.
    row = df.set_index("method")
    for cyc in ("its", "rej", "orej"):
        for flat in ("naive", "alias"):
            assert (row.loc[cyc, "instr_amac"] / row.loc[cyc, "instr_w_si"]
                    > row.loc[flat, "instr_amac"] / row.loc[flat, "instr_w_si"] - 0.05)
    benchmark.extra_info["rows"] = df.to_dict("records")
