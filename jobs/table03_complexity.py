"""Reproduce Table 3: empirical validation of the per-step complexity."""
from repro.tables import common, table03


def main() -> None:
    df = table03.compute()
    common.print_table("Table 3 — per-step cost by RW type × sampler", df,
                       table03.PAPER)
    bad = table03.check_relations(df)
    if bad:
        print("\nVIOLATED relations:")
        for b in bad:
            print(" -", b)
    else:
        print("\nAll Table 3 complexity relations hold empirically.")


if __name__ == "__main__":
    main()
