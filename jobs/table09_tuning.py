"""Reproduce Table 9: ring-size tuning time per dataset."""
import argparse

from repro.tables import common, table09


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--datasets", default=",".join(table09.DEFAULT_DATASETS))
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--max-k", type=int, default=1024)
    args = p.parse_args()
    df = table09.compute(datasets=args.datasets.split(","), scale=args.scale,
                         max_k=args.max_k)
    common.print_table("Table 9 — ring-size tuning time", df, table09.PAPER)


if __name__ == "__main__":
    main()
