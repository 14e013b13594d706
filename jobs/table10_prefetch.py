"""Reproduce Table 10: prefetch target cache level (speedup vs L1 hint)."""
import argparse

from repro.tables import common, table10


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    common.print_table(
        "Table 10 — prefetch destination cache level",
        table10.compute(dataset=args.dataset, scale=args.scale),
        table10.PAPER,
    )


if __name__ == "__main__":
    main()
