"""Reproduce Table 5: dataset properties (analogues vs paper graphs)."""
import argparse

from repro.tables import common, table05


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    common.print_table("Table 5 — dataset properties",
                       table05.compute(scale=args.scale), table05.PAPER)


if __name__ == "__main__":
    main()
