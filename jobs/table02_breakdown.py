"""Reproduce Table 2: execution-time breakdown (compute p(e) / Init / Gen)."""
import argparse

from repro.tables import common, table02


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    df = table02.compute(dataset=args.dataset, scale=args.scale)
    common.print_table("Table 2 — time breakdown per step", df, table02.PAPER)


if __name__ == "__main__":
    main()
