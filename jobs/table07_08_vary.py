"""Reproduce Tables 7 & 8: breakdown vs walk length / query count (wo/si)."""
import argparse

from repro.tables import common, table07_08


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    common.print_table(
        "Table 7 — vary walk length (wo/si)",
        table07_08.compute_t7(dataset=args.dataset, scale=args.scale),
        table07_08.PAPER_T7,
    )
    common.print_table(
        "Table 8 — vary number of queries (wo/si)",
        table07_08.compute_t8(dataset=args.dataset, scale=args.scale),
        table07_08.PAPER_T8,
    )


if __name__ == "__main__":
    main()
