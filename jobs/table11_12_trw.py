"""Reproduce Tables 11 & 12: Tables 7/8 with step interleaving enabled."""
import argparse

from repro.tables import common, table11_12


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--ring-size", type=int, default=64)
    args = p.parse_args()
    common.print_table(
        "Table 11 — vary walk length (w/si)",
        table11_12.compute_t11(ring_size=args.ring_size, dataset=args.dataset,
                               scale=args.scale),
        table11_12.PAPER_T11,
    )
    common.print_table(
        "Table 12 — vary number of queries (w/si)",
        table11_12.compute_t12(ring_size=args.ring_size, dataset=args.dataset,
                               scale=args.scale),
        table11_12.PAPER_T12,
    )


if __name__ == "__main__":
    main()
