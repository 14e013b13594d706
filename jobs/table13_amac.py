"""Reproduce Table 13: instr/cycles per step for wo/si, w/si and AMAC."""
import argparse

from repro.tables import common, table13


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    common.print_table(
        "Table 13 — switch mechanisms (per-step instructions & cycles)",
        table13.compute(dataset=args.dataset, scale=args.scale),
        table13.PAPER,
    )


if __name__ == "__main__":
    main()
