"""Reproduce Table 1: pipeline-slot breakdown, BFS/SSSP vs RW algorithms.

Usage: spark-submit jobs/table01_profile.py [--scale 1.0] [--dataset lj]
(The profiling itself runs on the driver's simulator; Spark is kept in
the loop for consistency of entrypoints.)
"""
import argparse

from repro.tables import common, table01


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", default="lj")
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--n-queries", type=int, default=500)
    args = p.parse_args()
    df = table01.compute(dataset=args.dataset, scale=args.scale,
                         n_queries=args.n_queries)
    common.print_table("Table 1 — pipeline slot breakdown", df, table01.PAPER)


if __name__ == "__main__":
    main()
