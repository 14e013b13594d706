"""Reproduce Table 6: BL/HG/GW/KK/TRW across the four RW algorithms.

Usage: spark-submit jobs/table06_overall.py [--datasets am,yt,...]
"""
import argparse

from _session import get_spark

from repro.tables import common, table06


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--datasets", default=",".join(table06.DEFAULT_DATASETS))
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--walk-len", type=int, default=80)
    args = p.parse_args()
    spark = get_spark("table06")
    try:
        df = table06.compute(
            spark, datasets=args.datasets.split(","), scale=args.scale,
            walk_len=args.walk_len,
        )
        common.print_table("Table 6 — overall comparison (seconds)", df)
        common.print_table("Table 6 — slowdown vs TRW", table06.speedups(df))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
