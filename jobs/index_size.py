"""E6 (paper Fig 14): total index size per replication strategy.

Usage: ``spark-submit jobs/index_size.py [--sf 0.5]``
"""
import argparse

from common import get_spark

from repro.experiments.harness import index_size_table


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--sf", type=float, default=0.5)
    args = p.parse_args()
    spark = get_spark("odyssey-index-size")
    index_size_table(spark, sf=args.sf)
    spark.stop()


if __name__ == "__main__":
    main()
