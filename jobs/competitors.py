"""E9 (paper Fig 17d): Odyssey vs DMESSI, DMESSI-SW-BSF, DPiSAX.

Usage: ``spark-submit jobs/competitors.py [--n-series N] [--n-queries Q]``
"""
from common import base_parser, get_spark

from repro.experiments.harness import competitors


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("odyssey-competitors")
    competitors(spark, n_series=args.n_series, n_queries=args.n_queries, seed=args.seed)
    spark.stop()


if __name__ == "__main__":
    main()
