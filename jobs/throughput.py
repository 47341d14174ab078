"""E5 (paper Fig 13): WORK-STEAL query throughput vs nodes (FULL).

Usage: ``spark-submit jobs/throughput.py [--n-series N] [--n-queries Q]``
"""
from common import base_parser, get_spark

from repro.experiments.harness import throughput


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("odyssey-throughput")
    throughput(spark, n_series=args.n_series, n_queries=args.n_queries, seed=args.seed)
    spark.stop()


if __name__ == "__main__":
    main()
