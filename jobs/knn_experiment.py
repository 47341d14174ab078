"""E10 (paper Fig 18): 10-NN query answering vs nodes × replication.

Usage: ``spark-submit jobs/knn_experiment.py [--k 10]``
"""
from common import base_parser, get_spark

from repro.experiments.harness import knn_experiment


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--k", type=int, default=10)
    args = p.parse_args()
    spark = get_spark("odyssey-knn")
    knn_experiment(spark, k=args.k, seed=args.seed)
    spark.stop()


if __name__ == "__main__":
    main()
