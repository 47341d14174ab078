"""T1 (paper Table 1): dataset registry at mini scale.

Usage: ``spark-submit jobs/table1_datasets.py [--sf 1.0]``
"""
import argparse

from repro.experiments.harness import dataset_table


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--sf", type=float, default=1.0)
    args = p.parse_args()
    dataset_table(args.sf)


if __name__ == "__main__":
    main()
