"""Reproduce Table I: dataset size, average set size, sets per token.

Usage: ``python jobs/table1_dataset_stats.py [--scale S] [--datasets A,B]``
Prints our clone statistics next to the paper's.
"""
import argparse

from _session import get_spark

from repro.experiments import ALL_DATASETS, format_rows, table1_rows


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--datasets", type=str, default=",".join(ALL_DATASETS))
    args = ap.parse_args()
    spark = get_spark("table1")
    try:
        rows = table1_rows(
            spark, args.datasets.split(","), scale=args.scale, seed=args.seed
        )
        print(format_rows(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
