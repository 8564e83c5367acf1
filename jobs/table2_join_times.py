"""Reproduce Table II: join time (s) for CPSJoin / MinHash / AllPairs.

Usage::

    python jobs/table2_join_times.py [--scale S] [--datasets A,B]
        [--lams 0.5,0.7,0.9] [--t 128] [--ell 8]

Every approximate join reports its achieved recall against the exact
(ALLPAIRS) result; the paper's published seconds are attached per row.
"""
import argparse

from _session import get_spark

from repro.experiments import ALL_DATASETS, format_rows, table2_rows


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--datasets", type=str, default=",".join(ALL_DATASETS))
    ap.add_argument("--lams", type=str, default="0.5,0.6,0.7,0.8,0.9")
    ap.add_argument("--t", type=int, default=128)
    ap.add_argument("--ell", type=int, default=8)
    args = ap.parse_args()
    spark = get_spark("table2")
    try:
        rows = table2_rows(
            spark,
            args.datasets.split(","),
            [float(x) for x in args.lams.split(",")],
            scale=args.scale,
            seed=args.seed,
            t=args.t,
            ell=args.ell,
        )
        print(format_rows(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
