"""Reproduce Table III / Fig. 3: CPSJoin parameter sensitivity.

Sweeps ``limit`` (brute-force limit), ``eps`` (brute-force
aggressiveness) and ``ell`` (sketch words) one at a time around the
paper's test configuration at lambda = 0.5, reporting join time and
recall per setting.

Usage: ``python jobs/table3_parameters.py [--scale S] [--datasets A,B]``
"""
import argparse

from _session import get_spark

from repro.experiments import format_rows, table3_rows


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument(
        "--datasets", type=str, default="DBLP,NETFLIX,FLICKR,UNIFORM005"
    )
    ap.add_argument("--lam", type=float, default=0.5)
    ap.add_argument("--t", type=int, default=128)
    args = ap.parse_args()
    spark = get_spark("table3")
    try:
        rows = table3_rows(
            spark, args.datasets.split(","), lam=args.lam,
            scale=args.scale, seed=args.seed, t=args.t,
        )
        print(format_rows(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
