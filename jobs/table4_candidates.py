"""Reproduce Table IV: pre-candidates, candidates and results for
ALLPAIRS vs CPSJoin at lambda in {0.5, 0.7}.

Usage: ``python jobs/table4_candidates.py [--scale S] [--datasets A,B]``
The paper's counts are attached per row for shape comparison.
"""
import argparse

from _session import get_spark

from repro.experiments import ALL_DATASETS, format_rows, table4_rows


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--datasets", type=str, default=",".join(ALL_DATASETS))
    ap.add_argument("--lams", type=str, default="0.5,0.7")
    ap.add_argument("--t", type=int, default=128)
    ap.add_argument("--ell", type=int, default=8)
    args = ap.parse_args()
    spark = get_spark("table4")
    try:
        rows = table4_rows(
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
