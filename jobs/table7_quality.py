"""Reproduce Figure 7: imputation quality + time on Air Quality.

    spark-submit jobs/table7_quality.py --sf 0.05
"""
import argparse

from repro.eval import rows_to_markdown, table7_quality
from repro.eval.session import get_spark
from repro.eval.tables import T7_METHODS


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sf", type=float, default=0.05)
    p.add_argument("--methods", nargs="+", default=list(T7_METHODS))
    p.add_argument("--mice-iters", type=int, default=5)
    p.add_argument("--fast", action="store_true")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table7-quality")
    rows = table7_quality(spark, sf=args.sf, methods=tuple(args.methods),
                          mice_iters=args.mice_iters, seed=args.seed,
                          fast=args.fast)
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
