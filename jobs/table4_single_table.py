"""Reproduce Figure 4: single-table MICE per-round cost vs competitors.

    spark-submit jobs/table4_single_table.py --sf 0.02 --rates 0.05 0.2 0.8
"""
import argparse

from repro.eval import rows_to_markdown, table4_single_table
from repro.eval.session import get_spark
from repro.eval.tables import T4_METHODS


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sf", type=float, default=0.02)
    p.add_argument("--rates", nargs="+", type=float,
                   default=[0.05, 0.1, 0.2, 0.4, 0.6, 0.8])
    p.add_argument("--datasets", nargs="+", default=["flight", "retailer"])
    p.add_argument("--methods", nargs="+", default=list(T4_METHODS))
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table4-single-table")
    rows = table4_single_table(
        spark, sf=args.sf, rates=tuple(args.rates),
        datasets=tuple(args.datasets), methods=tuple(args.methods),
        seed=args.seed,
    )
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
