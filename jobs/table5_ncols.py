"""Reproduce Figure 5: Low-variant runtime vs number of incomplete columns.

    spark-submit jobs/table5_ncols.py --sf 0.02
"""
import argparse

from repro.eval import rows_to_markdown, table5_ncols
from repro.eval.session import get_spark


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sf", type=float, default=0.02)
    p.add_argument("--rates", nargs="+", type=float, default=[0.05, 0.2])
    p.add_argument("--max-cols", type=int, default=6)
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table5-ncols")
    rows = table5_ncols(spark, sf=args.sf, rates=tuple(args.rates),
                        max_cols=args.max_cols, seed=args.seed)
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
