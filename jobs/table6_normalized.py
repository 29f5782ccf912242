"""Reproduce Figure 6: imputation over normalized data (fact vs joined).

    spark-submit jobs/table6_normalized.py --sf 0.02
"""
import argparse

from repro.eval import rows_to_markdown, table6_normalized
from repro.eval.session import get_spark


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sf", type=float, default=0.02)
    p.add_argument("--rates", nargs="+", type=float,
                   default=[0.05, 0.1, 0.2, 0.4, 0.6, 0.8])
    p.add_argument("--datasets", nargs="+", default=["retailer", "flight"])
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table6-normalized")
    rows = table6_normalized(spark, sf=args.sf, rates=tuple(args.rates),
                             datasets=tuple(args.datasets), seed=args.seed)
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
