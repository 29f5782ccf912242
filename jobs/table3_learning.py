"""Reproduce Figure 3: in-database learning over joins (SQL vs ring vs fact).

    spark-submit jobs/table3_learning.py --sf 0.1
"""
import argparse

from repro.eval import rows_to_markdown, table3_learning
from repro.eval.session import get_spark


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sf", type=float, default=0.1)
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--datasets", nargs="+", default=["flight", "retailer"])
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table3-learning")
    rows = table3_learning(spark, sf=args.sf, datasets=tuple(args.datasets),
                           seed=args.seed)
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
