"""Reproduce Figure 8 tables: quality per missing pattern × rate + time.

    spark-submit jobs/table8_patterns.py --dataset flight --sf 0.002
    spark-submit jobs/table8_patterns.py --dataset retailer --sf 0.01
"""
import argparse

from repro.eval import rows_to_markdown, table8_patterns
from repro.eval.session import get_spark
from repro.eval.tables import T8_METHODS


def main(argv=None):
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--dataset", choices=["flight", "retailer"], default="flight")
    p.add_argument("--sf", type=float, default=0.002)
    p.add_argument("--rates", nargs="+", type=float,
                   default=[0.05, 0.1, 0.2, 0.4, 0.6, 0.8])
    p.add_argument("--patterns", nargs="+", default=["MCAR", "MAR", "MNAR"])
    p.add_argument("--methods", nargs="+", default=list(T8_METHODS))
    p.add_argument("--mice-iters", type=int, default=2)
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", default=None)
    args = p.parse_args(argv)
    spark = get_spark("table8-patterns")
    rows = table8_patterns(
        spark, dataset=args.dataset, sf=args.sf, rates=tuple(args.rates),
        patterns=tuple(args.patterns), methods=tuple(args.methods),
        mice_iters=args.mice_iters, seed=args.seed,
    )
    md = rows_to_markdown(rows)
    print(md)
    if args.out:
        with open(args.out, "w") as f:
            f.write(md + "\n")
    return rows


if __name__ == "__main__":
    main()
