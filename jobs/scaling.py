"""Table 1 running-time column — NEW (Õ(k²N)) vs. two-step (pays |q(D)|).

Run:  spark-submit jobs/scaling.py  [--ns 500,1000,2000,4000]
"""
import argparse
import sys

sys.path.insert(0, ".")
from jobs._session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--ns", type=str, default="500,1000,2000")
    ap.add_argument("--k", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    ns = tuple(int(x) for x in args.ns.split(","))

    from repro.experiments import format_md, scaling_table
    from repro.joins.engine import SparkEngine

    spark = get_spark()
    df = scaling_table(SparkEngine(spark), ns=ns, k=args.k, seed=args.seed)
    print("\n# Table 1 — runtime scaling (measured)\n")
    print(format_md(df))
    spark.stop()


if __name__ == "__main__":
    main()
