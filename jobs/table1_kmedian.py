"""Table 1 (k-median rows) — NEW randomized vs. full-join baseline.

Run:  spark-submit jobs/table1_kmedian.py  [--n 1000]
"""
import argparse
import sys

sys.path.insert(0, ".")
from jobs._session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=1000, help="tuples per relation")
    ap.add_argument("--eps", type=float, default=0.5)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()

    from repro.experiments import format_md, kmedian_table
    from repro.joins.engine import SparkEngine

    spark = get_spark()
    df = kmedian_table(SparkEngine(spark), n=args.n, eps=args.eps, seed=args.seed)
    print("\n# Table 1 — k-median (measured)\n")
    print(format_md(df))
    spark.stop()


if __name__ == "__main__":
    main()
