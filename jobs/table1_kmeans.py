"""Table 1 (k-means rows) — NEW vs. Rk-means [23] vs. k-means++ coreset [43].

Run:  spark-submit jobs/table1_kmeans.py  [--n 1000]
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

    from repro.experiments import format_md, kmeans_table
    from repro.joins.engine import SparkEngine

    spark = get_spark()
    df = kmeans_table(SparkEngine(spark), n=args.n, eps=args.eps, seed=args.seed)
    print("\n# Table 1 — k-means (measured)\n")
    print(format_md(df))
    spark.stop()


if __name__ == "__main__":
    main()
