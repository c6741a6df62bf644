"""Table 1 (deterministic D rows) — Algorithm 1 inside Algorithm 3, small scale.

The exact path launches one counting DP per arrangement piece; on Spark the
per-job scheduling overhead (not the algorithm) dominates at this cell count,
so this job runs the deterministic comparison on the in-memory engine and the
randomized row on Spark for reference (see EXPERIMENTS.md).

Run:  spark-submit jobs/table1_deterministic.py  [--n 120]
"""
import argparse
import sys

sys.path.insert(0, ".")


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=120)
    ap.add_argument("--k", type=int, default=2)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()

    from repro.experiments import deterministic_table, format_md
    from repro.joins.engine import LocalEngine

    df = deterministic_table(LocalEngine(), n=args.n, k=args.k, seed=args.seed)
    print("\n# Table 1 — deterministic rows (measured, in-memory engine)\n")
    print(format_md(df))


if __name__ == "__main__":
    main()
