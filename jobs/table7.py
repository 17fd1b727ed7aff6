"""Reproduce Table VII: RA/OD/AG/GR expected spread across datasets.

Usage:
  spark-submit jobs/table7.py                         # full 8×2 grid
  spark-submit jobs/table7.py --datasets EmailCore --models TR \
      --budgets 20 40 --theta 100 --out t7.csv
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import emit, get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", nargs="+", default=None)
    ap.add_argument("--models", nargs="+", default=["TR", "WC"])
    ap.add_argument("--budgets", type=int, nargs="+", default=[20, 40, 60, 80, 100])
    ap.add_argument("--theta", type=int, default=200)
    ap.add_argument("--r-eval", type=int, default=2000)
    ap.add_argument("--n-seeds", type=int, default=10)
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark("table7")
    from repro.experiments.tables import table7
    from repro.graphs.datasets import DATASETS

    emit(
        table7(
            spark,
            datasets=tuple(args.datasets or DATASETS),
            models=tuple(args.models),
            budgets=tuple(args.budgets),
            theta=args.theta,
            r_eval=args.r_eval,
            n_seeds=args.n_seeds,
            scale=args.scale,
            seed=args.seed,
        ),
        args.out,
    )


if __name__ == "__main__":
    main()
