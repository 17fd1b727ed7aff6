"""Reproduce Table III: toy-graph blockers and expected spreads.

Usage: spark-submit jobs/table3.py [--theta 400] [--out out.csv]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import emit, get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--theta", type=int, default=400)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark("table3")
    from repro.experiments.tables import table3

    emit(table3(theta=args.theta, seed=args.seed, spark=spark), args.out)


if __name__ == "__main__":
    main()
