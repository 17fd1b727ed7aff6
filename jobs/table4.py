"""Reproduce Table IV: dataset statistics (paper vs synthetic).

Usage: spark-submit jobs/table4.py [--scale 0.1] [--out out.csv]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import emit, get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=None,
                    help="override per-dataset default scales")
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    from repro.experiments.tables import table4

    emit(table4(scale=args.scale, seed=args.seed), args.out)


if __name__ == "__main__":
    main()
