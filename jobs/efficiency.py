"""Validate the Figs. 7/8 efficiency claim: BG ≫ AG ≈ GR in runtime.

Usage: spark-submit jobs/efficiency.py [--dataset EmailCore] [--b 10]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import emit, get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="EmailCore")
    ap.add_argument("--model", default="TR")
    ap.add_argument("--b", type=int, default=10)
    ap.add_argument("--theta", type=int, default=200)
    ap.add_argument("--r-bg", type=int, default=50)
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark("efficiency")
    from repro.experiments.tables import efficiency

    emit(
        efficiency(
            spark,
            dataset=args.dataset,
            model=args.model,
            b=args.b,
            theta=args.theta,
            r_bg=args.r_bg,
            scale=args.scale,
            seed=args.seed,
        ),
        args.out,
    )


if __name__ == "__main__":
    main()
