"""Fig. 7 reproduction: FEDEX-SAMPLING accuracy vs sample size.

Usage: python jobs/accuracy_sampling.py [--scale test|bench]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark, show  # noqa: E402

from repro import experiments as E  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="test", choices=["test", "bench"])
    args = ap.parse_args()
    spark = get_spark("fedex-fig7")
    sizes = (50, 200, 1000, 5000, 20000) if args.scale == "test" else (
        50, 200, 1000, 5000, 10000, 20000, 50000
    )
    out = E.sampling_accuracy(
        spark, query_nums=(4, 5, 6, 7, 8), sample_sizes=sizes, scale=args.scale
    )
    show("Fig. 7 — FEDEX-SAMPLING accuracy vs sample size", out)


if __name__ == "__main__":
    main()
