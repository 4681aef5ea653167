"""Fig. 8 reproduction: FEDEX-SAMPLING (5K sample) accuracy vs row count
on the Products dataset.

Usage: python jobs/accuracy_rows.py [--rows 20000,100000,...]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark, show  # noqa: E402

from repro import experiments as E  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--rows", default="20000,50000,100000,200000")
    args = ap.parse_args()
    spark = get_spark("fedex-fig8")
    out = E.accuracy_vs_rows(
        spark, row_counts=tuple(int(x) for x in args.rows.split(","))
    )
    show("Fig. 8 — accuracy vs #rows (Products, 5K sample)", out)


if __name__ == "__main__":
    main()
