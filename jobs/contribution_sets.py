"""Fig. 11 reproduction: top contribution score vs number of
sets-of-rows for queries 3 (Products join) and 7 (Spotify filter).

Usage: python jobs/contribution_sets.py [--scale test|bench]
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
    spark = get_spark("fedex-fig11")
    out = E.contribution_vs_n_sets(
        spark, query_nums=(3, 7), n_sets_values=(3, 5, 8, 10, 15, 20),
        scale=args.scale,
    )
    show("Fig. 11 — contribution vs #sets-of-rows (queries 3, 7)", out)


if __name__ == "__main__":
    main()
