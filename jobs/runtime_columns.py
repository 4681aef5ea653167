"""Fig. 9 reproduction: runtime vs column count, FEDEX-SAMPLING vs
SeeDB vs RATH, per dataset.

Usage: python jobs/runtime_columns.py [--scale test|bench] [--datasets spotify,bank,products]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark, show  # noqa: E402

from repro import experiments as E  # noqa: E402

#: RATH's memory envelope, scaled from the paper's 16 GB laptop to our
#: ~1/3-size Products data (EXPERIMENTS.md § Fig. 9).
RATH_BUDGET = 400_000_000


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="test", choices=["test", "bench"])
    ap.add_argument("--datasets", default="spotify,bank,products")
    args = ap.parse_args()
    spark = get_spark("fedex-fig9")
    for ds in args.datasets.split(","):
        counts = {"bank": (5, 10, 15, 21), "spotify": (5, 10, 15, 20),
                  "products": (5, 10, 20, 33)}[ds]
        out = E.runtime_vs_columns(
            spark, ds, column_counts=counts, scale=args.scale,
            rath_budget_bytes=RATH_BUDGET,
        )
        show(f"Fig. 9 — runtime vs #columns ({ds})", out)


if __name__ == "__main__":
    main()
