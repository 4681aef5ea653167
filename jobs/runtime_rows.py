"""Fig. 10 reproduction: runtime vs row count (FEDEX vs FEDEX-SAMPLING,
SeeDB/RATH for context), per dataset.

Usage: python jobs/runtime_rows.py [--datasets bank,spotify,products]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark, show  # noqa: E402

from repro import experiments as E  # noqa: E402

ROWS = {
    "bank": (2000, 5000, 10127),
    "spotify": (20000, 50000, 174_389),
    "products": (50_000, 200_000, 1_000_000),
}
RATH_BUDGET = 400_000_000


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default="bank,spotify,products")
    args = ap.parse_args()
    spark = get_spark("fedex-fig10")
    for ds in args.datasets.split(","):
        out = E.runtime_vs_rows(
            spark, ds, row_counts=ROWS[ds], rath_budget_bytes=RATH_BUDGET
        )
        show(f"Fig. 10 — runtime vs #rows ({ds})", out)


if __name__ == "__main__":
    main()
