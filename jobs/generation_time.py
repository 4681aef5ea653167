"""Fig. 4 reproduction: FEDEX explanation-generation time per user-study
notebook. The EXPERT comparison values are human authoring times quoted
from the paper (minutes-scale; see EXPERIMENTS.md).

Usage: python jobs/generation_time.py [--scale test|bench]
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
    spark = get_spark("fedex-fig4")
    out = E.user_study(spark, scale=args.scale, methods=("fedex",))
    show(
        "Fig. 4 — FEDEX generation time per notebook (s); EXPERT took "
        "minutes-to-hours per notebook (paper)",
        out[["notebook", "generation_time_s"]],
    )


if __name__ == "__main__":
    main()
