"""Figs. 3/4/5/6 reproduction: the simulated user studies.

* default: Fig. 3 (method grades per notebook) + Fig. 4 (generation time)
* --interactive: Fig. 5 (assisted vs unassisted insight counts)
* --augmented: Fig. 6 (SeeDB/RATH with expert captions)

All outputs are simulation proxies (see DESIGN.md §2 / studysim docs).
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
    ap.add_argument("--interactive", action="store_true")
    ap.add_argument("--augmented", action="store_true")
    args = ap.parse_args()
    spark = get_spark("fedex-user-study")
    if args.interactive:
        show(
            "Fig. 5 — insights found, assisted vs unassisted (simulated)",
            E.interactive_study(spark, scale=args.scale),
        )
        return
    if args.augmented:
        show(
            "Fig. 6 — augmented baselines (simulated judge)",
            E.user_study(
                spark, scale=args.scale,
                methods=("fedex", "seedb", "rath"), augmented=True,
            ),
        )
        return
    out = E.user_study(spark, scale=args.scale)
    show("Fig. 3 — simulated user-study grades (1-7)", out)
    show(
        "Fig. 4 — explanation generation time per notebook (seconds)",
        out[out["method"] == "fedex"][["notebook", "generation_time_s"]],
    )


if __name__ == "__main__":
    main()
