"""Explain a single exploratory step end-to-end (demo entrypoint).

Reproduces the paper's running example (Figs. 1-2) on the synthetic
Spotify data: the popularity filter and the loudness/danceability
group-by, with the captioned explanations printed.

Usage: python jobs/explain_step.py [--scale test|bench]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402

from repro.core.explain import Fedex, FedexConfig  # noqa: E402
from repro.core.model import Aggregation, FilterStep, GroupByStep  # noqa: E402
from repro.workload.queries import make_bundle  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="test", choices=["test", "bench"])
    args = ap.parse_args()
    spark = get_spark("fedex-demo")
    df = make_bundle(spark, "spotify", args.scale).spark_tables["spotify"]
    fx = Fedex(FedexConfig(sample_size=5000, top_k_explanations=2))

    print("\n== Step 1 (Fig. 1a): SELECT * FROM spotify WHERE popularity > 65 ==")
    for e in fx.explain(FilterStep(df, "popularity > 65")):
        print(" •", e.caption)

    print("\n== Step 2 (Fig. 1b): mean loudness/danceability by year (>=1990) ==")
    step = GroupByStep(
        df.filter("year >= 1990"),
        ["year"],
        [
            Aggregation("mean", "loudness", "loudness"),
            Aggregation("mean", "danceability", "danceability"),
        ],
    )
    for e in fx.explain(step):
        print(" •", e.caption)


if __name__ == "__main__":
    main()
