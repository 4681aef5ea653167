"""Fig. 5 benchmark: simulated assisted-vs-unassisted insight counts."""
from repro import experiments as E


def test_fig5_interactive_study(spark, once, benchmark):
    out = once(E.interactive_study, spark, scale="test")
    for _, row in out.iterrows():
        benchmark.extra_info[f"{row.notebook}_with"] = row.with_fedex
        benchmark.extra_info[f"{row.notebook}_without"] = row.without_fedex
    # Paper Fig. 5 shape: assisted EDA finds strictly more insights.
    assert (out["with_fedex"] > out["without_fedex"]).all()
