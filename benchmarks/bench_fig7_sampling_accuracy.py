"""Fig. 7 benchmark: FEDEX-SAMPLING accuracy (P@3 / Kendall-Tau / nDCG)
vs sample size, plus the wall time of the sweep."""
from repro import experiments as E


def test_fig7_sampling_accuracy(spark, once, benchmark):
    out = once(
        E.sampling_accuracy,
        spark,
        query_nums=(6, 7),
        sample_sizes=(50, 200, 1000, 5000),
        scale="test",
    )
    for _, row in out.iterrows():
        benchmark.extra_info[f"p@3@{int(row.sample_size)}"] = round(row.precision_at_3, 3)
        benchmark.extra_info[f"ndcg@{int(row.sample_size)}"] = round(row.ndcg, 4)
        benchmark.extra_info[f"kt@{int(row.sample_size)}"] = round(row.kendall_tau, 2)
    # Paper Fig. 7 shape: accuracy high and non-degrading in sample size.
    assert out["ndcg"].iloc[-1] >= 0.99
    assert out["precision_at_3"].iloc[-1] >= 0.99
