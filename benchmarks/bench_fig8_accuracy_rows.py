"""Fig. 8 benchmark: FEDEX-SAMPLING accuracy at a fixed 5K sample as the
Products data grows."""
from repro import experiments as E


def test_fig8_accuracy_vs_rows(spark, once, benchmark):
    out = once(
        E.accuracy_vs_rows,
        spark,
        row_counts=(20_000, 50_000),
        query_nums=(4, 5),
        sample_size=5000,
    )
    for _, row in out.iterrows():
        benchmark.extra_info[f"ndcg@{int(row.n_rows)}"] = round(row.ndcg, 4)
        benchmark.extra_info[f"p@3@{int(row.n_rows)}"] = round(row.precision_at_3, 3)
    # Paper Fig. 8 shape: accuracy stays high for all row counts.
    assert (out["ndcg"] > 0.9).all()
