"""Fig. 10 benchmark: runtime vs row count — exact FEDEX vs
FEDEX-SAMPLING (SeeDB/RATH for context) on the Bank dataset. The full
three-dataset sweep (incl. the 1M-row Products run) is
``python jobs/runtime_rows.py``."""
from repro import experiments as E


def test_fig10_runtime_vs_rows(spark, once, benchmark):
    out = once(
        E.runtime_vs_rows,
        spark,
        "bank",
        row_counts=(2000, 10_127),
        include_exact=True,
        query_nums=(11, 13),
        rath_budget_bytes=500_000_000,
    )
    for _, row in out.iterrows():
        n = int(row.n_rows)
        benchmark.extra_info[f"fedex@{n}rows_s"] = round(row.fedex_s, 2)
        benchmark.extra_info[f"sampling@{n}rows_s"] = round(row.fedex_sampling_s, 2)
    assert (out["fedex_sampling_s"] > 0).all()
