"""Fig. 9 benchmark: runtime vs column count (FEDEX-SAMPLING vs SeeDB vs
RATH) on the Bank dataset. The full three-dataset sweep is
``python jobs/runtime_columns.py``."""
from repro import experiments as E


def test_fig9_runtime_vs_columns(spark, once, benchmark):
    out = once(
        E.runtime_vs_columns,
        spark,
        "bank",
        column_counts=(5, 10, 21),
        scale="test",
        rath_budget_bytes=500_000_000,
    )
    for _, row in out.iterrows():
        k = int(row.n_columns)
        benchmark.extra_info[f"fedex@{k}cols_s"] = round(row.fedex_sampling_s, 2)
        benchmark.extra_info[f"seedb@{k}cols_s"] = round(row.seedb_s, 2)
        benchmark.extra_info[f"rath@{k}cols_s"] = round(row.rath_s, 2)
    assert (out["fedex_sampling_s"] > 0).all()
