"""Fig. 11 benchmark: top contribution score for varying numbers of
sets-of-rows (queries 3 and 7)."""
from repro import experiments as E


def test_fig11_contribution_vs_sets(spark, once, benchmark):
    out = once(
        E.contribution_vs_n_sets,
        spark,
        query_nums=(7,),
        n_sets_values=(5, 10, 20),
        scale="test",
    )
    for _, row in out.iterrows():
        benchmark.extra_info[f"contribution@{int(row.n_sets)}sets"] = round(
            row.top_contribution, 4
        )
    assert (out["top_contribution"] >= 0).all()
