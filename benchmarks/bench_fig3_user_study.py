"""Figs. 3/4 benchmark: the simulated user study — judge grades per
method (Fig. 3) and FEDEX generation time per notebook (Fig. 4)."""
from repro import experiments as E


def test_fig3_user_study(spark, once, benchmark):
    out = once(E.user_study, spark, scale="test")
    mean = out.groupby("method")["score_1_to_7"].mean()
    for m, v in mean.items():
        benchmark.extra_info[f"score_{m}"] = round(v, 2)
    gen = out[out["method"] == "fedex"].set_index("notebook")["generation_time_s"]
    for nb, v in gen.items():
        benchmark.extra_info[f"fedex_gen_time_{nb}_s"] = v
    # Paper Fig. 3 shape: FEDEX clearly preferred over the automated
    # baselines; EXPERT (simulated oracle) on top overall.
    assert mean["fedex"] > mean["io"]
    assert mean["fedex"] > mean["seedb"]
    assert mean["fedex"] > mean["rath"]
