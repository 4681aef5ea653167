"""Tables 2-3 benchmark: FEDEX-SAMPLING explanation generation per step
type (one representative filter, join, and group-by query from the
paper's workload). Regenerates the per-step latencies behind every other
experiment; ``python jobs/run_queries.py`` prints the full 30-query
sweep with captions.
"""
import pytest

from repro.core.explain import Fedex, FedexConfig
from repro.workload.queries import BY_NUM, make_bundle

CASES = {
    "filter_q6_spotify": 6,
    "join_q1_products": 1,
    "groupby_q21_spotify": 21,
}


@pytest.fixture(scope="module")
def bundles(spark):
    return {
        name: make_bundle(spark, name, scale="test")
        for name in ("spotify", "products")
    }


@pytest.mark.parametrize("case", sorted(CASES))
def test_explain_step(case, bundles, once, benchmark):
    q = BY_NUM[CASES[case]]
    step = q.build(bundles[q.dataset])
    fx = Fedex(FedexConfig(sample_size=5000, top_k_explanations=2))
    exps = once(fx.explain, step)
    benchmark.extra_info["n_explanations"] = len(exps)
    benchmark.extra_info["top"] = exps[0].caption if exps else None
    assert isinstance(exps, list)
