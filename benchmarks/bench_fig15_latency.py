"""Fig. 15 benchmark: per-optimization latency on a scaled Liquor-like
workload (the dataset where the paper's CA bottleneck and its optimizations
matter most). Expected shape: Vanilla slowest; O1+O2 fastest by a large
factor (paper: 13x on Liquor)."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.core.precompute import series_matrix_pandas
from repro.datasets import liquor_like

VARIANTS = {
    "vanilla": Config(use_filter=False, use_gv=False, use_sketch=False),
    "w_filter": Config(use_gv=False, use_sketch=False),
    "o1": Config(use_sketch=False),
    "o2": Config(use_gv=False),
    "o1_o2": Config(),
}


@pytest.fixture(scope="module")
def liquor_small():
    lq = liquor_like.generate(n=64, n_combos=300)
    return series_matrix_pandas(lq.relation(), "date", list(lq.attrs), "bottles")


@pytest.mark.parametrize("variant", list(VARIANTS))
def test_bench_fig15_variant(benchmark, liquor_small, variant):
    sm = liquor_small
    cfg = VARIANTS[variant]
    res = benchmark.pedantic(
        lambda: explain_series(sm.S, sm.labels, list(sm.attrs), sm.total, cfg),
        rounds=1,
        iterations=1,
    )
    assert res.K >= 2
