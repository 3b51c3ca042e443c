"""Fig. 17 benchmark: optimized TSExplain at growing series lengths, plus a
Vanilla point for the growth-factor comparison."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.datasets import synthetic

VANILLA = Config(use_filter=False, use_gv=False, use_sketch=False)


def _run(n, cfg):
    sd = synthetic.generate(n=n, snr_db=40, seed=300)
    return explain_series(sd.S, sd.labels, list(sd.attrs), sd.total, cfg)


@pytest.mark.parametrize("n", [200, 400, 800])
def test_bench_fig17_optimized(benchmark, n):
    res = benchmark.pedantic(lambda: _run(n, Config()), rounds=1, iterations=1)
    assert res.K >= 2


@pytest.mark.parametrize("n", [200, 400])
def test_bench_fig17_vanilla(benchmark, n):
    res = benchmark.pedantic(lambda: _run(n, VANILLA), rounds=1, iterations=1)
    assert res.K >= 2
