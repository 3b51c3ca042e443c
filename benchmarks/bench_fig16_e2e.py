"""Fig. 16 benchmark: end-to-end latency of TSExplain vs each baseline
(+ CA explanation attachment) on the Covid-like daily workload."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.datasets import covid_like
from repro.eval.harness import explain_fixed_cuts, run_baseline
from repro.segbase import BASELINES


@pytest.fixture(scope="module")
def covid():
    cv = covid_like.generate(n=200)
    S, total = cv.series("daily")
    return cv, S, total


@pytest.fixture(scope="module")
def opt_k(covid):
    cv, S, total = covid
    return explain_series(S, cv.labels, list(cv.attrs), total, Config()).K


def test_bench_fig16_tsexplain(benchmark, covid):
    cv, S, total = covid
    res = benchmark.pedantic(
        lambda: explain_series(S, cv.labels, list(cv.attrs), total, Config()),
        rounds=2,
        iterations=1,
    )
    assert res.K >= 2


@pytest.mark.parametrize("name", list(BASELINES))
def test_bench_fig16_baseline_plus_explain(benchmark, covid, opt_k, name):
    cv, S, total = covid

    def run():
        cuts, _ = run_baseline(name, total, opt_k)
        return explain_fixed_cuts(S, cv.labels, list(cv.attrs), cuts)

    segs = benchmark.pedantic(run, rounds=2, iterations=1)
    assert len(segs) == opt_k
