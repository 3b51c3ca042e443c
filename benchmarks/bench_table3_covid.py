"""Table 3 benchmark: full TSExplain (all optimizations) on the Covid-like
daily series at paper scale (n = 345, |A| = 1). Paper: 43 ms (C++, M1)."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.datasets import covid_like


@pytest.fixture(scope="module")
def covid():
    cv = covid_like.generate()
    S, total = cv.series("daily")
    return cv, S, total


def test_bench_table3_daily_optimized(benchmark, covid):
    cv, S, total = covid

    def run():
        return explain_series(S, cv.labels, list(cv.attrs), total, Config())

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.K >= 2
    assert len(res.segments) == res.K


def test_bench_table3_total_optimized(benchmark, covid):
    cv, _, _ = covid
    S, total = cv.series("total")

    def run():
        return explain_series(S, cv.labels, list(cv.attrs), total, Config())

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.K >= 2
