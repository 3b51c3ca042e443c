"""Table 4 benchmark: TSExplain on the S&P500-like workload (n = 151,
hierarchical |A| = 3). Paper: 102 ms fully optimized (C++, M1)."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.core.precompute import series_matrix_pandas
from repro.datasets import sp500_like


@pytest.fixture(scope="module")
def sp500_matrix():
    sp = sp500_like.generate()
    rel = sp.relation()
    rel["mv"] = rel["price"] * rel["share"]
    return series_matrix_pandas(rel, "date", list(sp.attrs), "mv")


def test_bench_table4_pipeline(benchmark, sp500_matrix):
    sm = sp500_matrix

    def run():
        return explain_series(sm.S, sm.labels, list(sm.attrs), sm.total, Config())

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.K == 4


def test_bench_table4_cube(benchmark):
    """Module (a) alone: the pandas grouping-sets cube."""
    sp = sp500_like.generate()
    rel = sp.relation()
    rel["mv"] = rel["price"] * rel["share"]

    sm = benchmark.pedantic(
        lambda: series_matrix_pandas(rel, "date", list(sp.attrs), "mv"),
        rounds=3,
        iterations=1,
    )
    assert sm.epsilon > 100
