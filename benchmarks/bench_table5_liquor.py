"""Table 5 benchmark: TSExplain on the Liquor-like large-epsilon workload
(n = 128, |A| = 4, eps in the thousands). Paper: 756 ms fully optimized."""
import pytest

from repro.core.pipeline import Config, explain_series
from repro.core.precompute import series_matrix_pandas
from repro.datasets import liquor_like


@pytest.fixture(scope="module")
def liquor_matrix():
    lq = liquor_like.generate()
    return series_matrix_pandas(lq.relation(), "date", list(lq.attrs), "bottles")


def test_bench_table5_optimized(benchmark, liquor_matrix):
    sm = liquor_matrix

    def run():
        return explain_series(sm.S, sm.labels, list(sm.attrs), sm.total, Config())

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.K >= 2
    assert res.epsilon > 1000
