"""Fig. 6 benchmark: ground-truth rank of all eight variance metrics on one
synthetic dataset (the per-dataset unit of the Fig. 6 sweep)."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "jobs"))

import fig6_variance_rank  # noqa: E402
from repro.core.segcost import ALL_METRICS  # noqa: E402
from repro.datasets import synthetic  # noqa: E402
from repro.eval.metrics import (  # noqa: E402
    ground_truth_rank,
    sample_segmentations,
)


@pytest.fixture(scope="module")
def dataset():
    return synthetic.generate(n=100, snr_db=40, seed=200)


def test_bench_fig6_one_dataset(benchmark, dataset):
    sd = dataset

    def run():
        tables = fig6_variance_rank.metric_cost_tables(sd)
        samples = sample_segmentations(sd.n, sd.gt_k, 500, seed=0)
        return {
            mt: ground_truth_rank(sd.gt_cuts, sd.n, tables[mt], samples)
            for mt in ALL_METRICS
        }

    ranks = benchmark.pedantic(run, rounds=1, iterations=1)
    assert set(ranks) == set(ALL_METRICS)
    # headline claim at moderate noise: tse is never beaten by an alternative
    assert ranks["tse"] <= min(ranks.values())
